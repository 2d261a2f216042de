"""Spark-SQL exact counts vs incremental counter vs DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.exact.incremental import truth_trajectory
from repro.exact.spark_counts import (
    FOURCLIQUE_SQL,
    TRIANGLE_SQL,
    WEDGE_SQL,
    alive_edges,
    edges_to_df,
    exact_count_df,
)
from repro.graphs.generators import generate
from repro.graphs.streams import make_stream
from repro.oracle import assert_equivalent

PATTERN_SQL = {"wedge": WEDGE_SQL, "triangle": TRIANGLE_SQL, "4clique": FOURCLIQUE_SQL}


@pytest.fixture(scope="module")
def stream():
    edges = generate("soc-TX", scale=0.06)
    return make_stream(edges, "light", beta_l=0.2, seed=1)


@pytest.fixture(scope="module")
def alive(stream):
    return alive_edges(stream)


def _edges_pdf(edges):
    return pd.DataFrame(
        {"a": np.minimum(edges[:, 0], edges[:, 1]), "b": np.maximum(edges[:, 0], edges[:, 1])}
    )


@pytest.mark.parametrize("pattern", ["wedge", "triangle", "4clique"])
def test_spark_count_matches_incremental(spark, stream, alive, pattern):
    _, truth = truth_trajectory(stream, pattern, 10**9)
    got = exact_count_df(spark, alive, pattern).collect()[0][0]
    assert got == int(truth[-1])


@pytest.mark.parametrize("pattern", ["wedge", "triangle", "4clique"])
def test_spark_count_matches_duckdb_oracle(spark, alive, pattern):
    assert_equivalent(
        exact_count_df(spark, alive, pattern), PATTERN_SQL[pattern], edges=_edges_pdf(alive)
    )


def test_alive_edges_tracks_deletions(stream):
    alive = alive_edges(stream)
    n_ins = int((stream["op"] > 0).sum())
    n_del = int((stream["op"] < 0).sum())
    assert len(alive) == n_ins - n_del
    assert (alive[:, 0] < alive[:, 1]).all()


def test_alive_edges_empty():
    s = np.zeros(2, dtype=[("op", np.int8), ("u", np.int64), ("v", np.int64)])
    s["op"] = [1, -1]
    s["u"] = [0, 0]
    s["v"] = [1, 1]
    assert len(alive_edges(s)) == 0


def test_triangle_count_known_graph(spark):
    # K4 has 4 triangles, 1 four-clique, 12 wedges
    k4 = np.array([(0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3)])
    assert exact_count_df(spark, k4, "triangle").collect()[0][0] == 4
    assert exact_count_df(spark, k4, "4clique").collect()[0][0] == 1
    assert exact_count_df(spark, k4, "wedge").collect()[0][0] == 12


def test_edges_to_df_canonicalises(spark):
    df = edges_to_df(spark, np.array([(5, 2), (1, 3)]))
    rows = {tuple(r) for r in df.collect()}
    assert rows == {(2, 5), (1, 3)}


def test_unknown_pattern(spark):
    with pytest.raises(ValueError):
        exact_count_df(spark, np.array([(0, 1)]), "pentagon")

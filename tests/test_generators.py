"""Graph generator tests: canonical form, determinism, structure."""
import numpy as np
import pytest

from repro.graphs.generators import (
    DATASETS,
    TRAIN_OF,
    citation_graph,
    community_graph,
    forest_fire,
    generate,
    interleave,
    social_graph,
    web_graph,
)

ALL_DATASETS = sorted(DATASETS)


@pytest.mark.parametrize("name", ALL_DATASETS)
def test_generate_canonical_edges(name):
    edges = generate(name, scale=0.05)
    assert edges.ndim == 2 and edges.shape[1] == 2
    assert (edges[:, 0] < edges[:, 1]).all(), "edges must be canonical u < v"


@pytest.mark.parametrize("name", ALL_DATASETS)
def test_generate_no_duplicates(name):
    edges = generate(name, scale=0.05)
    keys = set(map(tuple, edges.tolist()))
    assert len(keys) == len(edges)


@pytest.mark.parametrize("name", ALL_DATASETS)
def test_generate_deterministic(name):
    a = generate(name, scale=0.05)
    b = generate(name, scale=0.05)
    assert np.array_equal(a, b)


@pytest.mark.parametrize("name", ALL_DATASETS)
def test_generate_seed_offset_changes_graph(name):
    a = generate(name, scale=0.05)
    b = generate(name, scale=0.05, seed_offset=17)
    assert not np.array_equal(a, b)


@pytest.mark.parametrize("name", ["cit-PT", "com-YT", "soc-TW", "web-GL", "synthetic"])
def test_test_graphs_larger_than_train(name):
    test = generate(name, scale=0.1)
    train = generate(TRAIN_OF[name], scale=0.1)
    assert len(test) > len(train), "Table I pairing: test graph is the bigger one"


def test_unknown_dataset_raises():
    with pytest.raises(KeyError):
        generate("no-such-graph")


@pytest.mark.parametrize(
    "fn,kw",
    [
        (forest_fire, dict(n=120, p=0.45)),
        (citation_graph, dict(n=120, m_out=5)),
        (social_graph, dict(n=120, m_out=5)),
        (web_graph, dict(n=120, m_out=5)),
    ],
)
def test_growth_models_connect_new_to_old(fn, kw):
    # in growth order (pre-interleave) each burst belongs to the newest
    # vertex, so the per-edge max endpoint is non-decreasing
    edges = fn(seed=1, **kw)
    hi = np.maximum(edges[:, 0], edges[:, 1])
    assert (np.diff(hi) >= 0).all()


def test_community_graph_blocks():
    edges = community_graph(10, 12, seed=2)
    assert len(edges) > 50
    assert (edges[:, 0] != edges[:, 1]).all()


@pytest.mark.parametrize("p", [0.3, 0.5])
def test_forest_fire_density_increases_with_p(p):
    lo = forest_fire(150, p, seed=3)
    hi = forest_fire(150, p + 0.1, seed=3)
    assert len(hi) > len(lo)


def test_interleave_preserves_multiset():
    edges = generate("cit-HE", scale=0.05)
    mixed = interleave(edges, 0.5, seed=4)
    assert sorted(map(tuple, edges.tolist())) == sorted(map(tuple, mixed.tolist()))


def test_interleave_zero_is_identity():
    edges = generate("cit-HE", scale=0.05)
    assert np.array_equal(interleave(edges, 0.0, seed=4), edges)


def test_interleave_changes_order():
    edges = generate("cit-HE", scale=0.05)
    mixed = interleave(edges, 0.9, seed=4)
    assert not np.array_equal(mixed, edges)


def test_interleave_locality_scales_with_frac():
    """Mean displacement of an edge's position grows with the buffer size."""
    edges = generate("cit-HE", scale=0.1)
    pos = {tuple(e): i for i, e in enumerate(edges.tolist())}

    def disp(frac):
        mixed = interleave(edges, frac, seed=5)
        return np.mean([abs(pos[tuple(e)] - i) for i, e in enumerate(mixed.tolist())])

    assert disp(0.1) < disp(0.9)


@pytest.mark.parametrize("name", ["cit-PT", "soc-TW", "web-GL"])
def test_heavy_tailed_degrees(name):
    edges = generate(name, scale=0.2)
    deg = {}
    for u, v in edges.tolist():
        deg[u] = deg.get(u, 0) + 1
        deg[v] = deg.get(v, 0) + 1
    d = np.array(sorted(deg.values()))
    # max degree much larger than the median: hubs exist
    assert d[-1] > 4 * np.median(d)


def test_scale_grows_edges():
    small = generate("cit-PT", scale=0.05)
    big = generate("cit-PT", scale=0.15)
    assert len(big) > 2 * len(small)

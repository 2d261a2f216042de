"""Spark Monte-Carlo trial fan-out.

The paper reports the mean of 100 independent sampling repetitions per
setting; repetitions are embarrassingly parallel, so the harness runs them as
a grouped ``applyInPandas`` over a DataFrame of (algo, run) tasks — one
sequential kernel per group, stream and ground truth shipped once via a
Spark broadcast. Metric aggregation is Spark SQL (and is cross-checked
against the DuckDB oracle in tests).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..core.runner import are, mare, run_trial
from ..exact.incremental import truth_trajectory
from .factory import make_sampler

__all__ = ["run_trials", "aggregate", "trial_frame"]

_RESULT_SCHEMA = (
    "label string, run int, are double, mare double, time_s double, final double"
)


def run_trials(
    spark: SparkSession,
    stream,
    pattern: str,
    M: int,
    algos: list[tuple[str, str, dict | None]],
    *,
    n_runs: int,
    ckpt_every: int,
    mare_floor: float = 0.0,
    wr_ratio: float = 0.1,
    seed0: int = 0,
    truth=None,
) -> DataFrame:
    """Run ``n_runs`` repetitions of each (label, algo, policy) over
    ``stream``; returns a Spark DataFrame of per-trial metrics.

    ``algos`` entries are (display label, factory name, policy dict or
    None). Ground truth is computed once on the driver (or passed in) and
    broadcast with the stream.
    """
    if truth is None:
        _, truth = truth_trajectory(stream, pattern, ckpt_every)
    sc = spark.sparkContext
    b = sc.broadcast(
        {
            "stream": stream,
            "truth": truth,
            "pattern": pattern,
            "M": M,
            "ckpt_every": ckpt_every,
            "mare_floor": mare_floor,
            "wr_ratio": wr_ratio,
            "policies": {label: pol for label, _, pol in algos},
            "names": {label: name for label, name, _ in algos},
        }
    )

    tasks = pd.DataFrame(
        [
            {"label": label, "run": r, "seed": seed0 + r}
            for label, _, _ in algos
            for r in range(n_runs)
        ]
    )

    def one_trial(pdf: pd.DataFrame) -> pd.DataFrame:
        cfg = b.value
        row = pdf.iloc[0]
        label = row["label"]
        sampler = make_sampler(
            cfg["names"][label],
            cfg["M"],
            cfg["pattern"],
            int(row["seed"]),
            policy=cfg["policies"][label],
            wr_ratio=cfg["wr_ratio"],
        )
        res = run_trial(cfg["stream"], sampler, cfg["ckpt_every"])
        truth = cfg["truth"]
        return pd.DataFrame(
            [
                {
                    "label": label,
                    "run": int(row["run"]),
                    "are": are(res["final"], float(truth[-1])),
                    "mare": mare(res["est"], truth, cfg["mare_floor"]),
                    "time_s": res["time_s"],
                    "final": res["final"],
                }
            ]
        )

    sdf = spark.createDataFrame(tasks)
    # one Spark task per (label, run) group → each trial runs in parallel
    return sdf.groupBy("label", "run").applyInPandas(one_trial, _RESULT_SCHEMA)


def aggregate(results: DataFrame) -> pd.DataFrame:
    """Mean metrics per algorithm label (the numbers the paper tabulates)."""
    out = (
        results.groupBy("label")
        .agg(
            F.mean("are").alias("are"),
            F.mean("mare").alias("mare"),
            F.mean("time_s").alias("time_s"),
            F.count("run").alias("n_runs"),
        )
        .toPandas()
    )
    return out.sort_values("label").reset_index(drop=True)


def trial_frame(
    spark: SparkSession,
    stream,
    pattern: str,
    M: int,
    algos: list[tuple[str, str, dict | None]],
    **kw,
) -> pd.DataFrame:
    """run_trials + aggregate in one call."""
    return aggregate(run_trials(spark, stream, pattern, M, algos, **kw))

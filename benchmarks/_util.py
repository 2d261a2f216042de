"""Shared bench harness: runs one table driver under pytest-benchmark
(single round — each table is a full multi-trial experiment, not a
microbenchmark) and saves the result artifacts under ``results/``."""
from __future__ import annotations

from pathlib import Path

import pandas as pd

from repro.harness.config import BENCH
from repro.harness.reporting import pivot_metric, save_table
from repro.rl.train import TrainConfig

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"
POLICY_DIR = RESULTS_DIR / "policies"

# bench-scale training config (paper: 1000 iterations on 10 streams)
BENCH_TRAIN = TrainConfig(iters=1000, n_streams=3, scale=0.25, restarts=2)

__all__ = ["BENCH", "BENCH_TRAIN", "POLICY_DIR", "RESULTS_DIR", "run_table_bench"]


def run_table_bench(
    benchmark,
    fn,
    name: str,
    title: str,
    *,
    metrics: tuple[str, ...] = ("are", "mare", "time_s"),
    index: str = "graph",
) -> pd.DataFrame:
    """Execute ``fn`` once under the benchmark timer, then persist the tidy
    result plus one paper-layout pivot per metric."""
    holder: dict[str, pd.DataFrame] = {}

    def run():
        holder["df"] = fn()

    benchmark.pedantic(run, rounds=1, iterations=1)
    df = holder["df"]
    save_table(df, f"{name}_tidy", RESULTS_DIR, title=f"{title} (tidy)")
    if "label" in df.columns:
        for metric in metrics:
            if metric in df.columns:
                wide = pivot_metric(df, metric, index=index)
                save_table(wide, f"{name}_{metric}", RESULTS_DIR, title=f"{title} — {metric}")
    return df

"""Benchmark reproducing paper Table XIII — ablation on the temporal state
aggregation: WSD-L (Max, Eq. 20) vs WSD-L (Avg) vs WSD-H, both scenarios."""
import pandas as pd

from benchmarks._util import BENCH, BENCH_TRAIN, POLICY_DIR, RESULTS_DIR, run_table_bench
from repro.harness.reporting import save_table
from repro.harness.tables import table_ablation


def test_table13(benchmark, spark):
    df = run_table_bench(
        benchmark,
        lambda: table_ablation(
            spark, BENCH, policy_dir=POLICY_DIR, train_cfg=BENCH_TRAIN
        ),
        "table13",
        "Table XIII: ablation on temporal state (Max vs Avg)",
        metrics=(),
    )
    wide = df.pivot_table(index=["scenario", "graph"], columns="label", values="are").reset_index()
    save_table(wide, "table13_are", RESULTS_DIR, title="Table XIII — ARE (%)")
    assert set(df["label"]) == {"WSD-L (Max)", "WSD-L (Avg)", "WSD-H"}
    assert set(df["scenario"]) == {"massive", "light"}

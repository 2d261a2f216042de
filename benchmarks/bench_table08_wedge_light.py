"""Benchmark reproducing paper Table 8 — counting wedges, light deletion."""
from benchmarks._util import BENCH, BENCH_TRAIN, POLICY_DIR, run_table_bench
from repro.harness.tables import table_main


def test_table08(benchmark, spark):
    df = run_table_bench(
        benchmark,
        lambda: table_main(
            spark, "wedge", "light", BENCH,
            policy_dir=POLICY_DIR, train_cfg=BENCH_TRAIN,
        ),
        "table08",
        "Table VIII: counting wedges, light deletion",
    )
    assert (df["are"].notna()).all()
    assert set(df["label"]) >= {"WSD-L", "WSD-H", "GPS-A", "Triest", "ThinkD", "WRS"}

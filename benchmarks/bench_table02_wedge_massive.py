"""Benchmark reproducing paper Table 2 — counting wedges, massive deletion."""
from benchmarks._util import BENCH, BENCH_TRAIN, POLICY_DIR, run_table_bench
from repro.harness.tables import table_main


def test_table02(benchmark, spark):
    df = run_table_bench(
        benchmark,
        lambda: table_main(
            spark, "wedge", "massive", BENCH,
            policy_dir=POLICY_DIR, train_cfg=BENCH_TRAIN,
        ),
        "table02",
        "Table II: counting wedges, massive deletion",
    )
    assert (df["are"].notna()).all()
    assert set(df["label"]) >= {"WSD-L", "WSD-H", "GPS-A", "Triest", "ThinkD", "WRS"}

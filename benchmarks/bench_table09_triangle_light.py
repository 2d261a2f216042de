"""Benchmark reproducing paper Table 9 — counting triangles, light deletion."""
from benchmarks._util import BENCH, BENCH_TRAIN, POLICY_DIR, run_table_bench
from repro.harness.tables import table_main


def test_table09(benchmark, spark):
    df = run_table_bench(
        benchmark,
        lambda: table_main(
            spark, "triangle", "light", BENCH,
            policy_dir=POLICY_DIR, train_cfg=BENCH_TRAIN,
        ),
        "table09",
        "Table IX: counting triangles, light deletion",
    )
    assert (df["are"].notna()).all()
    assert set(df["label"]) >= {"WSD-L", "WSD-H", "GPS-A", "Triest", "ThinkD", "WRS"}

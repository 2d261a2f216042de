"""Benchmark reproducing paper Table VI — counting triangles on cit-PT under
the insertion-only scenario (WSD-H and GPS-A degenerate to GPS)."""
from benchmarks._util import BENCH, BENCH_TRAIN, POLICY_DIR, run_table_bench
from repro.harness.tables import table_insertion_only


def test_table06(benchmark, spark):
    df = run_table_bench(
        benchmark,
        lambda: table_insertion_only(
            spark, BENCH, policy_dir=POLICY_DIR, train_cfg=BENCH_TRAIN
        ),
        "table06",
        "Table VI: insertion-only scenario, triangles on cit-PT",
    )
    assert set(df["label"]) == {"WSD-L", "GPS", "Triest", "ThinkD", "WRS"}

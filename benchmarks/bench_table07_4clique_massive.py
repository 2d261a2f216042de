"""Benchmark reproducing paper Table 7 — counting 4-cliques, massive deletion."""
from benchmarks._util import BENCH, BENCH_TRAIN, POLICY_DIR, run_table_bench
from repro.harness.tables import table_main


def test_table07(benchmark, spark):
    df = run_table_bench(
        benchmark,
        lambda: table_main(
            spark, "4clique", "massive", BENCH.with_(m_ratio=0.15, mare_floor=10.0),
            policy_dir=POLICY_DIR, train_cfg=BENCH_TRAIN,
        ),
        "table07",
        "Table VII: counting 4-cliques, massive deletion",
    )
    assert (df["are"].notna()).all()
    assert set(df["label"]) >= {"WSD-L", "WSD-H", "GPS-A", "Triest", "ThinkD", "WRS"}

"""Benchmarks reproducing paper Tables V and XII — transferability of the
learned weight policy across dataset categories (ARE of counting triangles
with the policy trained on each category's training graph)."""
from benchmarks._util import BENCH, BENCH_TRAIN, POLICY_DIR, run_table_bench
from repro.harness.tables import table_transfer


def _check(df):
    assert set(df["graph"]) == {"cit-PT", "com-YT", "soc-TW", "web-GL"}
    assert "WSD-H" in set(df["label"])
    assert len(set(df["label"])) == 6  # 5 training policies + WSD-H


def test_table05_transfer_massive(benchmark, spark):
    df = run_table_bench(
        benchmark,
        lambda: table_transfer(
            spark, "massive", BENCH, policy_dir=POLICY_DIR, train_cfg=BENCH_TRAIN
        ),
        "table05",
        "Table V: transferability (massive deletion)",
        metrics=("are",),
    )
    _check(df)


def test_table12_transfer_light(benchmark, spark):
    df = run_table_bench(
        benchmark,
        lambda: table_transfer(
            spark, "light", BENCH, policy_dir=POLICY_DIR, train_cfg=BENCH_TRAIN
        ),
        "table12",
        "Table XII: transferability (light deletion)",
        metrics=("are",),
    )
    _check(df)

"""Benchmark reproducing paper Table I — dataset statistics of the
train/test proxy graphs at bench scale."""
from benchmarks._util import BENCH, RESULTS_DIR, run_table_bench
from repro.harness.tables import dataset_stats


def test_table01(benchmark):
    df = run_table_bench(
        benchmark,
        lambda: dataset_stats(BENCH),
        "table01",
        "Table I: dataset statistics (proxy graphs)",
        metrics=(),
    )
    assert len(df) == 10

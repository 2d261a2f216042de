"""Benchmarks reproducing paper Tables IV and XI — WSD-L training time for
counting triangles and wedges on the four real training graphs, under the
massive and light deletion scenarios."""
from benchmarks._util import BENCH_TRAIN, POLICY_DIR, run_table_bench
from repro.harness.tables import table_training


def test_table04_training_massive(benchmark):
    df = run_table_bench(
        benchmark,
        lambda: table_training("massive", policy_dir=POLICY_DIR, train_cfg=BENCH_TRAIN),
        "table04",
        "Table IV: training time (massive deletion)",
        metrics=(),
    )
    assert len(df) == 8
    assert (df["train_time_s"] > 0).all()


def test_table11_training_light(benchmark):
    df = run_table_bench(
        benchmark,
        lambda: table_training("light", policy_dir=POLICY_DIR, train_cfg=BENCH_TRAIN),
        "table11",
        "Table XI: training time (light deletion)",
        metrics=(),
    )
    assert len(df) == 8
    assert (df["train_time_s"] > 0).all()

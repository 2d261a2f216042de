"""Shared plumbing for ``spark-submit`` job entry points.

Each job reproduces one paper table at bench scale and writes artifacts to
``results/``. Jobs build (or reuse) the session via ``getOrCreate`` so they
work both under spark-submit and a plain ``python jobs/<name>.py``.
"""
from __future__ import annotations

import argparse
from pathlib import Path

from pyspark.sql import SparkSession

from repro.harness.config import BENCH, ExpConfig
from repro.harness.reporting import pivot_metric, save_table
from repro.rl.train import TrainConfig

ROOT = Path(__file__).resolve().parent.parent
RESULTS_DIR = ROOT / "results"
POLICY_DIR = RESULTS_DIR / "policies"
JOB_TRAIN = TrainConfig(iters=1000, n_streams=3, scale=0.25, restarts=2)


def make_parser(desc: str) -> argparse.ArgumentParser:
    ap = argparse.ArgumentParser(description=desc)
    ap.add_argument("--scale", type=float, default=BENCH.scale)
    ap.add_argument("--n-runs", type=int, default=BENCH.n_runs)
    ap.add_argument("--m-ratio", type=float, default=BENCH.m_ratio)
    return ap


def config_from(args) -> ExpConfig:
    return BENCH.with_(scale=args.scale, n_runs=args.n_runs, m_ratio=args.m_ratio)


def get_spark(name: str) -> SparkSession:
    return (
        SparkSession.builder.appName(name)
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def emit(df, name: str, title: str, metrics=("are", "mare", "time_s"), index="graph") -> None:
    save_table(df, f"{name}_tidy", RESULTS_DIR, title=f"{title} (tidy)")
    if "label" in df.columns:
        for metric in metrics:
            if metric in df.columns:
                save_table(
                    pivot_metric(df, metric, index=index),
                    f"{name}_{metric}",
                    RESULTS_DIR,
                    title=f"{title} — {metric}",
                )
    print(f"[{name}] {title}")
    print(df.to_string(index=False))

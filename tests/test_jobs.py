"""Smoke tests for the spark-submit job entry points."""
import importlib.util
import sys
from pathlib import Path

import pytest

JOBS = sorted((Path(__file__).parent.parent / "jobs").glob("table*.py")) + [
    Path(__file__).parent.parent / "jobs" / "streaming_demo.py"
]


def _load(path):
    sys.path.insert(0, str(path.parent))
    try:
        spec = importlib.util.spec_from_file_location(f"job_{path.stem}", path)
        mod = importlib.util.module_from_spec(spec)
        spec.loader.exec_module(mod)
        return mod
    finally:
        sys.path.pop(0)


@pytest.mark.parametrize("path", JOBS, ids=lambda p: p.stem)
def test_job_importable_with_main(path):
    mod = _load(path)
    assert callable(mod.main)


def test_common_config_override():
    sys.path.insert(0, str(JOBS[0].parent))
    try:
        import _common

        args = _common.make_parser("x").parse_args(["--scale", "0.11", "--n-runs", "4"])
        cfg = _common.config_from(args)
        assert cfg.scale == 0.11 and cfg.n_runs == 4
    finally:
        sys.path.pop(0)


def test_table01_job_runs(tmp_path, monkeypatch, capsys):
    mod = _load(JOBS[0])  # table01_datasets
    monkeypatch.setattr(sys, "argv", ["table01", "--scale", "0.03"])
    monkeypatch.setattr(mod, "RESULTS_DIR", tmp_path, raising=False)
    # emit() writes into jobs/_common.RESULTS_DIR; patch that module instead
    sys.path.insert(0, str(JOBS[0].parent))
    try:
        import _common

        monkeypatch.setattr(_common, "RESULTS_DIR", tmp_path)
        mod.main()
    finally:
        sys.path.pop(0)
    out = capsys.readouterr().out
    assert "Table I" in out
    assert (tmp_path / "table01_tidy.md").exists()

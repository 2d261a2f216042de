"""ARE / MARE metric tests (Section V-A definitions)."""
import numpy as np
import pytest

from repro.core.runner import are, mare


def test_are_basic():
    assert are(110.0, 100.0) == pytest.approx(10.0)
    assert are(90.0, 100.0) == pytest.approx(10.0)
    assert are(100.0, 100.0) == 0.0


def test_are_zero_truth():
    assert are(0.0, 0.0) == 0.0
    assert are(5.0, 0.0) == float("inf")


def test_mare_basic():
    est = np.array([110.0, 90.0, 100.0])
    truth = np.array([100.0, 100.0, 100.0])
    assert mare(est, truth) == pytest.approx((10 + 10 + 0) / 3)


def test_mare_skips_zero_truth():
    est = np.array([5.0, 110.0])
    truth = np.array([0.0, 100.0])
    assert mare(est, truth) == pytest.approx(10.0)


def test_mare_floor_excludes_tiny_truth():
    est = np.array([20.0, 110.0])
    truth = np.array([10.0, 100.0])
    assert mare(est, truth) == pytest.approx((100 + 10) / 2)
    assert mare(est, truth, floor=50) == pytest.approx(10.0)


def test_mare_all_below_floor():
    assert mare(np.array([1.0]), np.array([2.0]), floor=10) == 0.0

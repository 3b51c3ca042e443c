"""Kneedle elbow selection of K (Sec. 6)."""
import numpy as np
import pytest

from repro.core.elbow import kneedle


def test_clear_elbow():
    # Sharp drop until K=4, then flat: elbow at 4.
    curve = [100, 60, 30, 5, 4.5, 4.2, 4.0, 3.9]
    assert kneedle(curve) == 4


def test_linear_curve_any_valid_k():
    # Perfectly linear: y_n - x_n == 0 everywhere up to float noise; every K
    # ties, so only validity is required.
    curve = list(np.linspace(100, 0, 10))
    assert 1 <= kneedle(curve) <= 10


def test_flat_curve():
    assert kneedle([5.0, 5.0, 5.0]) == 1


def test_single_point():
    assert kneedle([3.0]) == 1


def test_elbow_of_exponential_decay():
    k = np.arange(1, 21)
    curve = list(np.exp(-k / 2.0))
    got = kneedle(curve)
    assert 2 <= got <= 8  # knee of e^{-k/2} normalized over 20 points


def test_result_in_range():
    rng = np.random.default_rng(0)
    for _ in range(20):
        curve = sorted(rng.uniform(0, 100, 15), reverse=True)
        got = kneedle(curve)
        assert 1 <= got <= 15


def test_increasing_tail_does_not_crash():
    # Non-monotone curves can happen with approximate sketching.
    assert 1 <= kneedle([10, 4, 5, 3, 3.1]) <= 5


def test_two_points():
    assert kneedle([10.0, 1.0]) in (1, 2)

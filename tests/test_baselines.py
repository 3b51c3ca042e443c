"""Explanation-agnostic baselines: contract + obvious-breakpoint detection."""
import numpy as np
import pytest

from repro.segbase import BASELINES, bottom_up, fluss, nnsegment
from repro.segbase.fluss import corrected_arc_curve, matrix_profile_index


def _two_regime(n=120, seed=0):
    rng = np.random.default_rng(seed)
    y = np.concatenate([np.linspace(0, 100, n // 2), np.linspace(100, 20, n - n // 2)])
    return y + rng.normal(0, 0.5, n)


@pytest.mark.parametrize("name", list(BASELINES))
@pytest.mark.parametrize("K", [2, 3, 5])
def test_contract(name, K):
    y = _two_regime()
    cuts = BASELINES[name](y, K)
    assert len(cuts) == K - 1
    assert cuts == sorted(cuts)
    assert all(0 < c < len(y) - 1 for c in cuts)
    assert len(set(cuts)) == len(cuts)


@pytest.mark.parametrize("name", list(BASELINES))
def test_k_one_returns_no_cuts(name):
    assert BASELINES[name](_two_regime(), 1) == []


class TestBottomUp:
    def test_finds_linear_breakpoint(self):
        y = _two_regime()
        cuts = bottom_up(y, 2)
        assert abs(cuts[0] - 60) <= 3

    def test_three_regimes(self):
        n = 150
        y = np.concatenate(
            [np.linspace(0, 50, 50), np.linspace(50, 0, 50), np.linspace(0, 80, 50)]
        )
        cuts = bottom_up(y, 3)
        assert abs(cuts[0] - 50) <= 3 and abs(cuts[1] - 100) <= 3

    def test_perfect_line_zero_cost_anywhere(self):
        y = np.linspace(0, 10, 40)
        cuts = bottom_up(y, 2)
        assert len(cuts) == 1  # still returns a cut; position arbitrary

    def test_k_larger_than_series(self):
        y = np.arange(5.0)
        cuts = bottom_up(y, 10)
        assert len(cuts) == len(y) - 2  # clamped to finest segmentation


class TestFLUSS:
    def test_matrix_profile_periodic_nn(self):
        t = np.arange(200)
        y = np.sin(2 * np.pi * t / 20.0)
        nn = matrix_profile_index(y, 20)
        # each subsequence's NN should be ~1 period away
        dist = np.abs(nn - np.arange(len(nn)))
        assert np.median(dist % 20) <= 2

    def test_cac_range(self):
        y = _two_regime()
        cac = corrected_arc_curve(y, 8)
        assert (cac >= 0).all() and (cac <= 1).all()

    def test_regime_change_detected(self):
        # two distinct oscillation regimes: FLUSS's home turf
        rng = np.random.default_rng(0)
        t = np.arange(300.0)
        y = np.where(t < 150, np.sin(t / 3.0), np.sin(t / 12.0) * 3)
        y = y + rng.normal(0, 0.05, 300)
        cuts = fluss(y, 2, w=20)
        assert len(cuts) == 1
        assert abs(cuts[0] - 150) <= 40

    def test_short_series(self):
        y = _two_regime(30)
        cuts = fluss(y, 3)
        assert len(cuts) == 2


class TestNNSegment:
    def test_finds_structure_change(self):
        y = _two_regime()
        cuts = nnsegment(y, 2)
        assert abs(cuts[0] - 60) <= 12

    def test_exclusion_zone(self):
        y = _two_regime()
        cuts = nnsegment(y, 4, w=10)
        for a, b in zip(cuts, cuts[1:]):
            assert b - a >= 5

    def test_short_series(self):
        y = _two_regime(24)
        assert len(nnsegment(y, 3)) == 2

"""Matrix-path end-to-end pipeline: recovery of planted segmentations."""
import numpy as np
import pytest

from repro.core.pipeline import Config, ExplainResult, explain_series, moving_average
from repro.core.types import Explanation
from repro.datasets import synthetic


def _planted(n=60, seed=0, noise=1.0):
    rng = np.random.default_rng(seed)
    t = np.arange(n, dtype=float)
    a = np.where(t < 20, 100 + 5 * t, 200 - 2 * (t - 20))
    a[40:] = a[39]
    b = np.where(t < 40, 50 + t, 90 + 6 * (t - 40))
    c = np.full(n, 30.0)
    S = np.vstack([a, b, c]) + rng.normal(0, noise, (3, n))
    labels = [Explanation.of(cat=x) for x in "abc"]
    return S, labels, S.sum(axis=0)


class TestPlantedRecovery:
    def test_exact_k(self):
        S, labels, total = _planted()
        res = explain_series(S, labels, ["cat"], total, Config(K=3, use_sketch=False))
        assert res.K == 3
        assert all(abs(c - g) <= 2 for c, g in zip(res.cuts, [20, 40]))

    def test_auto_k(self):
        S, labels, total = _planted()
        res = explain_series(S, labels, ["cat"], total, Config())
        assert res.K == 3

    def test_segment_explanations(self):
        S, labels, total = _planted()
        res = explain_series(S, labels, ["cat"], total, Config(K=3, use_sketch=False))
        top1 = [seg.explanations[0] for seg in res.segments]
        assert top1[0][0] == "cat=a" and top1[0][1] == 1
        assert top1[1][0] == "cat=a" and top1[1][1] == -1
        assert top1[2][0] == "cat=b" and top1[2][1] == 1

    @pytest.mark.parametrize("use_sketch", [False, True])
    @pytest.mark.parametrize("use_gv", [False, True])
    def test_optimizations_preserve_recovery(self, use_sketch, use_gv):
        S, labels, total = _planted()
        res = explain_series(
            S, labels, ["cat"], total,
            Config(K=3, use_sketch=use_sketch, use_gv=use_gv),
        )
        assert all(abs(c - g) <= 3 for c, g in zip(res.cuts, [20, 40]))

    @pytest.mark.parametrize("seed", range(4))
    def test_synthetic_generator_recovery(self, seed):
        sd = synthetic.generate(n=80, snr_db=45, seed=seed)
        res = explain_series(
            sd.S, sd.labels, list(sd.attrs), sd.total,
            Config(K=sd.gt_k, use_filter=False, use_sketch=False),
        )
        for g in sd.gt_cuts:
            assert min(abs(c - g) for c in res.cuts) <= 3, (res.cuts, sd.gt_cuts)


class TestResultContract:
    def test_result_fields(self):
        S, labels, total = _planted()
        res = explain_series(S, labels, ["cat"], total, Config(K=2, use_sketch=False))
        assert isinstance(res, ExplainResult)
        assert res.n == 60
        assert res.epsilon == 3
        assert len(res.cuts) == res.K - 1
        assert len(res.segments) == res.K
        assert len(res.curve) <= Config().k_max
        assert set(res.timings) >= {"precompute", "ca", "kseg", "total"}
        assert res.total_variance >= 0

    def test_segments_tile_domain(self):
        S, labels, total = _planted()
        res = explain_series(S, labels, ["cat"], total, Config(K=4, use_sketch=False))
        assert res.segments[0].start == 0
        assert res.segments[-1].end == res.n - 1
        for a, b in zip(res.segments, res.segments[1:]):
            assert a.end == b.start

    def test_k_clamped_when_too_large(self):
        S, labels, total = _planted()
        res = explain_series(S, labels, ["cat"], total, Config(K=50, use_sketch=False))
        assert res.K <= Config().k_max

    def test_curve_decreasing(self):
        S, labels, total = _planted()
        res = explain_series(S, labels, ["cat"], total, Config(use_sketch=False))
        curve = res.curve
        assert all(curve[i] >= curve[i + 1] - 1e-9 for i in range(len(curve) - 1))

    def test_filter_reduces_epsilon(self):
        S, labels, total = _planted()
        # add a negligible 4th slice
        S2 = np.vstack([S, np.full(60, 1e-4)])
        labels2 = labels + [Explanation.of(cat="tiny")]
        res = explain_series(S2, labels2, ["cat"], total, Config(K=2))
        assert res.epsilon == 4
        assert res.filtered_epsilon == 3

    def test_times_passthrough(self):
        S, labels, total = _planted()
        times = [f"d{i}" for i in range(60)]
        res = explain_series(
            S, labels, ["cat"], total, Config(K=2, use_sketch=False), times=times
        )
        assert res.segments[0].start_t == "d0"
        assert res.segments[-1].end_t == "d59"


class TestMovingAverage:
    def test_identity_window(self):
        S = np.random.default_rng(0).random((2, 10))
        np.testing.assert_array_equal(moving_average(S, 1), S)

    def test_constant_preserved(self):
        S = np.full((1, 20), 7.0)
        np.testing.assert_allclose(moving_average(S, 5), S)

    def test_shape_preserved(self):
        S = np.random.default_rng(0).random((3, 17))
        assert moving_average(S, 4).shape == S.shape

    def test_smoothing_reduces_noise_variance(self):
        rng = np.random.default_rng(0)
        S = rng.normal(0, 1, (1, 500))
        sm = moving_average(S, 7)
        assert sm.std() < S.std() * 0.6

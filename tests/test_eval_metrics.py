"""Effectiveness metrics: distance percent and ground-truth rank."""
import numpy as np
import pytest

from repro.eval.metrics import (
    distance_percent,
    ground_truth_rank,
    objective,
    rank_across_metrics,
    sample_segmentations,
)


class TestDistancePercent:
    def test_exact_match_zero(self):
        assert distance_percent([10, 20], [10, 20], 100) == 0.0

    def test_single_cut_displacement(self):
        assert distance_percent([12], [10], 100) == pytest.approx(2.0)

    def test_normalized_by_k_and_n(self):
        # same displacement, twice the cuts -> same percent
        a = distance_percent([12], [10], 100)
        b = distance_percent([12, 52], [10, 50], 100)
        assert a == pytest.approx(b)

    def test_empty_gt(self):
        assert distance_percent([5], [], 100) == 0.0

    def test_missing_prediction_penalized(self):
        full = distance_percent([10, 50], [10, 50], 100)
        missing = distance_percent([10], [10, 50], 100)
        assert missing > full

    def test_no_predictions(self):
        # gt cut at 50, no predictions: charged distance to nearest endpoint
        v = distance_percent([], [50], 100)
        assert v == pytest.approx(min(50, 100 - 1 - 50))

    def test_symmetric_in_alignment_order(self):
        assert distance_percent([10, 30], [12, 28], 100) == pytest.approx(
            (2 + 2) / 2.0
        )


class TestSampling:
    def test_sample_shape(self):
        samples = sample_segmentations(50, 4, 100, seed=1)
        assert len(samples) == 100
        for s in samples:
            assert len(s) == 3
            assert all(1 <= c <= 48 for c in s)
            assert list(s) == sorted(set(s))

    def test_deterministic(self):
        assert sample_segmentations(30, 3, 10, seed=5) == sample_segmentations(
            30, 3, 10, seed=5
        )


class TestGroundTruthRank:
    def _cost(self, n, good_cuts):
        """Cost dict where only segmentations at good_cuts are cheap."""
        from repro.core.kseg import all_segments

        good = set(good_cuts) | {0, n - 1}
        return {
            (s, e): (0.0 if s in good and e in good else 1.0)
            for s, e in all_segments(range(n))
        }

    def test_gt_ranks_first_when_cheapest(self):
        n = 20
        cost = self._cost(n, [7, 13])
        samples = sample_segmentations(n, 3, 200, seed=0)
        assert ground_truth_rank([7, 13], n, cost, samples) == 1

    def test_gt_ranks_last_when_most_expensive(self):
        n = 20
        cost = {k: -v for k, v in self._cost(n, [7, 13]).items()}
        samples = [s for s in sample_segmentations(n, 3, 200, seed=0) if s != (7, 13)]
        rank = ground_truth_rank([7, 13], n, cost, samples)
        assert rank == len(samples) + 1

    def test_objective_additivity(self):
        n = 10
        cost = self._cost(n, [5])
        assert objective([5], n, cost) == 0.0
        assert objective([4], n, cost) == 2.0


class TestRankAcrossMetrics:
    def test_simple_ranking(self):
        out = rank_across_metrics({"a": 1, "b": 50, "c": 10})
        assert out == {"a": 1.0, "c": 2.0, "b": 3.0}

    def test_tie_averaging(self):
        out = rank_across_metrics({"a": 1, "b": 1, "c": 10})
        assert out["a"] == out["b"] == 1.5
        assert out["c"] == 3.0

    def test_all_tied(self):
        out = rank_across_metrics({"a": 2, "b": 2, "c": 2, "d": 2})
        assert all(v == 2.5 for v in out.values())

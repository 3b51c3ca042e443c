"""Scalar NDCG distance (Sec. 4.1): properties of the reference implementation."""
import numpy as np
import pytest

from repro.core import ndcg
from repro.core.space import ExplanationSpace
from repro.core.toplists import compute_toplists
from repro.core.types import Explanation


@pytest.fixture()
def S():
    rng = np.random.default_rng(0)
    return rng.uniform(0, 100, (5, 12))


def _toplist(S, seg, m=3):
    labels = [Explanation.of(k=i) for i in range(S.shape[0])]
    space = ExplanationSpace(labels, ["k"])
    tl = compute_toplists(S, space, [seg], m, use_gv=False)
    return tl.top_ids(seg)


class TestGammaTau:
    def test_gamma_is_abs_delta(self, S):
        np.testing.assert_allclose(ndcg.gamma(S, (2, 7)), np.abs(S[:, 7] - S[:, 2]))

    def test_tau_sign(self, S):
        t = ndcg.tau(S, (0, 5))
        np.testing.assert_array_equal(t, np.sign(S[:, 5] - S[:, 0]))

    def test_bad_segment_rejected(self, S):
        for seg in [(5, 5), (7, 2), (-1, 3), (0, 99)]:
            with pytest.raises(ValueError):
                ndcg.delta(S, seg)


class TestDCG:
    def test_rank_discount(self, S):
        # Same relevance at rank 1 vs rank 2 differs by the log2 discount.
        d = ndcg.delta(S, (0, 5))
        i = int(np.argmax(np.abs(d)))
        sg = int(np.sign(d[i]))
        one = ndcg.dcg(S, (0, 5), [i], [sg])
        # rank 2 via a dummy zero-relevance head
        j = int(np.argmin(np.abs(d)))
        two = ndcg.dcg(S, (0, 5), [j, i], [-9, sg])  # head rectified to 0
        assert two == pytest.approx(one * np.log2(2) / np.log2(3))

    def test_rectification_zeroes_disagreeing_effects(self, S):
        d = ndcg.delta(S, (0, 5))
        i = int(np.argmax(np.abs(d)))
        wrong_sign = -int(np.sign(d[i]))
        assert ndcg.dcg(S, (0, 5), [i], [wrong_sign]) == 0.0

    def test_idcg_equals_dcg_of_own_list(self, S):
        seg = (1, 9)
        ids = _toplist(S, seg)
        signs = [int(ndcg.tau(S, seg)[i]) for i in ids]
        assert ndcg.idcg(S, seg, ids) == pytest.approx(ndcg.dcg(S, seg, ids, signs))


class TestNDCG:
    def test_own_list_is_perfect(self, S):
        seg = (0, 11)
        ids = _toplist(S, seg)
        signs = [int(ndcg.tau(S, seg)[i]) for i in ids]
        assert ndcg.ndcg(S, seg, ids, ids, signs) == pytest.approx(1.0)

    def test_range(self, S):
        rng = np.random.default_rng(1)
        for _ in range(20):
            s1 = sorted(rng.choice(12, 2, replace=False))
            s2 = sorted(rng.choice(12, 2, replace=False))
            seg1, seg2 = (int(s1[0]), int(s1[1])), (int(s2[0]), int(s2[1]))
            ids1, ids2 = _toplist(S, seg1), _toplist(S, seg2)
            signs2 = [int(ndcg.tau(S, seg2)[i]) for i in ids2]
            v = ndcg.ndcg(S, seg1, ids1, ids2, signs2)
            assert 0.0 <= v <= 1.0

    def test_flat_query_vacuous(self):
        S = np.ones((3, 6))
        assert ndcg.ndcg(S, (0, 3), [0], [1, 1], [1, 1]) == 1.0


class TestDist:
    def test_self_distance_zero(self, S):
        seg = (2, 9)
        ids = _toplist(S, seg)
        assert ndcg.dist_tse(S, seg, ids, seg, ids) == pytest.approx(0.0)

    def test_symmetric(self, S):
        a, b = (0, 4), (6, 11)
        ia, ib = _toplist(S, a), _toplist(S, b)
        assert ndcg.dist_tse(S, a, ia, b, ib) == pytest.approx(
            ndcg.dist_tse(S, b, ib, a, ia)
        )

    def test_range(self, S):
        a, b = (0, 4), (6, 11)
        ia, ib = _toplist(S, a), _toplist(S, b)
        assert 0.0 <= ndcg.dist_tse(S, a, ia, b, ib) <= 1.0

    def test_variants_relate_to_tse(self, S):
        a, b = (0, 4), (4, 11)
        ia, ib = _toplist(S, a), _toplist(S, b)
        d1 = ndcg.dist_variant(S, a, ia, b, ib, "dist1")
        d2 = ndcg.dist_variant(S, a, ia, b, ib, "dist2")
        tse = ndcg.dist_variant(S, a, ia, b, ib, "tse")
        assert tse == pytest.approx((d1 + d2) / 2.0)

    def test_unknown_metric(self, S):
        with pytest.raises(ValueError):
            ndcg.dist_variant(S, (0, 1), [], (1, 2), [], "nope")

    def test_identical_series_zero_distance(self):
        """Two segments whose slices move identically are distance 0."""
        t = np.arange(10, dtype=float)
        S = np.vstack([5 * t, 2 * t, 0.5 * t])
        a, b = (0, 4), (5, 9)
        ia, ib = _toplist(S, a), _toplist(S, b)
        assert ndcg.dist_tse(S, a, ia, b, ib) == pytest.approx(0.0)

    def test_opposite_trends_large_distance(self):
        """Explanations whose effects flip sign are fully rectified away."""
        up = np.concatenate([np.arange(6.0), np.full(6, 5.0)])
        down = np.concatenate([np.full(6, 5.0), 5.0 - np.arange(6.0)])
        S = np.vstack([up, down])
        a, b = (0, 5), (6, 11)
        ia, ib = _toplist(S, a, m=1), _toplist(S, b, m=1)
        d = ndcg.dist_tse(S, a, ia, b, ib)
        assert d == pytest.approx(1.0)

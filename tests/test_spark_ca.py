"""Distributed Cascading Analysts (mapInPandas) vs the local implementation."""
import numpy as np
import pytest

from repro.core.space import ExplanationSpace
from repro.core.spark_ca import compute_toplists_spark
from repro.core.toplists import compute_toplists
from repro.core.types import Explanation


def _instance(seed=0, eps=8, n=25):
    rng = np.random.default_rng(seed)
    S = rng.uniform(0, 100, (eps, n))
    labels = [Explanation.of(k=i) for i in range(eps)]
    space = ExplanationSpace(labels, ["k"])
    segs = [(s, e) for s in range(n - 1) for e in range(s + 1, n)]
    return S, space, segs


@pytest.mark.parametrize("use_gv", [False, True])
def test_spark_matches_local(spark, use_gv):
    S, space, segs = _instance()
    local = compute_toplists(S, space, segs, 3, use_gv=use_gv)
    dist = compute_toplists_spark(spark, S, space, segs, 3, use_gv=use_gv)
    np.testing.assert_array_equal(local.ids, dist.ids)
    np.testing.assert_allclose(local.gammas, dist.gammas)
    np.testing.assert_array_equal(local.signs, dist.signs)
    np.testing.assert_allclose(local.idcg, dist.idcg)


def test_spark_multiattr_space(spark):
    rng = np.random.default_rng(1)
    labels = [
        Explanation.of(a=i) for i in range(4)
    ] + [Explanation.of(a=i, b=j) for i in range(4) for j in range(3)]
    space = ExplanationSpace(labels, ["a", "b"])
    S = rng.uniform(0, 10, (space.n_nodes, 15))
    segs = [(s, e) for s in range(14) for e in range(s + 1, 15)]
    local = compute_toplists(S, space, segs, 3)
    dist = compute_toplists_spark(spark, S, space, segs, 3)
    np.testing.assert_array_equal(local.ids, dist.ids)


def test_segment_row_alignment(spark):
    S, space, segs = _instance(seed=2, n=10)
    segs = segs[::-1]  # scrambled input order must be preserved
    dist = compute_toplists_spark(spark, S, space, segs, 2)
    for r, seg in enumerate(segs):
        assert dist.row(seg) == r

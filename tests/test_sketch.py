"""Sketching optimization O2: parameters and sketch selection."""
import numpy as np
import pytest

from repro.core.sketch import select_sketch, sketch_params
from repro.core.space import ExplanationSpace
from repro.core.toplists import compute_toplists, object_segments
from repro.core.types import Explanation


def test_sketch_params_paper_defaults():
    L, size = sketch_params(345)
    assert L == 17 and size == 60
    L, size = sketch_params(128)
    assert L == 6 and size == 64


def test_sketch_params_small_n_clamped():
    L, size = sketch_params(10)
    assert L >= 2 and size <= 8


def _setup(n, seed=0):
    rng = np.random.default_rng(seed)
    a = np.concatenate([np.linspace(0, 100, n // 2), np.linspace(100, 40, n - n // 2)])
    b = np.linspace(10, 20, n)
    S = np.vstack([a, b]) + rng.normal(0, 0.5, (2, n))
    labels = [Explanation.of(k="a"), Explanation.of(k="b")]
    space = ExplanationSpace(labels, ["k"])
    obj_tl = compute_toplists(S, space, object_segments(n), 3, use_gv=False)
    return S, space, obj_tl


def test_sketch_contains_endpoints_and_is_sorted():
    S, space, obj_tl = _setup(80)
    sk = select_sketch(S, space, obj_tl, m=3)
    assert sk[0] == 0 and sk[-1] == 79
    assert sk == sorted(set(sk))


def test_sketch_smaller_than_n():
    S, space, obj_tl = _setup(120)
    sk = select_sketch(S, space, obj_tl, m=3)
    assert len(sk) < 120


def test_sketch_contains_true_changepoint():
    n = 100
    S, space, obj_tl = _setup(n)
    sk = select_sketch(S, space, obj_tl, m=3)
    # the regime switch at n//2 should survive into the sketch (within 2)
    assert any(abs(p - n // 2) <= 2 for p in sk)


def test_tiny_series_valid_positions():
    S, space, obj_tl = _setup(8)
    sk = select_sketch(S, space, obj_tl, m=3)
    assert sk[0] == 0 and sk[-1] == 7
    assert set(sk) <= set(range(8))


def test_size_at_least_n_returns_all_positions():
    S, space, obj_tl = _setup(12)
    sk = select_sketch(S, space, obj_tl, m=3, size=11)
    assert sk == list(range(12))


def test_explicit_params_respected():
    S, space, obj_tl = _setup(60)
    sk = select_sketch(S, space, obj_tl, m=3, L=5, size=12)
    assert len(sk) <= 14  # 12 segments -> 11 cuts + 2 endpoints

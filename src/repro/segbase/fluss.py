"""FLUSS semantic segmentation (Gharghabi et al. [9]).

Brute-force matrix profile (z-normalized Euclidean nearest neighbours with a
trivial-match exclusion zone), arc curve, corrected arc curve (CAC) against
the idealized parabola, then regime extraction: repeatedly take the CAC global
minimum with a 5·w exclusion zone. The paper used the STUMPY implementation;
ours is a from-scratch equivalent sized for n in the hundreds-to-thousands.
"""
from __future__ import annotations

from typing import List, Optional

import numpy as np


def _znorm_subsequences(y: np.ndarray, w: int) -> np.ndarray:
    """(q, w) matrix of z-normalized subsequences."""
    q = len(y) - w + 1
    subs = np.lib.stride_tricks.sliding_window_view(y, w).astype(float)
    mu = subs.mean(axis=1, keepdims=True)
    sd = subs.std(axis=1, keepdims=True)
    sd[sd < 1e-12] = 1.0
    return (subs - mu) / sd


def matrix_profile_index(y: np.ndarray, w: int) -> np.ndarray:
    """Nearest-neighbour index per subsequence (exclusion zone w//2)."""
    Z = _znorm_subsequences(y, w)
    q = Z.shape[0]
    # dist^2 = 2w(1 - corr); corr via dot products of z-normalized rows.
    dots = Z @ Z.T
    d2 = np.maximum(2.0 * w * (1.0 - dots / w), 0.0)
    excl = max(1, w // 2)
    for i in range(q):
        lo, hi = max(0, i - excl), min(q, i + excl + 1)
        d2[i, lo:hi] = np.inf
    return np.argmin(d2, axis=1)


def corrected_arc_curve(y: np.ndarray, w: int) -> np.ndarray:
    """CAC in [0, 1] per subsequence position; borders pinned to 1."""
    nn = matrix_profile_index(y, w)
    q = len(nn)
    ac = np.zeros(q + 1)
    for i, j in enumerate(nn):
        lo, hi = (i, j) if i < j else (j, i)
        ac[lo + 1] += 1.0  # arc covers positions strictly between lo and hi
        ac[hi] -= 1.0
    ac = np.cumsum(ac)[:q]
    x = np.arange(q, dtype=float)
    ideal = 2.0 * x * (q - x) / q
    ideal[ideal < 1e-12] = 1e-12
    cac = np.minimum(ac / ideal, 1.0)
    border = min(q, max(1, w))
    cac[:border] = 1.0
    cac[-border:] = 1.0
    return cac


def fluss(y: np.ndarray, K: int, w: Optional[int] = None) -> List[int]:
    """K-1 regime boundaries from the CAC minima (5·w exclusion zone)."""
    y = np.asarray(y, dtype=float)
    n = len(y)
    K = max(1, min(K, n - 1))
    if K == 1:
        return []
    w = w if w is not None else max(4, n // 20)
    w = min(w, max(4, n // 3))
    cac = corrected_arc_curve(y, w).copy()
    cuts: List[int] = []
    excl = 5 * w
    for _ in range(K - 1):
        i = int(np.argmin(cac))
        if not np.isfinite(cac[i]) or cac[i] >= 1.0:
            break
        cuts.append(i + w // 2)  # subsequence start -> series position
        cac[max(0, i - excl) : i + excl + 1] = np.inf
    # Pad with evenly spaced positions if the CAC ran out of distinct minima.
    want = K - 1
    fill = [int(n * (i + 1) / K) for i in range(want)]
    for f in fill:
        if len(cuts) >= want:
            break
        if all(abs(f - c) > 2 for c in cuts):
            cuts.append(f)
    return sorted(int(min(max(c, 1), n - 2)) for c in cuts[:want])

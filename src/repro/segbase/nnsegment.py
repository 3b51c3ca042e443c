"""NNSegment-style changepoint segmentation (LimeSegment [42]).

The authors' code is unavailable offline; per DESIGN.md we reimplement the
idea — boundaries where local subsequence structure changes — as the classic
adjacent-window changepoint score: for each position i, the z-normalized
Euclidean distance between y[i-w : i] and y[i : i+w]; the K-1 highest-scoring
positions with a w-wide exclusion zone become the cuts.
"""
from __future__ import annotations

from typing import List, Optional

import numpy as np


def _znorm(v: np.ndarray) -> np.ndarray:
    sd = v.std()
    return (v - v.mean()) / (sd if sd > 1e-12 else 1.0)


def change_scores(y: np.ndarray, w: int) -> np.ndarray:
    """Adjacent-window distance per position (0 outside the valid range)."""
    n = len(y)
    scores = np.zeros(n)
    for i in range(w, n - w):
        a = _znorm(y[i - w : i])
        b = _znorm(y[i : i + w])
        scores[i] = float(np.linalg.norm(a - b))
    return scores


def nnsegment(y: np.ndarray, K: int, w: Optional[int] = None) -> List[int]:
    """K-1 interior cuts at the strongest local-structure changes."""
    y = np.asarray(y, dtype=float)
    n = len(y)
    K = max(1, min(K, n - 1))
    if K == 1:
        return []
    w = w if w is not None else max(4, n // 15)
    w = min(w, max(2, (n - 2) // 2))
    scores = change_scores(y, w).copy()
    cuts: List[int] = []
    for _ in range(K - 1):
        i = int(np.argmax(scores))
        if scores[i] <= 0:
            break
        cuts.append(i)
        scores[max(0, i - w) : i + w + 1] = -np.inf
    want = K - 1
    fill = [int(n * (i + 1) / K) for i in range(want)]
    for f in fill:
        if len(cuts) >= want:
            break
        if all(abs(f - c) > 2 for c in cuts):
            cuts.append(f)
    return sorted(int(min(max(c, 1), n - 2)) for c in cuts[:want])

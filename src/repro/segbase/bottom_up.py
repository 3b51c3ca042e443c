"""Bottom-Up piecewise-linear segmentation (Keogh et al. [21]).

Start from the finest segmentation (every adjacent pair its own segment) and
repeatedly merge the adjacent pair whose merged least-squares linear fit
increases the residual error least, until K segments remain. The paper found
this the strongest visual-shape baseline.
"""
from __future__ import annotations

from typing import List

import numpy as np


def _sse(y: np.ndarray, s: int, e: int) -> float:
    """Residual sum of squares of the best-fit line over y[s..e] (inclusive)."""
    seg = y[s : e + 1]
    n = len(seg)
    if n <= 2:
        return 0.0
    x = np.arange(n, dtype=float)
    slope, intercept = np.polyfit(x, seg, 1)
    resid = seg - (slope * x + intercept)
    return float(resid @ resid)


def bottom_up(y: np.ndarray, K: int) -> List[int]:
    """Interior cut indices for a K-segmentation of ``y``."""
    y = np.asarray(y, dtype=float)
    n = len(y)
    K = max(1, min(K, n - 1))
    # Segment boundaries: start with every point a boundary.
    bounds = list(range(n))  # segment i spans [bounds[i], bounds[i+1]]
    while len(bounds) - 1 > K:
        best_i, best_cost = -1, np.inf
        for i in range(len(bounds) - 2):
            s, mid, e = bounds[i], bounds[i + 1], bounds[i + 2]
            cost = _sse(y, s, e) - _sse(y, s, mid) - _sse(y, mid, e)
            if cost < best_cost:
                best_cost, best_i = cost, i
        del bounds[best_i + 1]
    return bounds[1:-1]

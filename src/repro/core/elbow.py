"""Optimal selection of K via the Kneedle elbow method (Sec. 6).

The K-variance curve decreases monotonically-ish in K. Following Satopaa et
al., we normalize the curve so it runs from (0, 0) to (1, 1) — the variance
axis is flipped, mapping (K=1, max var) to (0, 0) — and pick
``K* = argmax_K [gain_norm(K) - K_norm]``. (The paper's literal
"argmax[total_var(K) - K]" on an unflipped decreasing curve would always pick
K = 1; see DESIGN.md.)
"""
from __future__ import annotations

from typing import Sequence


def kneedle(curve: Sequence[float]) -> int:
    """Elbow K for ``curve`` = total variance at K = 1..Kmax. Returns K >= 1."""
    v = [float(x) for x in curve]
    if len(v) <= 1:
        return 1
    lo, hi = v[-1], v[0]
    if hi - lo <= 0:
        return 1  # flat curve: one segment is as good as many
    k_best, best = 1, float("-inf")
    for i, val in enumerate(v):
        x = i / (len(v) - 1)
        y = (hi - val) / (hi - lo)  # flipped: 0 at K=1, 1 at Kmax
        score = y - x
        if score > best:
            best, k_best = score, i + 1
    return k_best

"""Effectiveness metrics for the evaluation section.

- ``distance_percent`` (Fig. 10): normalized cut-displacement between an
  output segmentation and the ground truth ("edit distance normalized by K
  and n" — see DESIGN.md §5 for the interpretation).
- ``ground_truth_rank`` (Fig. 6): rank of the ground-truth segmentation's
  objective among uniformly sampled segmentation schemes, per variance metric.
"""
from __future__ import annotations

from typing import Dict, List, Sequence, Tuple

import numpy as np

from repro.core.kseg import segments_of_cuts


def distance_percent(pred_cuts: Sequence[int], gt_cuts: Sequence[int], n: int) -> float:
    """100 * sum |c_i - ĉ_i| / ((K-1) * n), cuts aligned in sorted order.

    When the two cut counts differ (a baseline that found fewer distinct
    boundaries), the shorter list is aligned to the closest counterparts and
    unmatched ground-truth cuts are charged their distance to the nearest
    prediction — so missing a boundary is penalized, not ignored.
    """
    a = sorted(int(c) for c in pred_cuts)
    b = sorted(int(c) for c in gt_cuts)
    if not b:
        return 0.0
    if len(a) == len(b):
        total = sum(abs(x - y) for x, y in zip(a, b))
    elif not a:
        total = sum(min(g, n - 1 - g) for g in b)
    else:
        total = sum(min(abs(g - p) for p in a) for g in b)
    return 100.0 * total / (len(b) * n)


def sample_segmentations(
    n: int, K: int, n_samples: int, seed: int = 0
) -> List[Tuple[int, ...]]:
    """Uniformly sampled K-segmentations: K-1 distinct interior cuts."""
    rng = np.random.default_rng(seed)
    out = []
    interior = np.arange(1, n - 1)
    for _ in range(n_samples):
        cuts = np.sort(rng.choice(interior, K - 1, replace=False))
        out.append(tuple(int(c) for c in cuts))
    return out


def objective(cuts: Sequence[int], n: int, cost_of: Dict[Tuple[int, int], float]) -> float:
    """Total weighted variance of an arbitrary segmentation under one metric."""
    return float(sum(cost_of[seg] for seg in segments_of_cuts(cuts, n)))


def ground_truth_rank(
    gt_cuts: Sequence[int],
    n: int,
    cost_of: Dict[Tuple[int, int], float],
    samples: Sequence[Tuple[int, ...]],
) -> int:
    """1 + number of sampled schemes scoring strictly below the ground truth.
    Rank 1 means no sampled scheme beats the ground truth under this metric."""
    gt_obj = objective(gt_cuts, n, cost_of)
    better = sum(1 for s in samples if objective(s, n, cost_of) < gt_obj - 1e-12)
    return 1 + better


def rank_across_metrics(gt_ranks: Dict[str, int]) -> Dict[str, float]:
    """Rank the metrics 1 (best) .. len (worst) by their ground-truth rank,
    averaging tied ranks (Fig. 6's per-dataset metric ranking)."""
    items = sorted(gt_ranks.items(), key=lambda kv: kv[1])
    out: Dict[str, float] = {}
    i = 0
    while i < len(items):
        j = i
        while j < len(items) and items[j][1] == items[i][1]:
            j += 1
        avg = (i + 1 + j) / 2.0  # mean of ranks i+1 .. j
        for k in range(i, j):
            out[items[k][0]] = avg
        i = j
    return out

"""Scalar-reference NDCG distance between segments (paper Sec. 4.1, Eq. 3-6).

This module is the readable, per-pair implementation used as the ground truth
in tests; :mod:`repro.core.segcost` is the vectorized production path and is
tested for equality against this one.

Segments are (s, e) index pairs into the eps x n series matrix ``S`` (0-based,
inclusive endpoints). The "delta" of explanation E over (s, e) is
``S[E, e] - S[E, s]``; for decomposable SUM/COUNT aggregates gamma is its
absolute value and tau its sign (Definitions 3.2 and 3.3 collapse to the
slice's own delta because removing E changes the two-endpoint difference by
exactly that amount).
"""
from __future__ import annotations

import math
from typing import List, Sequence, Tuple

import numpy as np

Segment = Tuple[int, int]


def delta(S: np.ndarray, seg: Segment) -> np.ndarray:
    """Per-explanation signed change over a segment."""
    s, e = seg
    if not 0 <= s < e < S.shape[1]:
        raise ValueError(f"bad segment {seg} for n={S.shape[1]}")
    return S[:, e] - S[:, s]


def gamma(S: np.ndarray, seg: Segment) -> np.ndarray:
    """Absolute-change diff score per explanation (Def. 3.2)."""
    return np.abs(delta(S, seg))


def tau(S: np.ndarray, seg: Segment) -> np.ndarray:
    """Change effect per explanation (Def. 3.3): +1 / -1 / 0."""
    return np.sign(delta(S, seg)).astype(np.int8)


def _w(rank: int) -> float:
    """DCG discount for 1-based rank."""
    return 1.0 / math.log2(rank + 1)


def dcg(
    S: np.ndarray,
    query: Segment,
    doc_ids: Sequence[int],
    doc_signs: Sequence[int],
) -> float:
    """DCG of a ranked explanation list against query segment (Eq. 3).

    ``doc_signs`` are the effects tau of each listed explanation *on the
    segment the list came from*; relevance is rectified to 0 when the effect
    on the query segment disagrees (Table 2).
    """
    d = delta(S, query)
    total = 0.0
    for r, (i, sg) in enumerate(zip(doc_ids, doc_signs), start=1):
        rel = abs(float(d[i]))
        if int(np.sign(d[i])) != int(sg):
            rel = 0.0
        total += rel * _w(r)
    return total


def idcg(S: np.ndarray, query: Segment, own_ids: Sequence[int]) -> float:
    """DCG of the query's own top list against itself (Eq. 4) — no
    rectification, because tau trivially agrees."""
    g = gamma(S, query)
    return sum(float(g[i]) * _w(r) for r, i in enumerate(own_ids, start=1))


def ndcg(
    S: np.ndarray,
    query: Segment,
    query_own_ids: Sequence[int],
    doc_ids: Sequence[int],
    doc_signs: Sequence[int],
) -> float:
    """NDCG in [0, 1] (Eq. 5). IDCG = 0 (flat query segment) => 1 (vacuous);
    clipped because a foreign list can tie/beat the CA list's DCG (the CA
    objective is sum-gamma, not DCG)."""
    ideal = idcg(S, query, query_own_ids)
    if ideal <= 0.0:
        return 1.0
    return float(min(1.0, dcg(S, query, doc_ids, doc_signs) / ideal))


def dist_tse(
    S: np.ndarray,
    seg_i: Segment,
    ids_i: Sequence[int],
    seg_j: Segment,
    ids_j: Sequence[int],
) -> float:
    """Symmetric explanation distance between two segments (Eq. 6)."""
    signs_i = [int(tau(S, seg_i)[k]) for k in ids_i]
    signs_j = [int(tau(S, seg_j)[k]) for k in ids_j]
    n_ij = ndcg(S, seg_i, ids_i, ids_j, signs_j)  # how well E*(P_j) explains P_i
    n_ji = ndcg(S, seg_j, ids_j, ids_i, signs_i)  # how well E*(P_i) explains P_j
    return 1.0 - (n_ij + n_ji) / 2.0


def dist_variant(
    S: np.ndarray,
    centroid: Segment,
    ids_c: Sequence[int],
    obj: Segment,
    ids_o: Sequence[int],
    metric: str,
) -> float:
    """dist between centroid and object under tse / dist1 / dist2 (Eq. 6, 8, 9).

    dist1 keeps only "how well the object's list explains the centroid";
    dist2 keeps only "how well the centroid's list explains the object".
    """
    signs_c = [int(tau(S, centroid)[k]) for k in ids_c]
    signs_o = [int(tau(S, obj)[k]) for k in ids_o]
    n_obj_explains_cen = ndcg(S, centroid, ids_c, ids_o, signs_o)
    n_cen_explains_obj = ndcg(S, obj, ids_o, ids_c, signs_c)
    if metric == "tse":
        return 1.0 - (n_obj_explains_cen + n_cen_explains_obj) / 2.0
    if metric == "dist1":
        return 1.0 - n_obj_explains_cen
    if metric == "dist2":
        return 1.0 - n_cen_explains_obj
    raise ValueError(f"unknown pairwise metric {metric!r}")

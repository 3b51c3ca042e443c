"""Per-segment top-explanation lists (pipeline module b output).

For every segment (s, e) we run the Cascading Analysts algorithm on the
gamma vector ``|S[:, e] - S[:, s]|`` and store the ranked ids, gammas, signs
and the ideal DCG. Lists are padded to length m with id = -1 / gamma = 0.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Dict, List, Sequence, Tuple

import numpy as np

from repro.core.cascading import topm_guess_verify, topm_nonoverlapping
from repro.core.space import ExplanationSpace

Segment = Tuple[int, int]


def dcg_weights(m: int) -> np.ndarray:
    """1/log2(r+1) for 1-based ranks 1..m."""
    return 1.0 / np.log2(np.arange(1, m + 1) + 1.0)


@dataclass
class TopLists:
    """Ranked top-m lists for a set of segments, column-aligned by rank."""

    m: int
    segments: np.ndarray  # (R, 2) int
    ids: np.ndarray  # (R, m) int, -1 padded
    gammas: np.ndarray  # (R, m) float
    signs: np.ndarray  # (R, m) int8 (0 on padding)
    idcg: np.ndarray  # (R,) float
    index: Dict[Segment, int] = field(default_factory=dict)

    def __post_init__(self) -> None:
        if not self.index:
            self.index = {
                (int(s), int(e)): r for r, (s, e) in enumerate(self.segments)
            }

    def row(self, seg: Segment) -> int:
        return self.index[(int(seg[0]), int(seg[1]))]

    def top_ids(self, seg: Segment) -> List[int]:
        r = self.row(seg)
        return [int(i) for i in self.ids[r] if i >= 0]


def compute_toplists(
    S: np.ndarray,
    space: ExplanationSpace,
    segments: Sequence[Segment],
    m: int,
    use_gv: bool = True,
    m_bar0: int = 30,
) -> TopLists:
    """Run CA (optionally with guess-and-verify) for every segment, locally."""
    segs = np.asarray(list(segments), dtype=np.int64).reshape(-1, 2)
    rows = [
        _toplist_row(S, space, (int(s), int(e)), m, use_gv, m_bar0)
        for s, e in segs
    ]
    ids = np.stack([r[0] for r in rows]) if rows else np.zeros((0, m), np.int64)
    gammas = np.stack([r[1] for r in rows]) if rows else np.zeros((0, m))
    signs = np.stack([r[2] for r in rows]) if rows else np.zeros((0, m), np.int8)
    w = dcg_weights(m)
    idcg = (gammas * w).sum(axis=1)
    return TopLists(m=m, segments=segs, ids=ids, gammas=gammas, signs=signs, idcg=idcg)


def _toplist_row(
    S: np.ndarray,
    space: ExplanationSpace,
    seg: Segment,
    m: int,
    use_gv: bool,
    m_bar0: int,
) -> Tuple[np.ndarray, np.ndarray, np.ndarray]:
    """One segment's padded (ids, gammas, signs)."""
    s, e = seg
    d = S[:, e] - S[:, s]
    g = np.abs(d)
    res = (
        topm_guess_verify(space, g, m, m_bar0)
        if use_gv
        else topm_nonoverlapping(space, g, m)
    )
    ids = np.full(m, -1, dtype=np.int64)
    gammas = np.zeros(m)
    signs = np.zeros(m, dtype=np.int8)
    for r, nid in enumerate(res.ids[:m]):
        ids[r] = nid
        gammas[r] = g[nid]
        signs[r] = np.sign(d[nid])
    return ids, gammas, signs


def object_segments(n: int) -> List[Segment]:
    """The n-1 atomic objects [p_x, p_{x+1}] (Sec. 4.1.1)."""
    return [(x, x + 1) for x in range(n - 1)]

"""The Cascading Analysts algorithm [Ruhl et al., SIGMOD'18] and
guess-and-verify (paper Sec. 5.2 module b and Sec. 5.3.1).

Finds top-m non-overlapping explanations (Def. 3.5) reachable by recursive
drill-downs: at each node either *take* the node's slice as one explanation, or
*drill down* one dimension and split the remaining quota among that dimension's
values (children with distinct values are pairwise disjoint). Dynamic
programming over (node, quota) is exact within this cascading family.

``best(node, q)`` = max total gamma using at most ``q`` pairwise-disjoint
explanations from refinements of ``node``:

    best(node, q) = max( gamma[node] if takeable and q >= 1,
                         max over attr d not in node:
                             knapsack over children(node, d) of best(child, .) )

We use the "at most m" variant (paper footnote 2); since gamma >= 0 this only
differs from "exactly m" by zero-score padding.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Optional, Sequence, Tuple

import numpy as np

from repro.core.space import ExplanationSpace

_ROOT = -1


@dataclass
class CAResult:
    """Top-m non-overlapping explanations for one segment.

    ids are sorted by gamma descending (the "ideal ranked list" for NDCG);
    ``best[q]`` is the optimal total score with quota q (the Best[m'] side
    products that guess-and-verify needs).
    """

    ids: List[int]
    gammas: List[float]
    best: List[float]

    @property
    def total(self) -> float:
        return self.best[-1]


def _combine(child_best: List[List[float]], m: int) -> List[float]:
    """Quota-knapsack across disjoint children: acc[q] = max split of q."""
    acc = [0.0] * (m + 1)
    for cb in child_best:
        nxt = acc[:]
        for q in range(1, m + 1):
            hi = nxt[q]
            for qc in range(1, q + 1):
                v = acc[q - qc] + cb[qc]
                if v > hi:
                    hi = v
            nxt[q] = hi
        acc = nxt
    return acc


def _node_best(
    space: ExplanationSpace, gamma: np.ndarray, m: int
) -> Tuple[List[List[float]], List[float]]:
    """Bottom-up DP: per-node best arrays plus the root array."""
    n = space.n_nodes
    best: List[List[float]] = [None] * n  # type: ignore[list-item]
    for nid in space.topo_desc:
        take = float(gamma[nid]) if space.takeable[nid] else 0.0
        arr = [0.0] + [take] * m
        for kids in space.children[nid].values():
            comb = _combine([best[k] for k in kids], m)
            for q in range(1, m + 1):
                if comb[q] > arr[q]:
                    arr[q] = comb[q]
        best[nid] = arr
    root = [0.0] * (m + 1)
    for kids in space.root_children.values():
        comb = _combine([best[k] for k in kids], m)
        for q in range(1, m + 1):
            if comb[q] > root[q]:
                root[q] = comb[q]
    return best, root


def _backtrack(
    space: ExplanationSpace,
    gamma: np.ndarray,
    m: int,
    best: List[List[float]],
    root: List[float],
) -> List[int]:
    """Recover one optimal selection by re-deriving argmax choices."""
    # Scale-relative tolerance: gammas can be ~1e6+, where float64 sums carry
    # absolute error far above any fixed 1e-9.
    scale = max(1.0, float(abs(root[m])))
    eps = 1e-9 * scale
    out: List[int] = []

    def split(kids: Sequence[int], q: int, target: float) -> Optional[List[Tuple[int, int]]]:
        """Find a quota split across kids achieving ``target`` (re-runs the
        knapsack keeping parent pointers; only called on the optimal path)."""
        accs = [[0.0] * (q + 1)]
        for k in kids:
            prev = accs[-1]
            cur = prev[:]
            for qq in range(1, q + 1):
                for qc in range(1, qq + 1):
                    v = prev[qq - qc] + best[k][qc]
                    if v > cur[qq]:
                        cur[qq] = v
            accs.append(cur)
        if accs[-1][q] + eps < target:
            return None
        # Walk back choosing how much quota each kid consumed.
        alloc: List[Tuple[int, int]] = []
        qq = q
        for i in range(len(kids) - 1, -1, -1):
            prev, cur = accs[i], accs[i + 1]
            done = False
            for qc in range(0, qq + 1):
                cand = prev[qq - qc] + (best[kids[i]][qc] if qc else 0.0)
                if abs(cand - cur[qq]) <= eps:
                    if qc:
                        alloc.append((kids[i], qc))
                    qq -= qc
                    done = True
                    break
            if not done:  # pragma: no cover - defensive
                return None
        return alloc

    def visit(nid: int, q: int) -> None:
        if q == 0:
            return
        target = root[q] if nid == _ROOT else best[nid][q]
        if target <= 0.0:
            return
        if nid != _ROOT and space.takeable[nid] and abs(float(gamma[nid]) - target) <= eps:
            out.append(nid)
            return
        kid_map = space.root_children if nid == _ROOT else space.children[nid]
        for kids in kid_map.values():
            alloc = split(kids, q, target)
            if alloc is not None:
                for k, qc in alloc:
                    visit(k, qc)
                return
        raise AssertionError("backtrack failed to reproduce DP value")  # pragma: no cover

    visit(_ROOT, m)
    return out


def topm_nonoverlapping(space: ExplanationSpace, gamma: np.ndarray, m: int) -> CAResult:
    """Exact CA: top-(at most)m non-overlapping explanations maximizing sum gamma."""
    if len(gamma) != space.n_nodes:
        raise ValueError("gamma must have one entry per space node")
    best, root = _node_best(space, gamma, m)
    ids = _backtrack(space, gamma, m, best, root)
    ids.sort(key=lambda i: -float(gamma[i]))
    return CAResult(ids=ids, gammas=[float(gamma[i]) for i in ids], best=root)


def topm_guess_verify(
    space: ExplanationSpace,
    gamma: np.ndarray,
    m: int,
    m_bar0: int = 30,
) -> CAResult:
    """Guess-and-verify (O1): run CA on the top-m̄ candidates by gamma, then
    check optimality with Eq. 12; double m̄ until verified. Exact.

    Eq. 12: Best[m] >= Best[m'] + sum of the (m-m') largest tail gammas, for
    every 0 <= m' < m — any solution mixing m' head and (m-m') tail
    explanations is dominated, so the restricted answer is globally optimal.
    """
    cand = space.candidate_ids()
    chi = cand[np.argsort(-gamma[cand], kind="stable")]  # ranked candidate list
    n_cand = len(chi)
    m_bar = min(m_bar0, n_cand)
    while True:
        head = chi[:m_bar]
        sub, old_of_new = space.restrict(head)
        res = topm_nonoverlapping(sub, gamma[old_of_new], m)
        tail = gamma[chi[m_bar:]]
        tol = 1e-9 * max(1.0, abs(res.best[m]))
        ok = all(
            res.best[m] + tol >= res.best[mp] + float(tail[: m - mp].sum())
            for mp in range(m)
        )
        if ok or m_bar >= n_cand:
            ids = [int(old_of_new[i]) for i in res.ids]
            return CAResult(ids=ids, gammas=res.gammas, best=res.best)
        m_bar = min(2 * m_bar, n_cand)

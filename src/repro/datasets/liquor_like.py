"""Liquor-like dataset (stand-in for Iowa liquor sales, DESIGN.md §2).

Transactions over four explain-by attributes — BV (bottle volume, 4 values),
P (pack, 4 values), CN (category name, 16), VN (vendor name, 32) — over
n = 128 days. The KPI is ``SELECT date, SUM(bottles) GROUP BY date``. Seven
planted regimes mirror Table 5, including the order-2 contributors
(BV=1750&P=6, BV=750&P=12, BV=1000&P=12, BV=1750&P=12) and the BV=1000
crash/recovery story. Small counterweight deltas on sibling slices keep the
parents' net change below the planted conjunctions so the Cascading Analysts
DP must drill down, as in the paper. The large CN x VN cross-product drives
the candidate count eps into the thousands — the regime where CA is the
bottleneck and the paper's optimizations matter.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Tuple

import numpy as np
import pandas as pd

from repro.core.types import Explanation

BV_VALUES = [375, 750, 1000, 1750]
P_VALUES = [6, 12, 24, 48]
CN_VALUES = [f"cat_{i:02d}" for i in range(16)]
VN_VALUES = [f"vendor_{i:02d}" for i in range(32)]

GT_CUTS: List[int] = [18, 46, 64, 78, 90, 112]

# Planted per-segment total change per slice; keys are predicate dicts.
_Slice = Tuple[Tuple[str, object], ...]


def _sl(**kw) -> _Slice:
    return tuple(sorted(kw.items()))


_DELTAS: List[Dict[_Slice, float]] = [
    {
        _sl(P=12): -400,
        _sl(P=6): -300,
        _sl(BV=375, P=24): -150,
        _sl(BV=750): -60,
        _sl(BV=1000, P=24): 70,  # counterweight: net |P=24| below the conj.
        _sl(BV=750, P=24): 40,
    },
    {_sl(P=12): 800, _sl(P=6): 500, _sl(P=48): 350, _sl(BV=1000): 80},
    {
        _sl(BV=1000): -600,
        _sl(BV=1750, P=6): 450,
        _sl(BV=750, P=12): 350,
        _sl(BV=375, P=6): -80,  # counterweight: keep net P=6 below the conj.
        _sl(BV=750, P=24): -80,
        _sl(BV=1750, P=12): -60,
    },
    {
        _sl(P=12): 700,
        _sl(BV=1750, P=6): -350,
        _sl(P=24): 300,
        _sl(BV=1750, P=48): 90,  # keep |BV=1750| net below the conjunction
        _sl(BV=375, P=6): 60,
    },
    {
        _sl(BV=1750, P=12): -500,
        _sl(P=6): 350,
        _sl(BV=1000, P=12): 300,
        _sl(BV=1750, P=24): 120,
        _sl(BV=375, P=12): 60,
    },
    {
        _sl(BV=1000): 650,
        _sl(BV=1750, P=6): -400,
        _sl(BV=750, P=12): -300,
        _sl(BV=1750, P=12): 90,
        _sl(BV=375, P=6): 70,
        _sl(BV=750, P=24): 60,
    },
    {
        _sl(P=12): 600,
        _sl(BV=1750, P=6): 400,
        _sl(P=24): 300,
        _sl(BV=1750, P=12): -70,
        _sl(BV=375, P=6): -90,  # counterweight: net |P=6| below the conj.
    },
]

EXPECTED_TOP3: List[List[Tuple[str, int]]] = [
    [("P=12", -1), ("P=6", -1), ("BV=375 & P=24", -1)],
    [("P=12", 1), ("P=6", 1), ("P=48", 1)],
    [("BV=1000", -1), ("BV=1750 & P=6", 1), ("BV=750 & P=12", 1)],
    [("P=12", 1), ("BV=1750 & P=6", -1), ("P=24", 1)],
    [("BV=1750 & P=12", -1), ("P=6", 1), ("BV=1000 & P=12", 1)],
    [("BV=1000", 1), ("BV=1750 & P=6", -1), ("BV=750 & P=12", -1)],
    [("P=12", 1), ("BV=1750 & P=6", 1), ("P=24", 1)],
]


@dataclass
class LiquorLike:
    relation_df: pd.DataFrame  # (date, BV, P, CN, VN, bottles)
    dates: pd.DatetimeIndex
    gt_cuts: List[int]
    attrs: Tuple[str, ...] = ("BV", "P", "CN", "VN")

    @property
    def n(self) -> int:
        return len(self.dates)

    @property
    def gt_k(self) -> int:
        return len(self.gt_cuts) + 1

    def relation(self) -> pd.DataFrame:
        return self.relation_df


def _combo_pool(rng: np.random.Generator, n_combos: int) -> pd.DataFrame:
    """Plausible (BV, P, CN, VN) combinations with base daily volumes.

    ~45% of combos are long-tail products with near-zero volume, mirroring the
    real dataset where the 0.001 support filter removes most of the candidate
    explanations (paper Table 6: 8197 -> 1812)."""
    seen = set()
    rows = []
    while len(rows) < n_combos:
        bv = int(rng.choice(BV_VALUES))
        p = int(rng.choice(P_VALUES))
        cn = str(rng.choice(CN_VALUES))
        vn = str(rng.choice(VN_VALUES))
        key = (bv, p, cn, vn)
        if key in seen:
            continue
        seen.add(key)
        tiny = rng.random() < 0.45
        base = float(rng.uniform(0.1, 1.2)) if tiny else float(rng.uniform(5.0, 40.0))
        rows.append((bv, p, cn, vn, base))
    return pd.DataFrame(rows, columns=["BV", "P", "CN", "VN", "base"])


def generate(
    n: int = 128, n_combos: int = 600, noise: float = 1.0, seed: int = 13
) -> LiquorLike:
    rng = np.random.default_rng(seed)
    pool = _combo_pool(rng, n_combos)
    bounds = [0, *[int(c * n / 128) for c in GT_CUTS], n - 1]

    # Per-combo daily value: base + proportional share of every planted slice
    # delta the combo matches, linearly ramped across the regime.
    vals = np.tile(pool["base"].to_numpy()[:, None], (1, n))
    for seg, deltas in enumerate(_DELTAS):
        s, e = bounds[seg], bounds[seg + 1]
        ramp = np.zeros(n)
        ramp[s : e + 1] = np.linspace(0.0, 1.0, e - s + 1)
        ramp[e + 1 :] = 1.0
        for sl, d in deltas.items():
            mask = np.ones(len(pool), dtype=bool)
            for a, v in sl:
                mask &= pool[a].to_numpy() == v
            if not mask.any():
                continue
            w = pool.loc[mask, "base"].to_numpy()
            share = d * w / w.sum()
            vals[mask] += share[:, None] * ramp[None, :]
    vals += rng.normal(0.0, noise, vals.shape)
    vals = np.maximum(np.round(vals), 0.0)

    # n sales days spread over the paper's actual span (1/2 .. 6/30).
    dates = pd.DatetimeIndex(
        pd.date_range("2020-01-02", "2020-06-30", periods=n).normalize()
    )
    n_c = len(pool)
    rel = pd.DataFrame(
        {
            "date": np.tile(dates, n_c),
            "BV": np.repeat(pool["BV"].to_numpy(), n),
            "P": np.repeat(pool["P"].to_numpy(), n),
            "CN": np.repeat(pool["CN"].to_numpy(), n),
            "VN": np.repeat(pool["VN"].to_numpy(), n),
            "bottles": vals.reshape(-1),
        }
    )
    rel = rel[rel["bottles"] > 0].reset_index(drop=True)
    return LiquorLike(relation_df=rel, dates=dates, gt_cuts=bounds[1:-1])

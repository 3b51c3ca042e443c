"""Covid-like dataset (stand-in for the JHU Covid-19 data, DESIGN.md §2).

Relation (date, state, daily_confirmed) over n = 345 days (2020-01-22 ..
2020-12-31, as in the paper) and 10 states, with seven planted waves mirroring
Table 3's narrative. ``total_confirmed`` is the per-state running sum, giving
the second aggregated series of Sec. 7.1.2.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Tuple

import numpy as np
import pandas as pd

from repro.core.types import Explanation

STATES = ["WA", "NY", "NJ", "MA", "CA", "TX", "FL", "IL", "WI", "GA"]

# Planted regime boundaries (0-based day indices) and per-state total change
# of the *daily* series across each regime. Mirrors paper Table 3:
#   WA/NY/CA early -> NY/NJ/MA wave -> NY/NJ decline + CA rise -> FL/TX/CA
#   summer -> FL/TX/CA decline -> IL/TX/WI fall -> CA/NY winter with IL down.
GT_CUTS: List[int] = [45, 76, 124, 176, 231, 293]
_DELTAS: List[Dict[str, float]] = [
    {"WA": 800, "NY": 600, "CA": 400, "GA": 60, "IL": 50},
    {"NY": 9000, "NJ": 5000, "MA": 3000, "CA": 700, "GA": 400, "WA": 200},
    {"NY": -8000, "NJ": -4500, "CA": 2500, "MA": -2000, "WA": -300},
    {"FL": 7000, "TX": 6000, "CA": 5000, "GA": 900, "WI": 300},
    {"FL": -6000, "TX": -5000, "CA": -4000, "GA": -700},
    {"IL": 8000, "TX": 6000, "WI": 5000, "GA": 1500, "CA": 1200},
    {"CA": 12000, "NY": 9000, "IL": -6000, "TX": 2000, "WI": -1500},
]
# The top-3 (label, sign) per planted segment, in gamma order — the "Table 3"
# ground truth our pipeline should recover.
EXPECTED_TOP3: List[List[Tuple[str, int]]] = [
    [("state=WA", 1), ("state=NY", 1), ("state=CA", 1)],
    [("state=NY", 1), ("state=NJ", 1), ("state=MA", 1)],
    [("state=NY", -1), ("state=NJ", -1), ("state=CA", 1)],
    [("state=FL", 1), ("state=TX", 1), ("state=CA", 1)],
    [("state=FL", -1), ("state=TX", -1), ("state=CA", -1)],
    [("state=IL", 1), ("state=TX", 1), ("state=WI", 1)],
    [("state=CA", 1), ("state=NY", 1), ("state=IL", -1)],
]


@dataclass
class CovidLike:
    daily: np.ndarray  # (n_states, n)
    total: np.ndarray  # (n_states, n) cumulative
    dates: pd.DatetimeIndex
    labels: List[Explanation]
    gt_cuts: List[int]
    attrs: Tuple[str, ...] = ("state",)

    @property
    def n(self) -> int:
        return self.daily.shape[1]

    @property
    def gt_k(self) -> int:
        return len(self.gt_cuts) + 1

    def series(self, kind: str = "daily") -> Tuple[np.ndarray, np.ndarray]:
        """(S, total-series) for 'daily' or 'total' confirmed cases."""
        S = self.daily if kind == "daily" else self.total
        return S, S.sum(axis=0)

    def relation(self) -> pd.DataFrame:
        """Rows (date, state, daily_confirmed, total_confirmed)."""
        n_states, n = self.daily.shape
        return pd.DataFrame(
            {
                "date": np.tile(self.dates, n_states),
                "state": np.repeat(STATES, n),
                "daily_confirmed": self.daily.reshape(-1),
                "total_confirmed": self.total.reshape(-1),
            }
        )


def generate(n: int = 345, noise: float = 0.02, seed: int = 7) -> CovidLike:
    """Build the planted-wave dataset; ``noise`` is the per-day relative sigma."""
    rng = np.random.default_rng(seed)
    bounds = [0, *[int(c * n / 345) for c in GT_CUTS], n - 1]
    daily = np.zeros((len(STATES), n))
    base = {s: 80.0 for s in STATES}
    level = dict(base)
    for si, st in enumerate(STATES):
        daily[si, 0] = level[st]
    for seg, deltas in enumerate(_DELTAS):
        s, e = bounds[seg], bounds[seg + 1]
        ln = e - s
        for si, st in enumerate(STATES):
            d = deltas.get(st, 20.0 * (1 if seg % 2 == 0 else -0.2))
            slope = d / ln
            for t in range(s, e):
                daily[si, t + 1] = daily[si, t] + slope
    daily = np.maximum(daily, 1.0)
    daily *= 1.0 + rng.normal(0.0, noise, daily.shape)
    daily = np.round(np.maximum(daily, 0.0))
    dates = pd.date_range("2020-01-22", periods=n, freq="D")
    labels = [Explanation.of(state=s) for s in STATES]
    return CovidLike(
        daily=daily,
        total=daily.cumsum(axis=1),
        dates=dates,
        labels=labels,
        gt_cuts=bounds[1:-1],
    )

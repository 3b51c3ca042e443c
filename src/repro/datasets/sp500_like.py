"""S&P500-like dataset (stand-in for the real index, DESIGN.md §2).

48 synthetic stocks with a (category, subcategory, stock) hierarchy and fixed
free-float shares; the KPI is SUM(price*share) over n = 151 trading days
(2020-01-02 .. 2020-10-01 in the paper). Four planted regimes mirror Table 4:

  1. tech (+) and internet-retail (+, under consumer_cyclical as with the real
     GICS classification) rise while energy (-) drops;
  2. crash: everything down, led by tech / financial / communication;
  3. tech-led recovery with consumer_cyclical and communication, financial flat;
  4. late drop led by tech / communication / financial.

Other consumer_cyclical subcategories move slightly *against* internet retail
in regime 1 so the Cascading Analysts DP must drill down to the order-2
explanation {category=consumer_cyclical & subcategory=internet_retail} — the
paper's "internet retail +" row.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Tuple

import numpy as np
import pandas as pd

from repro.core.types import Explanation

# (category, subcategory, #stocks, total base cap in arbitrary trillions)
_STRUCTURE = [
    ("technology", "software", 6, 6.0),
    ("technology", "hardware", 6, 4.0),
    ("financial", "banks", 4, 2.5),
    ("financial", "insurance", 4, 1.5),
    ("communication", "media", 3, 2.0),
    ("communication", "telecom", 3, 1.5),
    ("energy", "oil_gas", 6, 3.0),
    ("consumer_cyclical", "internet_retail", 2, 1.2),
    ("consumer_cyclical", "autos", 3, 0.9),
    ("consumer_cyclical", "apparel", 3, 0.9),
    ("healthcare", "pharma", 8, 3.0),
]

GT_CUTS: List[int] = [24, 57, 113]

# Per-regime relative price change, keyed by category or (category, subcat).
_RETURNS: List[Dict[object, float]] = [
    {
        "technology": 0.08,
        "energy": -0.10,
        ("consumer_cyclical", "internet_retail"): 0.20,
        ("consumer_cyclical", "autos"): -0.02,
        ("consumer_cyclical", "apparel"): -0.02,
        "financial": 0.008,
        "communication": 0.008,
        "healthcare": 0.008,
    },
    {
        "technology": -0.32,
        "financial": -0.36,
        "communication": -0.29,
        "energy": -0.28,
        "consumer_cyclical": -0.24,
        "healthcare": -0.18,
    },
    {
        "technology": 0.50,
        "consumer_cyclical": 0.52,
        "communication": 0.34,
        "financial": 0.04,
        "healthcare": 0.18,
        "energy": 0.08,
    },
    {
        "technology": -0.12,
        "communication": -0.11,
        "financial": -0.09,
        "consumer_cyclical": -0.015,
        "healthcare": -0.015,
        "energy": -0.015,
    },
]

EXPECTED_TOP3: List[List[Tuple[str, int]]] = [
    [
        ("category=technology", 1),
        ("category=energy", -1),
        ("category=consumer_cyclical & subcategory=internet_retail", 1),
    ],
    [("category=technology", -1), ("category=financial", -1), ("category=communication", -1)],
    [("category=technology", 1), ("category=consumer_cyclical", 1), ("category=communication", 1)],
    [("category=technology", -1), ("category=communication", -1), ("category=financial", -1)],
]


@dataclass
class SP500Like:
    prices: np.ndarray  # (n_stocks, n)
    shares: np.ndarray  # (n_stocks,)
    meta: pd.DataFrame  # stock, category, subcategory
    dates: pd.DatetimeIndex
    gt_cuts: List[int]
    attrs: Tuple[str, ...] = ("category", "subcategory", "stock")

    @property
    def n(self) -> int:
        return self.prices.shape[1]

    @property
    def gt_k(self) -> int:
        return len(self.gt_cuts) + 1

    def relation(self) -> pd.DataFrame:
        """Rows (date, category, subcategory, stock, price, share)."""
        n_stocks, n = self.prices.shape
        rep = self.meta.loc[self.meta.index.repeat(n)].reset_index(drop=True)
        rep["date"] = np.tile(self.dates, n_stocks)
        rep["price"] = self.prices.reshape(-1)
        rep["share"] = np.repeat(self.shares, n)
        return rep

    def series(self) -> Tuple[np.ndarray, List[Explanation], np.ndarray]:
        """Stock-level measure series (price*share) with labels, plus the
        overall index series — the finest-grain input for matrix-path runs."""
        vals = self.prices * self.shares[:, None]
        labels = [
            Explanation.of(
                category=r.category, subcategory=r.subcategory, stock=r.stock
            )
            for r in self.meta.itertuples()
        ]
        return vals, labels, vals.sum(axis=0)


def generate(n: int = 151, noise: float = 0.004, seed: int = 11) -> SP500Like:
    rng = np.random.default_rng(seed)
    rows, caps = [], []
    for cat, sub, k, cap in _STRUCTURE:
        weights = rng.dirichlet(np.ones(k) * 4.0) * cap
        for i, w in enumerate(weights):
            rows.append((f"{sub[:4].upper()}{i+1}", cat, sub))
            caps.append(w)
    meta = pd.DataFrame(rows, columns=["stock", "category", "subcategory"])
    caps = np.asarray(caps)  # base market value per stock (price*share)
    shares = rng.uniform(1.0, 10.0, len(caps))
    p0 = caps / shares

    bounds = [0, *[int(c * n / 151) for c in GT_CUTS], n - 1]
    prices = np.zeros((len(caps), n))
    prices[:, 0] = p0
    for seg, rets in enumerate(_RETURNS):
        s, e = bounds[seg], bounds[seg + 1]
        for si, r in enumerate(meta.itertuples()):
            ret = rets.get((r.category, r.subcategory), rets.get(r.category, 0.0))
            step = prices[si, s] * ret / (e - s)
            for t in range(s, e):
                prices[si, t + 1] = prices[si, t] + step
    prices *= 1.0 + rng.normal(0.0, noise, prices.shape)
    prices = np.maximum(prices, 0.01)
    # n trading days spread over the paper's actual span (1/2 .. 10/1).
    dates = pd.DatetimeIndex(
        pd.date_range("2020-01-02", "2020-10-01", periods=n).normalize()
    )
    return SP500Like(
        prices=prices,
        shares=shares,
        meta=meta,
        dates=dates,
        gt_cuts=bounds[1:-1],
    )

"""Synthetic datasets with ground-truth segmentation (paper Sec. 4.2.1).

Each dataset is a relation R(T, sales, category) whose aggregated series is
``SELECT T, count(sales) FROM R GROUP BY T``. Every category's series is
piecewise linear with alternating up/down trends; the ground-truth cuts of the
aggregate are the union of per-category cuts (minimal coherent segmentation).
Gaussian noise is added per category at a target SNR_dB.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Optional, Tuple

import numpy as np
import pandas as pd

from repro.core.types import Explanation

MIN_SEG_LEN = 6  # paper: segment lengths range 6..84


@dataclass
class SynthData:
    """One synthetic dataset: series matrix + ground truth + relation."""

    S: np.ndarray  # (n_cats, n) noisy category series (nonneg integers)
    clean: np.ndarray  # (n_cats, n) noise-free category series
    labels: List[Explanation]
    total: np.ndarray  # (n,)
    gt_cuts: List[int]  # interior ground-truth cutting positions (0-based)
    snr_db: float
    seed: int

    @property
    def n(self) -> int:
        return self.S.shape[1]

    @property
    def attrs(self) -> Tuple[str, ...]:
        return ("category",)

    @property
    def gt_k(self) -> int:
        return len(self.gt_cuts) + 1

    def relation_sum(self) -> pd.DataFrame:
        """One row per (T, category) with the category's value as ``sales`` —
        SUM(sales) reproduces the same aggregated series as the count form."""
        n_cats, n = self.S.shape
        return pd.DataFrame(
            {
                "T": np.tile(np.arange(n), n_cats),
                "category": np.repeat([e.preds[0][1] for e in self.labels], n),
                "sales": self.S.reshape(-1),
            }
        )

    def relation_count(self, scale: float = 1.0) -> pd.DataFrame:
        """Exploded form: value v becomes round(v*scale) rows, so
        COUNT(sales) GROUP BY T equals the (scaled) series — the paper's
        literal query shape. Use small ``scale`` to bound row counts."""
        rows_t, rows_c = [], []
        for ci, e in enumerate(self.labels):
            cat = e.preds[0][1]
            counts = np.round(self.S[ci] * scale).astype(int)
            for t, k in enumerate(counts):
                rows_t.extend([t] * k)
                rows_c.extend([cat] * k)
        return pd.DataFrame({"T": rows_t, "category": rows_c, "sales": 1})


def _category_cuts(rng: np.random.Generator, n: int, n_cuts: int) -> List[int]:
    """Random interior cuts keeping every piece at least MIN_SEG_LEN long."""
    for _ in range(200):
        cuts = sorted(rng.choice(np.arange(MIN_SEG_LEN, n - MIN_SEG_LEN), n_cuts, replace=False))
        gaps = np.diff([0, *cuts, n - 1])
        if (gaps >= MIN_SEG_LEN).all():
            return [int(c) for c in cuts]
    return [int(n * (i + 1) / (n_cuts + 1)) for i in range(n_cuts)]


def _piecewise(rng: np.random.Generator, n: int, cuts: List[int]) -> np.ndarray:
    """Piecewise-linear series with alternating up/down trends between cuts."""
    bounds = [0, *cuts, n - 1]
    y = np.zeros(n)
    level = float(rng.uniform(80, 160))
    direction = 1 if rng.random() < 0.5 else -1
    y[0] = level
    for i in range(len(bounds) - 1):
        s, e = bounds[i], bounds[i + 1]
        ln = e - s
        if direction > 0:
            slope = float(rng.uniform(1.0, 3.0))
        else:
            # Cap downward slope so the series stays comfortably positive.
            slope = -min(float(rng.uniform(1.0, 3.0)), max(0.2, (y[s] - 10) / ln))
        for t in range(s, e):
            y[t + 1] = y[t] + slope
        direction = -direction
    return y


def generate(
    n: int = 100,
    n_cats: int = 3,
    snr_db: float = 35.0,
    seed: int = 0,
    min_union_gap: int = 4,
) -> SynthData:
    """One dataset per Sec. 4.2.1, rejection-sampled until the union of the
    per-category cuts is well-separated (each cut is then recoverable)."""
    rng = np.random.default_rng(seed)
    for _ in range(300):
        per_cat = [
            _category_cuts(rng, n, int(rng.integers(1, 4))) for _ in range(n_cats)
        ]
        union = sorted(set().union(*[set(c) for c in per_cat]))
        gaps = np.diff([0, *union, n - 1])
        if union and (gaps >= min_union_gap).all() and len(union) <= 9:
            break
    clean = np.vstack([_piecewise(rng, n, cuts) for cuts in per_cat])
    # SNR is defined on the AC power (variance) of each category's series:
    # the noise scales with the signal's *variation*, not its DC offset.
    # The paper only cites the generic SNR definition; with mean-square power
    # the large base offsets would drown the per-step trend (see DESIGN.md §5).
    sig_power = np.maximum(clean.var(axis=1), 1e-12)
    sigma = np.sqrt(sig_power / (10 ** (snr_db / 10.0)))
    noisy = clean + rng.normal(0, 1.0, clean.shape) * sigma[:, None]
    noisy = np.maximum(np.round(noisy), 0.0)
    labels = [Explanation.of(category=f"a{i+1}") for i in range(n_cats)]
    return SynthData(
        S=noisy,
        clean=clean,
        labels=labels,
        total=noisy.sum(axis=0),
        gt_cuts=[int(c) for c in union],
        snr_db=snr_db,
        seed=seed,
    )


SNR_LEVELS = (20.0, 25.0, 30.0, 35.0, 40.0, 45.0, 50.0)


def corpus(
    n_datasets: int = 20,
    n: int = 100,
    snr_levels: Tuple[float, ...] = SNR_LEVELS,
    base_seed: int = 100,
) -> List[SynthData]:
    """The paper's corpus: ``n_datasets`` base datasets at every SNR level
    (same underlying clean series per seed across SNRs)."""
    out = []
    for d in range(n_datasets):
        for snr in snr_levels:
            out.append(generate(n=n, snr_db=snr, seed=base_seed + d))
    return out

"""End-to-end TSExplain (paper Sec. 5.2 pipeline, Fig. 7).

Two entry points:

- :func:`explain_series` — the algorithmic core over a pre-pivoted eps x n
  matrix (module a output). All optimizations (filter, guess-and-verify,
  sketching), the K-Segmentation DP, and the elbow selection of K live here.
- :func:`explain_relation` — the full Spark path: relation DataFrame →
  GROUPING SETS cube (Catalyst) → matrix → ``explain_series``.

Stage timings are recorded for the latency tables (Fig. 15/16/17):
``precompute`` (cube/pivot/filter/space build), ``ca`` (all Cascading-Analysts
top-list computations, including sketch phase I), ``kseg`` (cost matrices, DP,
elbow).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Dict, List, Optional, Sequence, Tuple

import numpy as np

from repro.core.elbow import kneedle
from repro.core.filtering import DEFAULT_RATIO, support_mask
from repro.core.kseg import DPResult, all_segments, build_cost_matrix, dp_segment
from repro.core.segcost import costs_for_segments
from repro.core.sketch import select_sketch
from repro.core.space import ExplanationSpace
from repro.core.toplists import TopLists, compute_toplists, object_segments
from repro.core.types import Explanation


@dataclass
class Config:
    """TSExplain knobs. Defaults = the paper's fully-optimized system; set
    ``use_filter = use_gv = use_sketch = False`` for VanillaTSExplain."""

    m: int = 3
    beta_max: int = 3
    k_max: int = 20
    K: Optional[int] = None  # None => elbow-selected
    metric: str = "tse"
    use_filter: bool = True
    filter_ratio: float = DEFAULT_RATIO
    use_gv: bool = True
    gv_m_bar0: int = 30
    use_sketch: bool = True
    sketch_L: Optional[int] = None
    sketch_size: Optional[int] = None
    smooth_window: Optional[int] = None
    spark_ca_min_segments: int = 2000  # distribute CA when enough segments


@dataclass
class SegmentResult:
    """One output segment with its ranked top explanations."""

    start: int
    end: int
    start_t: object
    end_t: object
    explanations: List[Tuple[str, int, float]]  # (label, tau, gamma)


@dataclass
class ExplainResult:
    """Evolving explanations (Def. 3.7) plus diagnostics."""

    n: int
    epsilon: int
    filtered_epsilon: int
    K: int
    cuts: List[int]
    total_variance: float
    curve: List[float]  # K-variance curve, K = 1..k_max
    segments: List[SegmentResult]
    timings: Dict[str, float] = field(default_factory=dict)
    positions: List[int] = field(default_factory=list)


def moving_average(S: np.ndarray, window: int) -> np.ndarray:
    """Centered moving average per row (the paper's smoothing for fuzzy data)."""
    if window <= 1:
        return S
    kernel = np.ones(window) / window
    pad = window // 2
    padded = np.pad(S, ((0, 0), (pad, pad)), mode="edge")
    out = np.apply_along_axis(lambda r: np.convolve(r, kernel, "valid"), 1, padded)
    return out[:, : S.shape[1]]


def _aligned_matrix(
    S: np.ndarray, labels: Sequence[Explanation], space: ExplanationSpace
) -> np.ndarray:
    """One row of the series matrix per space node; closure-only nodes get a
    zero row (they are non-takeable, their gamma is never used)."""
    out = np.zeros((space.n_nodes, S.shape[1]))
    for row, e in enumerate(labels):
        out[space.id_of[e]] = S[row]
    return out


def explain_series(
    S: np.ndarray,
    labels: Sequence[Explanation],
    attrs: Sequence[str],
    total: np.ndarray,
    cfg: Config = Config(),
    times: Optional[Sequence] = None,
    spark=None,
) -> ExplainResult:
    """Run K-Segmentation + evolving explanations over a series matrix."""
    n = S.shape[1]
    times = list(times) if times is not None else list(range(n))
    timings: Dict[str, float] = {}
    t0 = time.perf_counter()

    if cfg.smooth_window:
        S = moving_average(S, cfg.smooth_window)
        total = moving_average(total[None, :], cfg.smooth_window)[0]

    epsilon = len(labels)
    if cfg.use_filter:
        mask = support_mask(S, total, cfg.filter_ratio)
        S = S[mask]
        labels = [e for e, k in zip(labels, mask) if k]
    filtered_epsilon = len(labels)
    space = ExplanationSpace(labels, attrs)
    S_al = _aligned_matrix(S, labels, space)
    timings["precompute"] = time.perf_counter() - t0

    # --- module (b): top-explanations per segment -------------------------
    t0 = time.perf_counter()
    obj_tl = compute_toplists(
        S_al, space, object_segments(n), cfg.m, cfg.use_gv, cfg.gv_m_bar0
    )
    if cfg.use_sketch:
        positions = select_sketch(
            S_al,
            space,
            obj_tl,
            cfg.m,
            metric=cfg.metric,
            use_gv=cfg.use_gv,
            L=cfg.sketch_L,
            size=cfg.sketch_size,
        )
    else:
        positions = list(range(n))
    segments = all_segments(positions)
    if spark is not None and len(segments) >= cfg.spark_ca_min_segments:
        from repro.core.spark_ca import compute_toplists_spark

        cen_tl = compute_toplists_spark(
            spark, S_al, space, segments, cfg.m, cfg.use_gv, cfg.gv_m_bar0
        )
    else:
        cen_tl = compute_toplists(
            S_al, space, segments, cfg.m, cfg.use_gv, cfg.gv_m_bar0
        )
    timings["ca"] = time.perf_counter() - t0

    # --- module (c): costs, DP, elbow -------------------------------------
    t0 = time.perf_counter()
    costs = costs_for_segments(S_al, obj_tl, cen_tl, [cfg.metric])[cfg.metric]
    C = build_cost_matrix(positions, segments, costs)
    dp: DPResult = dp_segment(C, positions, cfg.k_max)
    K = cfg.K if cfg.K is not None else kneedle(dp.curve())
    K = max(1, min(K, max(k for k in dp.cuts)))
    cuts = dp.cuts[K]
    timings["kseg"] = time.perf_counter() - t0
    timings["total"] = sum(timings.values())

    bounds = [0] + cuts + [n - 1]
    seg_results: List[SegmentResult] = []
    for i in range(len(bounds) - 1):
        s, e = bounds[i], bounds[i + 1]
        row = cen_tl.row((s, e))
        expl = [
            (space.explanations[int(j)].label, int(sg), float(g))
            for j, g, sg in zip(cen_tl.ids[row], cen_tl.gammas[row], cen_tl.signs[row])
            if j >= 0
        ]
        seg_results.append(
            SegmentResult(
                start=s, end=e, start_t=times[s], end_t=times[e], explanations=expl
            )
        )

    return ExplainResult(
        n=n,
        epsilon=epsilon,
        filtered_epsilon=filtered_epsilon,
        K=K,
        cuts=cuts,
        total_variance=float(dp.totals[K]),
        curve=dp.curve(),
        segments=seg_results,
        timings=timings,
        positions=[int(p) for p in positions],
    )


def explain_relation(
    df,
    time_col: str,
    attrs: Sequence[str],
    measure_expr: str,
    agg: str = "sum",
    cfg: Config = Config(),
    use_spark_ca: bool = True,
) -> ExplainResult:
    """Full Spark path: Catalyst GROUPING SETS cube → matrix → explain."""
    from repro.core.precompute import series_matrix

    t0 = time.perf_counter()
    sm = series_matrix(df, time_col, attrs, measure_expr, agg, cfg.beta_max)
    spark_time = time.perf_counter() - t0
    res = explain_series(
        sm.S,
        sm.labels,
        attrs,
        sm.total,
        cfg,
        times=sm.times,
        spark=df.sparkSession if use_spark_ca else None,
    )
    res.timings["precompute"] += spark_time
    res.timings["total"] += spark_time
    return res

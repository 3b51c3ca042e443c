"""Pipeline module (a): per-explanation aggregated series via Spark SQL.

The data cube the paper assumes ("data cube is typically maintained in
memory") is computed here as one Catalyst aggregation:

    SELECT T, A_1..A_k, grouping(A_i).., f(M)
    FROM R GROUP BY GROUPING SETS ((T), (T,A_1), .., (T,A_i,A_j), ..)

with one grouping set per attribute subset of size 0..beta_max. The size-0
set yields the overall aggregated time series ts(R); every other row belongs
to one candidate explanation's series ts(sigma_E R). The result is pivoted to
an eps x n matrix for the downstream numpy/DP stages.

Also hosts the relational form of the support filter and a window-function
helper for per-explanation deltas.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass
from functools import reduce
from typing import Dict, List, Optional, Sequence, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import Column, DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.core.filtering import DEFAULT_RATIO
from repro.core.types import Explanation

VAL = "__val"
TIME = "__t"


def _gcol(attr: str) -> str:
    return f"__g_{attr}"


def _attr_subsets(attrs: Sequence[str], beta_max: int) -> List[Tuple[str, ...]]:
    """All explain-by subsets of size 0..beta_max (the grouping sets)."""
    out: List[Tuple[str, ...]] = [()]
    for r in range(1, min(beta_max, len(attrs)) + 1):
        out.extend(itertools.combinations(attrs, r))
    return out


def grouping_sets_agg(
    df: DataFrame,
    attrs: Sequence[str],
    measure_expr: str,
    agg: str = "sum",
    beta_max: int = 3,
    time_col: Optional[str] = None,
) -> DataFrame:
    """One aggregation row per (grouping set, group) — the candidate cube.

    Output columns: [TIME if time_col] + attrs + grouping flags + VAL. The
    grouping flags distinguish "attribute not in this grouping set" (1) from a
    genuine NULL value (0 with null), so explanations over NULL-able data stay
    well-defined.
    """
    if agg not in ("sum", "count"):
        raise ValueError(f"unsupported aggregate {agg!r} (decomposable only)")
    view = f"__repro_gs_{abs(hash((tuple(attrs), measure_expr, agg, time_col))) % 10**8}"
    df.createOrReplaceTempView(view)
    prefix = [time_col] if time_col else []
    sets = ", ".join(
        "(" + ", ".join(list(prefix) + list(sub)) + ")"
        for sub in _attr_subsets(attrs, beta_max)
    )
    select = (
        ([f"{time_col} AS {TIME}"] if time_col else [])
        + list(attrs)
        + [f"grouping({a}) AS {_gcol(a)}" for a in attrs]
        + [f"{agg}({measure_expr}) AS {VAL}"]
    )
    sql = (
        f"SELECT {', '.join(select)} FROM {view} "
        f"GROUP BY GROUPING SETS ({sets})"
    )
    out = df.sparkSession.sql(sql)
    df.sparkSession.catalog.dropTempView(view)
    return out


def order_col(attrs: Sequence[str]) -> Column:
    """Explanation order of a cube row = number of concrete attributes."""
    return reduce(
        lambda a, b: a + b, [1 - F.col(_gcol(a)) for a in attrs], F.lit(0)
    )


def candidate_series(
    df: DataFrame,
    time_col: str,
    attrs: Sequence[str],
    measure_expr: str,
    agg: str = "sum",
    beta_max: int = 3,
) -> DataFrame:
    """Per-explanation + overall aggregated time series, sorted by time."""
    cube = grouping_sets_agg(
        df, attrs, measure_expr, agg, beta_max, time_col=time_col
    )
    return cube.withColumn("__order", order_col(attrs)).orderBy(TIME)


def filter_support_spark(
    cand: DataFrame, attrs: Sequence[str], ratio: float = DEFAULT_RATIO
) -> DataFrame:
    """Relational support filter (Sec. 7.5.1): keep an explanation iff some
    point of its series reaches ``ratio`` of the overall series. Overall rows
    (order 0) are always kept."""
    gcols = [_gcol(a) for a in attrs]
    total = (
        cand.filter(F.col("__order") == 0)
        .select(F.col(TIME), F.col(VAL).alias("__total"))
    )
    slices = cand.filter(F.col("__order") >= 1)
    ratio_col = F.abs(F.col(VAL)) / F.greatest(
        F.abs(F.col("__total")), F.lit(1e-300)
    )
    keep = (
        slices.join(total, on=TIME)
        .groupBy(*attrs, *gcols)
        .agg(F.max(ratio_col).alias("__maxratio"))
        .filter((F.col("__maxratio") >= ratio))
        .drop("__maxratio")
        .alias("k")
    )
    sl = slices.alias("s")
    cond = reduce(
        lambda a, b: a & b,
        [F.col(f"s.{c}").eqNullSafe(F.col(f"k.{c}")) for c in attrs]
        + [F.col(f"s.{c}") == F.col(f"k.{c}") for c in gcols],
    )
    kept = sl.join(keep, on=cond, how="leftsemi")
    return kept.unionByName(cand.filter(F.col("__order") == 0))


def with_object_deltas(cand: DataFrame, attrs: Sequence[str]) -> DataFrame:
    """Window-function form of the atomic-object deltas: per-explanation
    ``val - lag(val)`` ordered by time (used by tests and trendline jobs)."""
    gcols = [_gcol(a) for a in attrs]
    w = Window.partitionBy(*attrs, *gcols).orderBy(TIME)
    return cand.withColumn("__delta", F.col(VAL) - F.lag(VAL).over(w))


@dataclass
class SeriesMatrix:
    """Pivoted cube: one row of ``S`` per candidate explanation."""

    S: np.ndarray  # (eps, n)
    labels: List[Explanation]
    total: np.ndarray  # (n,)
    times: List  # sorted distinct time values
    attrs: Tuple[str, ...]

    @property
    def n(self) -> int:
        return len(self.times)

    @property
    def epsilon(self) -> int:
        return len(self.labels)


def to_matrix(pdf: pd.DataFrame, attrs: Sequence[str]) -> SeriesMatrix:
    """Pivot collected cube rows (pandas) into a SeriesMatrix.

    Missing (explanation, t) combinations mean "no rows in that slice at t"
    and become 0, which is exact for SUM/COUNT.
    """
    gcols = [_gcol(a) for a in attrs]
    times = sorted(pdf[TIME].unique())
    t_index = {t: i for i, t in enumerate(times)}
    n = len(times)

    is_total = (
        reduce(lambda a, b: a & b, [pdf[g] == 1 for g in gcols])
        if gcols
        else pd.Series(True, index=pdf.index)
    )
    total = np.zeros(n)
    trows = pdf[is_total]
    total[[t_index[t] for t in trows[TIME]]] = trows[VAL].to_numpy(dtype=float)

    labels: List[Explanation] = []
    mats: List[np.ndarray] = []
    cand = pdf[~is_total]
    for pattern, sub in cand.groupby(gcols, sort=True):
        if not isinstance(pattern, tuple):
            pattern = (pattern,)
        sel = [a for a, g in zip(attrs, pattern) if g == 0]
        piv = sub.pivot_table(
            index=sel, columns=TIME, values=VAL, aggfunc="first", fill_value=0.0
        ).reindex(columns=times, fill_value=0.0)
        for key in piv.index:
            key_t = key if isinstance(key, tuple) else (key,)
            labels.append(Explanation(tuple(zip(sel, key_t))))
        mats.append(piv.to_numpy(dtype=float))
    S = np.vstack(mats) if mats else np.zeros((0, n))
    return SeriesMatrix(S=S, labels=labels, total=total, times=list(times), attrs=tuple(attrs))


def series_matrix_pandas(
    pdf: pd.DataFrame,
    time_col: str,
    attrs: Sequence[str],
    measure_col: str,
    agg: str = "sum",
    beta_max: int = 3,
) -> SeriesMatrix:
    """Pure-pandas mirror of the Spark cube, for driver-side jobs/tests.

    Semantically identical to :func:`series_matrix` (asserted by tests);
    ``measure_col`` must be a concrete column (pre-compute derived measures).
    """
    if agg not in ("sum", "count"):
        raise ValueError(f"unsupported aggregate {agg!r}")
    times = sorted(pdf[time_col].unique())
    t_index = {t: i for i, t in enumerate(times)}
    n = len(times)

    def agg_series(sub: pd.DataFrame) -> np.ndarray:
        g = sub.groupby(time_col)[measure_col]
        ser = g.sum() if agg == "sum" else g.count()
        out = np.zeros(n)
        out[[t_index[t] for t in ser.index]] = ser.to_numpy(dtype=float)
        return out

    total = agg_series(pdf)
    labels: List[Explanation] = []
    mats: List[np.ndarray] = []
    for sub_attrs in _attr_subsets(attrs, beta_max):
        if not sub_attrs:
            continue
        grp = pdf.groupby([time_col, *sub_attrs])[measure_col]
        ser = grp.sum() if agg == "sum" else grp.count()
        piv = ser.unstack(level=0).reindex(columns=times).fillna(0.0)
        for key in piv.index:
            key_t = key if isinstance(key, tuple) else (key,)
            labels.append(Explanation(tuple(zip(sub_attrs, key_t))))
        mats.append(piv.to_numpy(dtype=float))
    S = np.vstack(mats) if mats else np.zeros((0, n))
    return SeriesMatrix(
        S=S, labels=labels, total=total, times=list(times), attrs=tuple(attrs)
    )


def series_matrix(
    df: DataFrame,
    time_col: str,
    attrs: Sequence[str],
    measure_expr: str,
    agg: str = "sum",
    beta_max: int = 3,
    filter_ratio: Optional[float] = None,
) -> SeriesMatrix:
    """End-to-end module (a): Spark cube (+ optional relational filter) → matrix."""
    cand = candidate_series(df, time_col, attrs, measure_expr, agg, beta_max)
    if filter_ratio is not None:
        cand = filter_support_spark(cand, attrs, filter_ratio)
    pdf = cand.select(TIME, *attrs, *[_gcol(a) for a in attrs], VAL).toPandas()
    return to_matrix(pdf, attrs)

"""Table 6: real-world-like dataset statistics — candidate explanation count
epsilon, filtered epsilon (support filter at ratio 0.001), and series length n.

With ``REPRO_USE_SPARK=1`` (or when launched via spark-submit) the cube and
the filter run through the Spark GROUPING SETS path; otherwise the pandas
mirror is used (identical semantics, asserted by tests).
"""
from __future__ import annotations

import sys
from pathlib import Path

import pandas as pd

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import env_flag, get_spark, save_table  # noqa: E402

from repro.core.filtering import support_mask  # noqa: E402
from repro.core.precompute import series_matrix, series_matrix_pandas  # noqa: E402
from repro.datasets import covid_like, liquor_like, sp500_like  # noqa: E402


def _datasets():
    cv = covid_like.generate()
    rel_cv = cv.relation()
    sp = sp500_like.generate()
    rel_sp = sp.relation()
    rel_sp["mv"] = rel_sp["price"] * rel_sp["share"]
    lq = liquor_like.generate()
    return [
        ("total-confirmed-cases", rel_cv, "date", ["state"], "total_confirmed"),
        ("daily-confirmed-cases", rel_cv, "date", ["state"], "daily_confirmed"),
        ("S&P 500", rel_sp, "date", list(sp.attrs), "mv"),
        ("Liquor", lq.relation(), "date", list(lq.attrs), "bottles"),
    ]


def run(spark=None) -> pd.DataFrame:
    rows = []
    for name, rel, tcol, attrs, measure in _datasets():
        if spark is not None:
            sm = series_matrix(
                spark.createDataFrame(rel), tcol, attrs, measure, "sum"
            )
        else:
            sm = series_matrix_pandas(rel, tcol, attrs, measure, "sum")
        kept = int(support_mask(sm.S, sm.total).sum())
        rows.append(
            {"dataset": name, "epsilon": sm.epsilon, "filtered_epsilon": kept, "n": sm.n}
        )
    return pd.DataFrame(rows)


def main() -> None:
    spark = get_spark("table6") if env_flag("REPRO_USE_SPARK") else None
    try:
        save_table(run(spark), "table6_stats", "Table 6 — dataset statistics")
    finally:
        if spark is not None:
            spark.stop()


if __name__ == "__main__":
    main()

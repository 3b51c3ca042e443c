"""Two-relations diff as a DataFrame op: DuckDB oracle + CA integration."""
import pandas as pd
import pytest

from repro.core.diff import topm_for_relations, two_relation_diff
from repro.core.precompute import _gcol
from repro.core.types import Explanation
from repro.datasets import synthetic
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def rels():
    sd = synthetic.generate(n=30, seed=31)
    rel = sd.relation_sum()
    return rel[rel["T"] == 25].copy(), rel[rel["T"] == 3].copy()  # test, control


class TestDiffOracle:
    def test_single_attr_vs_duckdb(self, spark, rels):
        test_pdf, ctrl_pdf = rels
        got = two_relation_diff(
            spark.createDataFrame(test_pdf),
            spark.createDataFrame(ctrl_pdf),
            ["category"],
            "sales",
            "sum",
        ).drop("__order")
        g = _gcol("category")
        sql = f"""
            WITH t AS (
                SELECT category, GROUPING(category) AS g, SUM(sales) AS v
                FROM rt GROUP BY GROUPING SETS ((), (category))
            ), c AS (
                SELECT category, GROUPING(category) AS g, SUM(sales) AS v
                FROM rc GROUP BY GROUPING SETS ((), (category))
            )
            SELECT COALESCE(t.category, c.category) AS category,
                   COALESCE(t.g, c.g) AS "{g}",
                   ABS(COALESCE(t.v, 0) - COALESCE(c.v, 0)) AS gamma,
                   CAST(SIGN(COALESCE(t.v, 0) - COALESCE(c.v, 0)) AS INT) AS tau
            FROM t FULL OUTER JOIN c
              ON t.g = c.g AND t.category IS NOT DISTINCT FROM c.category
        """
        assert_equivalent(got, sql, rt=test_pdf, rc=ctrl_pdf)

    def test_two_attr_vs_duckdb(self, spark):
        rng_rows = pd.DataFrame(
            {
                "a": list("xxyyxz"),
                "b": [1, 2, 1, 2, 1, 3],
                "m": [10.0, 5.0, 2.0, 8.0, 1.0, 4.0],
            }
        )
        ctrl = rng_rows.iloc[:3]
        test = rng_rows.iloc[2:]
        got = two_relation_diff(
            spark.createDataFrame(test),
            spark.createDataFrame(ctrl),
            ["a", "b"],
            "m",
            "sum",
            beta_max=2,
        ).drop("__order")
        ga, gb = _gcol("a"), _gcol("b")
        sql = f"""
            WITH t AS (
                SELECT a, b, GROUPING(a) AS ga, GROUPING(b) AS gb, SUM(m) AS v
                FROM rt GROUP BY GROUPING SETS ((), (a), (b), (a, b))
            ), c AS (
                SELECT a, b, GROUPING(a) AS ga, GROUPING(b) AS gb, SUM(m) AS v
                FROM rc GROUP BY GROUPING SETS ((), (a), (b), (a, b))
            )
            SELECT COALESCE(t.a, c.a) AS a, COALESCE(t.b, c.b) AS b,
                   COALESCE(t.ga, c.ga) AS "{ga}", COALESCE(t.gb, c.gb) AS "{gb}",
                   ABS(COALESCE(t.v, 0) - COALESCE(c.v, 0)) AS gamma,
                   CAST(SIGN(COALESCE(t.v, 0) - COALESCE(c.v, 0)) AS INT) AS tau
            FROM t FULL OUTER JOIN c
              ON t.ga = c.ga AND t.gb = c.gb
             AND t.a IS NOT DISTINCT FROM c.a AND t.b IS NOT DISTINCT FROM c.b
        """
        assert_equivalent(got, sql, rt=test, rc=ctrl)

    def test_overall_row_is_total_difference(self, spark, rels):
        test_pdf, ctrl_pdf = rels
        d = two_relation_diff(
            spark.createDataFrame(test_pdf),
            spark.createDataFrame(ctrl_pdf),
            ["category"],
            "sales",
            "sum",
        )
        overall = d.filter("__order = 0").collect()[0]
        expected = test_pdf["sales"].sum() - ctrl_pdf["sales"].sum()
        assert overall["gamma"] == pytest.approx(abs(expected))
        assert overall["tau"] == (1 if expected > 0 else -1)


class TestTopM:
    def test_topm_matches_manual(self, spark, rels):
        test_pdf, ctrl_pdf = rels
        out = topm_for_relations(
            spark.createDataFrame(test_pdf),
            spark.createDataFrame(ctrl_pdf),
            ["category"],
            "sales",
            m=2,
        )
        per_cat = (
            test_pdf.groupby("category")["sales"].sum()
            - ctrl_pdf.groupby("category")["sales"].sum()
        ).abs().sort_values(ascending=False)
        assert [e.preds[0][1] for e, g, t in out] == list(per_cat.index[:2])
        assert [g for e, g, t in out] == pytest.approx(list(per_cat.iloc[:2]))

    def test_topm_signs(self, spark):
        test = pd.DataFrame({"g": ["a", "b"], "m": [10.0, 1.0]})
        ctrl = pd.DataFrame({"g": ["a", "b"], "m": [1.0, 10.0]})
        out = topm_for_relations(
            spark.createDataFrame(test), spark.createDataFrame(ctrl), ["g"], "m", m=2
        )
        d = {e.preds[0][1]: t for e, g, t in out}
        assert d == {"a": 1, "b": -1}

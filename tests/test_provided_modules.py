"""The provided scaffolding: synth_data generators and the DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


class TestSynthData:
    def test_lineitem_shape(self, spark):
        df = synth_data.lineitem(spark, sf=0.001)
        assert df.count() == 6000
        assert "l_extendedprice" in df.columns

    def test_deterministic_in_seed(self, spark):
        a = synth_data.orders(spark, sf=0.001, seed=7).toPandas()
        b = synth_data.orders(spark, sf=0.001, seed=7).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > counts.iloc[-1] * 5

    def test_uniform_keys_range(self, spark):
        df = synth_data.uniform_keys(spark, n=1000, n_keys=10).toPandas()
        assert set(df["k"].unique()) <= set(range(1, 11))


class TestOracle:
    def test_accepts_equivalent(self, spark):
        pdf = pd.DataFrame({"g": list("aabb"), "v": [1.0, 2, 3, 4]})
        got = (
            spark.createDataFrame(pdf)
            .groupBy("g")
            .sum("v")
            .withColumnRenamed("sum(v)", "s")
        )
        assert_equivalent(got, "SELECT g, SUM(v) AS s FROM t GROUP BY g", t=pdf)

    def test_rejects_wrong_result(self, spark):
        pdf = pd.DataFrame({"g": list("aabb"), "v": [1.0, 2, 3, 4]})
        got = (
            spark.createDataFrame(pdf)
            .groupBy("g")
            .max("v")
            .withColumnRenamed("max(v)", "s")
        )
        with pytest.raises(AssertionError):
            assert_equivalent(got, "SELECT g, SUM(v) AS s FROM t GROUP BY g", t=pdf)

    def test_rejects_column_mismatch(self, spark):
        pdf = pd.DataFrame({"g": list("ab"), "v": [1.0, 2]})
        got = spark.createDataFrame(pdf)
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(got, "SELECT g AS x, v FROM t", t=pdf)

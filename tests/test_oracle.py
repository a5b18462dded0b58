"""Tests for the DuckDB oracle itself (it must catch wrong results)."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


class TestOracle:
    def test_accepts_equivalent(self, spark):
        pdf = pd.DataFrame({"k": [1, 2, 3], "v": ["a", "b", "c"]})
        df = spark.createDataFrame(pdf).where("k > 1")
        assert_equivalent(df, "select k, v from t where k > 1", t=pdf)

    def test_rejects_wrong_rows(self, spark):
        pdf = pd.DataFrame({"k": [1, 2, 3]})
        df = spark.createDataFrame(pdf).where("k > 1")
        with pytest.raises(AssertionError):
            assert_equivalent(df, "select k from t", t=pdf)

    def test_rejects_column_mismatch(self, spark):
        pdf = pd.DataFrame({"k": [1]})
        df = spark.createDataFrame(pdf)
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(df, "select k as other from t", t=pdf)

    def test_order_insensitive(self, spark):
        pdf = pd.DataFrame({"k": [3, 1, 2]})
        df = spark.createDataFrame(pdf).orderBy("k")
        assert_equivalent(df, "select k from t order by k desc", t=pdf)

    def test_spark_input_tables(self, spark):
        pdf = pd.DataFrame({"k": [1, 2], "v": [10.0, 20.0]})
        sdf = spark.createDataFrame(pdf)
        out = sdf.groupBy().sum("v").withColumnRenamed("sum(v)", "s")
        assert_equivalent(out, "select sum(v) as s from t", t=sdf)

"""Tests for the provided TPC-H-lite generators, exercised through the
matcher stack: synthetic OLAP tables are valid matcher input too."""
import pytest

from repro import synth_data
from repro.matchers import ComaMatcher
from repro.metrics import recall_at_ground_truth
from repro.oracle import assert_equivalent
from repro.table import Table


class TestGenerators:
    def test_lineitem_shape(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        assert li.count() == 6000
        assert "l_orderkey" in li.columns

    def test_orders_deterministic(self, spark):
        a = synth_data.orders(spark, sf=0.001).toPandas()
        b = synth_data.orders(spark, sf=0.001).toPandas()
        assert a.equals(b)

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        top = df["k"].value_counts(normalize=True).iloc[0]
        assert top > 0.05  # head key dominates under zipf(1.1)

    def test_uniform_keys_not_skewed(self, spark):
        df = synth_data.uniform_keys(spark, n=5000, n_keys=100).toPandas()
        top = df["k"].value_counts(normalize=True).iloc[0]
        assert top < 0.05

    def test_oracle_aggregate(self, spark):
        """Sanity: a Spark aggregate over lineitem matches DuckDB."""
        from pyspark.sql import functions as F
        li = synth_data.lineitem(spark, sf=0.001)
        out = (li.groupBy("l_returnflag")
               .agg(F.count("*").alias("n"),
                    F.round(F.sum("l_quantity"), 2).alias("qty")))
        assert_equivalent(
            out,
            "select l_returnflag, count(*) as n, "
            "round(sum(l_quantity), 2) as qty from li group by l_returnflag",
            li=li)


class TestAsMatcherInput:
    def test_orders_self_match(self, spark):
        """An OLAP table flows through the matcher stack unchanged."""
        t = Table("orders", synth_data.orders(spark, sf=0.0005))
        res = ComaMatcher("schema").match(spark, t, t)
        gt = {(c, c) for c in t.columns}
        assert recall_at_ground_truth(res, gt) == 1.0

"""Tests for the Table model and the melt/distinct dataflow, with the
DuckDB oracle verifying the melt against plain SQL."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.table import Table, distinct_values, melt_values, type_class_of, union_all


@pytest.fixture(scope="module")
def tbl(spark):
    pdf = pd.DataFrame({
        "id": [1, 2, 3, 4],
        "name": ["ann", "bob", None, "dan"],
        "score": [1.5, 2.5, 3.5, None],
    })
    return Table("people", spark.createDataFrame(pdf)), pdf


class TestTable:
    def test_columns(self, tbl):
        t, _ = tbl
        assert t.columns == ["id", "name", "score"]

    def test_column_types(self, tbl):
        t, _ = tbl
        assert t.column_types == {"id": "numeric", "name": "string",
                                  "score": "numeric"}

    def test_renamed(self, tbl):
        t, _ = tbl
        r = t.renamed({"name": "full_name"}, name="people2")
        assert r.columns == ["id", "full_name", "score"]
        assert r.name == "people2"
        assert t.columns == ["id", "name", "score"]  # original untouched

    def test_type_class_of(self, spark):
        from pyspark.sql import types as T
        assert type_class_of(T.IntegerType()) == "numeric"
        assert type_class_of(T.DoubleType()) == "numeric"
        assert type_class_of(T.StringType()) == "string"
        assert type_class_of(T.DateType()) == "date"
        assert type_class_of(T.TimestampType()) == "date"
        assert type_class_of(T.BooleanType()) == "boolean"


class TestMeltValues:
    def test_drops_nulls(self, tbl):
        t, pdf = tbl
        # 12 cells, 2 nulls
        assert melt_values(t).count() == 10

    def test_oracle_equivalence(self, tbl):
        """The stack() melt must agree with a plain SQL UNION ALL melt."""
        t, pdf = tbl
        sql = """
            select * from (
              select 'id' as col, cast(id as varchar) as value from people
              union all
              select 'name', name from people
              union all
              select 'score', cast(score as varchar) from people
            ) where value is not null
        """
        # normalize float rendering: Spark casts 1.5 -> '1.5', duckdb too
        assert_equivalent(melt_values(t), sql, people=pdf)

    def test_column_subset(self, tbl):
        t, _ = tbl
        out = melt_values(t, ["name"]).toPandas()
        assert set(out["col"]) == {"name"}
        assert len(out) == 3

    def test_empty_columns_raises(self, tbl):
        t, _ = tbl
        with pytest.raises(ValueError, match="no columns"):
            melt_values(t, [])


class TestDistinctValues:
    def test_distinct(self, spark):
        pdf = pd.DataFrame({"a": ["x", "x", "y"], "b": ["z", "z", "z"]})
        t = Table("t", spark.createDataFrame(pdf))
        out = distinct_values(t).toPandas()
        assert len(out) == 3  # {a:x, a:y, b:z}

    def test_cap_per_column(self, spark):
        pdf = pd.DataFrame({"a": [str(i) for i in range(100)]})
        t = Table("t", spark.createDataFrame(pdf))
        assert distinct_values(t, max_values=10).count() == 10

    def test_cap_is_deterministic(self, spark):
        pdf = pd.DataFrame({"a": [str(i) for i in range(100)]})
        t1 = Table("t", spark.createDataFrame(pdf))
        t2 = Table("t", spark.createDataFrame(pdf).repartition(7))
        v1 = sorted(distinct_values(t1, max_values=10).toPandas()["value"])
        v2 = sorted(distinct_values(t2, max_values=10).toPandas()["value"])
        assert v1 == v2


class TestUnionAll:
    def test_unions_by_name(self, spark):
        a = spark.createDataFrame(pd.DataFrame({"x": [1], "y": [2]}))
        b = spark.createDataFrame(pd.DataFrame({"y": [4], "x": [3]}))
        out = union_all([a, b]).toPandas().sort_values("x")
        assert list(out["y"]) == [2, 4]

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            union_all([])

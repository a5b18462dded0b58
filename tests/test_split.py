"""Tests for horizontal/vertical splits; the DuckDB oracle verifies the
split algebra (disjoint union reconstructs the source, overlap bounds)."""
import numpy as np
import pandas as pd
import pytest

from repro.fabrication.split import split_horizontal, split_vertical_columns
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def src(spark):
    g = np.random.default_rng(0)
    pdf = pd.DataFrame({
        "k": np.arange(400),
        "v": g.choice(["a", "b", "c", "d"], 400),
        "x": g.normal(size=400).round(4),
    })
    return spark.createDataFrame(pdf), pdf


class TestSplitHorizontal:
    def test_zero_overlap_reconstructs_source(self, src):
        df, pdf = src
        a, b = split_horizontal(df, row_overlap=0.0, seed=1)
        assert_equivalent(a.unionAll(b), "select * from src", src=pdf)

    def test_zero_overlap_disjoint(self, src):
        df, _ = src
        a, b = split_horizontal(df, row_overlap=0.0, seed=1)
        assert a.join(b, on=["k"]).count() == 0

    def test_full_overlap_both_sides_complete(self, src):
        df, pdf = src
        a, b = split_horizontal(df, row_overlap=1.0, seed=1)
        assert a.count() == len(pdf) and b.count() == len(pdf)

    @pytest.mark.parametrize("overlap", [0.25, 0.5, 0.75])
    def test_overlap_fraction_approximate(self, src, overlap):
        df, pdf = src
        a, b = split_horizontal(df, row_overlap=overlap, seed=2)
        inter = a.select("k").join(b.select("k"), on="k").count()
        assert inter / len(pdf) == pytest.approx(overlap, abs=0.12)

    def test_union_covers_source(self, src):
        df, pdf = src
        a, b = split_horizontal(df, row_overlap=0.5, seed=3)
        assert a.unionAll(b).select("k").distinct().count() == len(pdf)

    def test_deterministic_in_content(self, src):
        df, _ = src
        a1, _ = split_horizontal(df, row_overlap=0.3, seed=4)
        a2, _ = split_horizontal(df.repartition(13), row_overlap=0.3, seed=4)
        assert sorted(a1.toPandas()["k"]) == sorted(a2.toPandas()["k"])

    def test_invalid_overlap_raises(self, src):
        df, _ = src
        with pytest.raises(ValueError):
            split_horizontal(df, row_overlap=1.5)


class TestSplitVerticalColumns:
    COLS = [f"c{i}" for i in range(10)]

    def test_shared_fraction(self):
        a, b, shared = split_vertical_columns(self.COLS, column_overlap=0.4,
                                              seed=0)
        assert len(shared) == 4
        assert set(shared) <= set(a) and set(shared) <= set(b)

    def test_exclusive_columns_disjoint(self):
        a, b, shared = split_vertical_columns(self.COLS, column_overlap=0.2,
                                              seed=1)
        ex_a = set(a) - set(shared)
        ex_b = set(b) - set(shared)
        assert not (ex_a & ex_b)
        assert ex_a | ex_b | set(shared) == set(self.COLS)

    def test_min_shared(self):
        _, _, shared = split_vertical_columns(self.COLS, column_overlap=0.0,
                                              seed=2)
        assert len(shared) == 1

    def test_preserves_schema_order(self):
        a, b, _ = split_vertical_columns(self.COLS, column_overlap=0.5, seed=3)
        assert a == [c for c in self.COLS if c in set(a)]
        assert b == [c for c in self.COLS if c in set(b)]

    def test_deterministic(self):
        r1 = split_vertical_columns(self.COLS, column_overlap=0.5, seed=9)
        r2 = split_vertical_columns(self.COLS, column_overlap=0.5, seed=9)
        assert r1 == r2

    def test_too_few_columns_raises(self):
        with pytest.raises(ValueError):
            split_vertical_columns(["only"], column_overlap=0.5)

    def test_invalid_overlap_raises(self):
        with pytest.raises(ValueError):
            split_vertical_columns(self.COLS, column_overlap=-0.1)

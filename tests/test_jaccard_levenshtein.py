"""Tests for the Jaccard–Levenshtein baseline, including a DuckDB oracle
check of the exact-overlap path (threshold 0 ⇒ plain Jaccard)."""
import duckdb
import pandas as pd
import pytest

from repro.matchers import JaccardLevenshteinMatcher
from repro.metrics import recall_at_ground_truth
from repro.table import Table
from tests.conftest import assert_valid_output


class TestOutputContract:
    def test_full_cross_product(self, spark, unionable_verbatim):
        p = unionable_verbatim
        res = JaccardLevenshteinMatcher(0.4).match(spark, p.source, p.target)
        assert_valid_output(res, p.source, p.target, full_cross=True)

    def test_scores_in_unit_interval(self, spark, unionable_verbatim):
        p = unionable_verbatim
        res = JaccardLevenshteinMatcher(0.5).match(spark, p.source, p.target)
        assert res["score"].between(0, 1).all()

    def test_invalid_threshold(self):
        with pytest.raises(ValueError):
            JaccardLevenshteinMatcher(1.5)


class TestExactOverlapOracle:
    def test_threshold_zero_equals_plain_jaccard(self, spark):
        """With threshold 0 only equal values match; the score must equal
        the Jaccard similarity DuckDB computes with plain SQL."""
        a = pd.DataFrame({"x": ["apple", "banana", "cherry", "date", "fig"]})
        b = pd.DataFrame({"y": ["banana", "cherry", "grape", "kiwi"]})
        ta = Table("a", spark.createDataFrame(a))
        tb = Table("b", spark.createDataFrame(b))
        res = JaccardLevenshteinMatcher(0.0).match(spark, ta, tb)
        got = float(res["score"].iloc[0])

        con = duckdb.connect()
        try:
            con.register("a", a)
            con.register("b", b)
            expected = con.execute("""
                with i as (select count(*) n from
                            (select distinct x from a) join
                            (select distinct y from b) on x = y),
                     u as (select count(*) n from
                            (select x v from a union select y from b))
                select cast(i.n as double) / u.n from i, u
            """).fetchone()[0]
        finally:
            con.close()
        assert got == pytest.approx(expected)

    def test_disjoint_columns_score_zero(self, spark):
        ta = Table("a", spark.createDataFrame(pd.DataFrame({"x": ["aa", "bb"]})))
        tb = Table("b", spark.createDataFrame(pd.DataFrame({"y": ["zz9", "qq8"]})))
        res = JaccardLevenshteinMatcher(0.0).match(spark, ta, tb)
        assert res["score"].iloc[0] == 0.0


class TestFuzzyMatching:
    def test_typo_values_matched_at_threshold(self, spark):
        ta = Table("a", spark.createDataFrame(
            pd.DataFrame({"x": ["springfield", "riverside", "franklin"]})))
        tb = Table("b", spark.createDataFrame(
            pd.DataFrame({"y": ["sprongfield", "riversude", "frankkin"]})))
        strict = JaccardLevenshteinMatcher(0.0).match(spark, ta, tb)
        fuzzy = JaccardLevenshteinMatcher(0.4).match(spark, ta, tb)
        assert strict["score"].iloc[0] == 0.0
        assert fuzzy["score"].iloc[0] > 0.9

    def test_higher_threshold_never_lowers_score(self, spark, joinable_pair):
        p = joinable_pair
        lo = JaccardLevenshteinMatcher(0.4).match(spark, p.source, p.target)
        hi = JaccardLevenshteinMatcher(0.8).match(spark, p.source, p.target)
        key = lambda df: (df.set_index(["source_col", "target_col"])["score"]
                          .sort_index())
        assert (key(hi) >= key(lo) - 1e-9).all()


class TestEffectiveness:
    def test_joinable_recall_high(self, spark, joinable_pair):
        p = joinable_pair
        res = JaccardLevenshteinMatcher(0.4).match(spark, p.source, p.target)
        assert recall_at_ground_truth(res, set(p.ground_truth)) >= 0.5

    def test_unionable_verbatim_recall(self, spark, unionable_verbatim):
        p = unionable_verbatim
        res = JaccardLevenshteinMatcher(0.4).match(spark, p.source, p.target)
        assert recall_at_ground_truth(res, set(p.ground_truth)) >= 0.5

    def test_deterministic(self, spark, joinable_pair):
        p = joinable_pair
        m = JaccardLevenshteinMatcher(0.4)
        r1 = m.match(spark, p.source, p.target)
        r2 = m.match(spark, p.source, p.target)
        pd.testing.assert_frame_equal(r1, r2)

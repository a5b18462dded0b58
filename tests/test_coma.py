"""Tests for the COMA-style composite matcher (schema + instance)."""
import duckdb
import pandas as pd
import pytest

from repro.matchers import ComaMatcher
from repro.matchers.coma import trigram_similarity, type_compatibility
from repro.metrics import recall_at_ground_truth
from repro.table import Table
from tests.conftest import assert_valid_output


class TestComponents:
    @pytest.mark.parametrize("a,b,expected", [
        ("numeric", "numeric", 1.0), ("string", "string", 1.0),
        ("numeric", "string", 0.4), ("string", "numeric", 0.4),
        ("numeric", "date", 0.2), ("date", "boolean", 0.1),
    ])
    def test_type_compatibility(self, a, b, expected):
        assert type_compatibility(a, b) == expected

    def test_trigram_identity(self):
        assert trigram_similarity("customer", "customer") == 1.0

    def test_trigram_similar_vs_different(self):
        assert (trigram_similarity("customer", "customers")
                > trigram_similarity("customer", "velocity"))

    def test_trigram_bounds(self):
        for a, b in [("a", "b"), ("abc", "xyz"), ("", "")]:
            assert 0.0 <= trigram_similarity(a, b) <= 1.0

    def test_invalid_strategy(self):
        with pytest.raises(ValueError):
            ComaMatcher("nope")


class TestSchemaStrategy:
    def test_output_contract(self, spark, unionable_noisy):
        p = unionable_noisy
        res = ComaMatcher("schema").match(spark, p.source, p.target)
        assert_valid_output(res, p.source, p.target, full_cross=True)

    def test_verbatim_names_perfect(self, spark, unionable_verbatim):
        """Table III: with identical column names all schema-based
        methods place every correct match on top."""
        p = unionable_verbatim
        res = ComaMatcher("schema").match(spark, p.source, p.target)
        assert recall_at_ground_truth(res, set(p.ground_truth)) == 1.0

    def test_threshold_filters_output(self, spark, unionable_verbatim):
        p = unionable_verbatim
        all_out = ComaMatcher("schema", threshold=0.0).match(
            spark, p.source, p.target)
        filtered = ComaMatcher("schema", threshold=0.8).match(
            spark, p.source, p.target)
        assert len(filtered) < len(all_out)
        assert (filtered["score"] >= 0.8).all()

    def test_name_used_in_path_matcher(self, spark, clients_table):
        # identical tables: self-match must be perfect
        res = ComaMatcher("schema").match(spark, clients_table, clients_table)
        gt = {(c, c) for c in clients_table.columns}
        assert recall_at_ground_truth(res, gt) == 1.0


class TestInstanceStrategy:
    def test_output_contract(self, spark, joinable_pair):
        p = joinable_pair
        res = ComaMatcher("instance").match(spark, p.source, p.target)
        assert_valid_output(res, p.source, p.target, full_cross=True)

    def test_joinable_recall_high(self, spark, joinable_pair):
        p = joinable_pair
        res = ComaMatcher("instance").match(spark, p.source, p.target)
        assert recall_at_ground_truth(res, set(p.ground_truth)) >= 2 / 3

    def test_instance_signal_rescues_renamed_columns(self, spark):
        """Same values under unrelated names: the instance component must
        rank the true pair above name-similar-but-value-different ones."""
        a = pd.DataFrame({"alpha": [f"tok{i}" for i in range(50)],
                          "beta": [str(i) for i in range(50)]})
        b = pd.DataFrame({"zeta": [f"tok{i}" for i in range(50)],
                          "beta": [f"other{i}" for i in range(50)]})
        ta, tb = Table("a", spark.createDataFrame(a)), Table("b", spark.createDataFrame(b))
        res = ComaMatcher("instance").match(spark, ta, tb)
        top = res.iloc[0]
        assert (top["source_col"], top["target_col"]) == ("alpha", "zeta")

    def test_oracle_value_overlap(self, spark):
        """The instance component's ordering must agree with the true
        (DuckDB-computed) value overlap ordering."""
        a = pd.DataFrame({"x": ["a", "b", "c", "d", "e", "f"]})
        b = pd.DataFrame({"full": ["a", "b", "c", "d", "e", "g"],
                          "half": ["a", "b", "c", "x1", "y2", "z3"]})
        ta, tb = Table("t1", spark.createDataFrame(a)), Table("t2", spark.createDataFrame(b))
        res = ComaMatcher("instance").match(spark, ta, tb)
        scores = res.set_index(["source_col", "target_col"])["score"]
        con = duckdb.connect()
        try:
            con.register("a", a), con.register("b", b)
            j_full = con.execute(
                "select count(*) from (select distinct x from a) "
                "join (select distinct \"full\" f from b) on x = f").fetchone()[0]
            j_half = con.execute(
                "select count(*) from (select distinct x from a) "
                "join (select distinct half h from b) on x = h").fetchone()[0]
        finally:
            con.close()
        assert j_full > j_half  # oracle sanity
        assert scores[("x", "full")] > scores[("x", "half")]


class TestDeterminism:
    def test_repeated_runs_identical(self, spark, unionable_noisy):
        p = unionable_noisy
        m = ComaMatcher("instance")
        r1 = m.match(spark, p.source, p.target)
        r2 = m.match(spark, p.source, p.target)
        pd.testing.assert_frame_equal(r1, r2)

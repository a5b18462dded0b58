"""Tests for the Cupid schema matcher."""
import pandas as pd
import pytest

from repro.matchers import CupidMatcher
from repro.metrics import recall_at_ground_truth
from tests.conftest import assert_valid_output


class TestParams:
    @pytest.mark.parametrize("kw", [
        {"w_struct": 1.5}, {"leaf_w_struct": -0.1}, {"th_accept": 2.0},
    ])
    def test_out_of_range_raises(self, kw):
        with pytest.raises(ValueError):
            CupidMatcher(**kw)

    def test_params_reported(self):
        m = CupidMatcher(w_struct=0.4, leaf_w_struct=0.2, th_accept=0.5)
        assert m.params() == {"w_struct": 0.4, "leaf_w_struct": 0.2,
                              "th_accept": 0.5}


class TestMatching:
    def test_verbatim_names_perfect(self, spark, unionable_verbatim):
        p = unionable_verbatim
        res = CupidMatcher(th_accept=0.3).match(spark, p.source, p.target)
        assert recall_at_ground_truth(res, set(p.ground_truth)) == 1.0

    def test_output_contract(self, spark, unionable_noisy):
        p = unionable_noisy
        res = CupidMatcher(th_accept=0.0).match(spark, p.source, p.target)
        assert_valid_output(res, p.source, p.target)

    def test_th_accept_filters(self, spark, unionable_noisy):
        p = unionable_noisy
        lo = CupidMatcher(th_accept=0.0).match(spark, p.source, p.target)
        hi = CupidMatcher(th_accept=0.7).match(spark, p.source, p.target)
        assert len(hi) < len(lo)
        assert (hi["score"] >= 0.7).all()

    def test_synonym_thesaurus_used(self, spark, clients_table):
        """client_name vs customer_name must score as a (near-)synonym."""
        from repro.table import Table
        t2 = clients_table.renamed({"client_name": "customer_title",
                                    "client_id": "customer_key"}, name="c2")
        res = CupidMatcher(th_accept=0.0).match(spark, clients_table, t2)
        s = res.set_index(["source_col", "target_col"])["score"]
        assert s[("client_name", "customer_title")] > s[("client_name", "phone")]

    def test_type_compatibility_weighs_in(self, spark, clients_table):
        res = CupidMatcher(th_accept=0.0).match(spark, clients_table,
                                                clients_table)
        s = res.set_index(["source_col", "target_col"])["score"]
        # same-name same-type always outranks cross-type pairs
        assert s[("income", "income")] > s[("income", "city")]

    def test_pure_linguistic_when_w_struct_zero(self, spark,
                                                unionable_verbatim):
        p = unionable_verbatim
        res = CupidMatcher(w_struct=0.0, th_accept=0.0).match(
            spark, p.source, p.target)
        assert recall_at_ground_truth(res, set(p.ground_truth)) == 1.0

    def test_deterministic(self, spark, unionable_noisy):
        p = unionable_noisy
        m = CupidMatcher()
        pd.testing.assert_frame_equal(m.match(spark, p.source, p.target),
                                      m.match(spark, p.source, p.target))

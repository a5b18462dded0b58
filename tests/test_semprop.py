"""Tests for the SemProp matcher (ontology links + MinHash fallback)."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from repro.matchers import SemPropMatcher
from repro.matchers.semprop import estimate_jaccard, minhash_signatures
from repro.table import Table
from repro.valentine_data.ontology import efo_like_ontology
from tests.conftest import assert_valid_output


@pytest.fixture(scope="module")
def ontology():
    return efo_like_ontology()


class TestMinHash:
    def test_signatures_shape(self, spark, clients_table):
        sigs = minhash_signatures(spark, clients_table, num_hashes=32)
        assert set(sigs) == set(clients_table.columns)
        assert all(len(v) == 32 for v in sigs.values())

    def test_estimate_close_to_true_jaccard(self, spark):
        """MinHash estimate vs DuckDB-computed exact Jaccard."""
        g = np.random.default_rng(0)
        universe = [f"v{i}" for i in range(200)]
        a = pd.DataFrame({"x": g.choice(universe[:150], 400)})
        b = pd.DataFrame({"y": g.choice(universe[50:], 400)})
        ta, tb = Table("a", spark.createDataFrame(a)), Table("b", spark.createDataFrame(b))
        sa = minhash_signatures(spark, ta, num_hashes=128)
        sb = minhash_signatures(spark, tb, num_hashes=128)
        est = estimate_jaccard(sa["x"], sb["y"])
        con = duckdb.connect()
        try:
            con.register("a", a), con.register("b", b)
            true = con.execute("""
                with i as (select count(*) n from (select distinct x from a)
                           join (select distinct y from b) on x = y),
                     u as (select count(*) n from
                           (select x v from a union select y from b))
                select cast(i.n as double)/u.n from i, u""").fetchone()[0]
        finally:
            con.close()
        assert est == pytest.approx(true, abs=0.12)

    def test_identical_columns_estimate_one(self, spark, clients_table):
        sigs = minhash_signatures(spark, clients_table)
        assert estimate_jaccard(sigs["city"], sigs["city"]) == 1.0

    def test_empty_signature(self):
        assert estimate_jaccard(np.array([]), np.array([])) == 0.0


class TestSemanticMatching:
    def test_ontology_linked_columns_match(self, spark, ontology):
        a = pd.DataFrame({"assay_organism": ["homo sapiens"] * 5,
                          "confidence_score": ["7"] * 5})
        b = pd.DataFrame({"species": ["mus musculus"] * 5,
                          "rating": ["3"] * 5})
        ta, tb = Table("a", spark.createDataFrame(a)), Table("b", spark.createDataFrame(b))
        m = SemPropMatcher(ontology, sem_threshold=0.4,
                           coh_sem_threshold=0.1, minhash_threshold=0.9)
        res = m.match(spark, ta, tb)
        pairs = set(zip(res["source_col"], res["target_col"]))
        # organism-class link relates assay_organism <-> species despite
        # zero value overlap (that is SemProp's whole point)
        assert ("assay_organism", "species") in pairs

    def test_semantic_ranks_above_syntactic(self, spark, ontology):
        a = pd.DataFrame({"assay_organism": ["homo sapiens"] * 5,
                          "junk": ["shared1", "shared2", "shared3",
                                   "shared4", "shared5"]})
        b = pdb = pd.DataFrame({"species": ["rattus"] * 5,
                                "junk2": ["shared1", "shared2", "shared3",
                                          "sharedx", "sharedy"]})
        ta, tb = Table("a", spark.createDataFrame(a)), Table("b", spark.createDataFrame(b))
        m = SemPropMatcher(ontology, sem_threshold=0.4,
                           coh_sem_threshold=0.1, minhash_threshold=0.2)
        res = m.match(spark, ta, tb)
        assert (res.iloc[0]["source_col"], res.iloc[0]["target_col"]) == (
            "assay_organism", "species")

    def test_domain_identifiers_not_linked(self, spark, ontology):
        """Paper's negative finding: embeddings cannot link opaque domain
        codes to ontology classes."""
        a = pd.DataFrame({"bao_format": ["bao_0000357"] * 5})
        b = pd.DataFrame({"assay_tax_id": ["9606"] * 5})
        ta, tb = Table("a", spark.createDataFrame(a)), Table("b", spark.createDataFrame(b))
        m = SemPropMatcher(ontology, sem_threshold=0.6,
                           minhash_threshold=0.3)
        res = m.match(spark, ta, tb)
        assert len(res) == 0  # neither semantic nor syntactic evidence

    def test_output_contract(self, spark, ontology, unionable_verbatim):
        p = unionable_verbatim
        res = SemPropMatcher(ontology).match(spark, p.source, p.target)
        assert_valid_output(res, p.source, p.target)

    def test_params_reported(self, ontology):
        m = SemPropMatcher(ontology, minhash_threshold=0.3,
                           sem_threshold=0.5, coh_sem_threshold=0.4)
        assert m.params() == {"minhash_threshold": 0.3, "sem_threshold": 0.5,
                              "coh_sem_threshold": 0.4}

    def test_deterministic(self, spark, ontology, unionable_verbatim):
        p = unionable_verbatim
        m = SemPropMatcher(ontology)
        pd.testing.assert_frame_equal(m.match(spark, p.source, p.target),
                                      m.match(spark, p.source, p.target))

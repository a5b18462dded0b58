"""Tests for the dataset-source generators (§V stand-ins)."""
import pytest

from repro.valentine_data.ontology import Ontology, OntologyClass, efo_like_ontology
from repro.valentine_data.sources import chembl_assays, opendata_table, tpcdi_prospect


class TestSources:
    @pytest.mark.parametrize("gen,n_cols,name", [
        (tpcdi_prospect, 22, "prospect"),
        (opendata_table, 51, "opendata"),
        (chembl_assays, 23, "assays"),
    ])
    def test_shape(self, spark, gen, n_cols, name):
        t = gen(spark, n_rows=80)
        assert len(t.columns) == n_cols
        assert t.df.count() == 80
        assert t.name == name

    def test_deterministic(self, spark):
        a = tpcdi_prospect(spark, n_rows=50).df.toPandas()
        b = tpcdi_prospect(spark, n_rows=50).df.toPandas()
        assert a.equals(b)

    def test_seed_changes_data(self, spark):
        a = tpcdi_prospect(spark, n_rows=50, seed=0).df.toPandas()
        b = tpcdi_prospect(spark, n_rows=50, seed=99).df.toPandas()
        assert not a.equals(b)

    def test_type_mix(self, spark):
        t = tpcdi_prospect(spark, n_rows=50)
        types = set(t.column_types.values())
        assert "string" in types and "numeric" in types

    def test_opendata_has_dates(self, spark):
        t = opendata_table(spark, n_rows=50)
        assert "date" in set(t.column_types.values())

    def test_chembl_vocabulary_matches_ontology(self, spark):
        """SemProp needs the data's column semantics covered by classes."""
        t = chembl_assays(spark, n_rows=30)
        labels = {c.label for c in efo_like_ontology().classes}
        assert {"assay", "organism", "tissue", "cell type",
                "target type", "confidence score"} <= labels
        assert any("assay" in c for c in t.columns)


class TestOntology:
    def test_build(self):
        ont = efo_like_ontology()
        assert len(ont.classes) == 20

    def test_get_and_names(self):
        ont = efo_like_ontology()
        c = ont.get("efo:0000002")
        assert c.label == "assay"
        assert "test" in c.names

    def test_ancestors_chain(self):
        ont = efo_like_ontology()
        chain = [c.label for c in ont.ancestors("efo:0000008")]
        assert chain == ["cell type", "tissue", "organism",
                         "experimental factor"]

    def test_root_has_no_ancestors(self):
        assert efo_like_ontology().ancestors("efo:0000001") == []

    def test_duplicate_ids_rejected(self):
        with pytest.raises(ValueError, match="duplicate"):
            Ontology("bad", [OntologyClass("x", "a"), OntologyClass("x", "b")])

    def test_unknown_parent_rejected(self):
        with pytest.raises(ValueError, match="unknown parent"):
            Ontology("bad", [OntologyClass("x", "a", parent="nope")])

"""Tests for the Similarity Flooding matcher."""
import pandas as pd
import pytest

from repro.matchers import SimilarityFloodingMatcher
from repro.matchers.similarity_flooding import schema_graph
from repro.metrics import recall_at_ground_truth
from repro.table import Table
from tests.conftest import assert_valid_output


class TestSchemaGraph:
    def test_nodes_and_edges(self, clients_table):
        nodes, edges = schema_graph(clients_table, "a")
        node_ids = {n for n, _ in nodes}
        assert "a:table" in node_ids
        assert f"a:col:client_id" in node_ids
        # every column contributes a column-edge and a type-edge
        labels = [l for _, l, _ in edges]
        assert labels.count("column") == len(clients_table.columns)
        assert labels.count("type") == len(clients_table.columns)

    def test_type_nodes_shared(self, clients_table):
        nodes, _ = schema_graph(clients_table, "a")
        type_nodes = [n for n, _ in nodes if n.startswith("a:type:")]
        assert len(type_nodes) == len(set(type_nodes))
        assert len(type_nodes) <= 4  # at most one per type class


class TestParams:
    def test_unsupported_propagation(self):
        with pytest.raises(ValueError):
            SimilarityFloodingMatcher(propagation="product")

    def test_unsupported_fixpoint(self):
        with pytest.raises(ValueError):
            SimilarityFloodingMatcher(fixpoint="A")


class TestMatching:
    def test_identity_match(self, spark, clients_table):
        res = SimilarityFloodingMatcher().match(spark, clients_table,
                                                clients_table)
        gt = {(c, c) for c in clients_table.columns}
        assert recall_at_ground_truth(res, gt) == 1.0

    def test_output_contract(self, spark, unionable_noisy):
        p = unionable_noisy
        res = SimilarityFloodingMatcher().match(spark, p.source, p.target)
        assert_valid_output(res, p.source, p.target, full_cross=True)

    def test_verbatim_recall(self, spark, unionable_verbatim):
        p = unionable_verbatim
        res = SimilarityFloodingMatcher().match(spark, p.source, p.target)
        assert recall_at_ground_truth(res, set(p.ground_truth)) >= 0.8

    def test_propagation_uses_structure(self, spark):
        """A column whose name is mangled but whose type matches should
        still receive similarity mass through the graph."""
        a = pd.DataFrame({"amount": [1.0, 2.0], "label": ["x", "y"]})
        b = pd.DataFrame({"amnt": [1.0, 2.0], "lbl": ["x", "y"]})
        ta, tb = Table("t", spark.createDataFrame(a)), Table("t", spark.createDataFrame(b))
        res = SimilarityFloodingMatcher().match(spark, ta, tb)
        s = res.set_index(["source_col", "target_col"])["score"]
        # same-type pair outranks cross-type pair with equally poor names
        assert s[("amount", "amnt")] > s[("amount", "lbl")]

    def test_scores_normalized(self, spark, unionable_noisy):
        p = unionable_noisy
        res = SimilarityFloodingMatcher().match(spark, p.source, p.target)
        assert res["score"].max() <= 1.0 + 1e-9
        assert res["score"].min() >= 0.0

    def test_convergence_respects_epsilon(self, spark, clients_table):
        strict = SimilarityFloodingMatcher(epsilon=1e-6, max_iterations=200)
        loose = SimilarityFloodingMatcher(epsilon=0.5, max_iterations=200)
        r1 = strict.match(spark, clients_table, clients_table)
        r2 = loose.match(spark, clients_table, clients_table)
        # both are valid rankings even if scores differ
        assert len(r1) == len(r2)

    def test_deterministic(self, spark, unionable_noisy):
        p = unionable_noisy
        m = SimilarityFloodingMatcher()
        pd.testing.assert_frame_equal(m.match(spark, p.source, p.target),
                                      m.match(spark, p.source, p.target))

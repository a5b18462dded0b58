"""Tests for the EmbDI matcher (walks + Spark co-occurrence + PPMI/SVD)."""
import pandas as pd
import pytest

from repro.matchers import EmbDIMatcher
from repro.matchers.embdi import _cells
from repro.metrics import recall_at_ground_truth
from repro.table import Table
from tests.conftest import assert_valid_output


def small(spark, data, name="t"):
    return Table(name, spark.createDataFrame(pd.DataFrame(data)))


class TestCells:
    def test_tokens_prefixed_and_shared(self, spark):
        t = small(spark, {"c1": ["alpha", "beta"], "c2": ["gamma", None]})
        cells = _cells(spark, t, "a", max_rows=10)
        assert set(cells["cid"]) == {"cid__a__c1", "cid__a__c2"}
        assert all(tok.startswith("v__") for tok in cells["token"])
        assert len(cells) == 3  # null dropped

    def test_multiword_values_split(self, spark):
        t = small(spark, {"c": ["elvis aaron presley"]})
        cells = _cells(spark, t, "a", max_rows=10)
        assert set(cells["token"]) == {"v__elvis", "v__aaron", "v__presley"}

    def test_row_cap(self, spark):
        t = small(spark, {"c": [str(i) for i in range(100)]})
        cells = _cells(spark, t, "a", max_rows=10)
        assert cells["rid"].nunique() == 10


class TestWalks:
    def test_walks_deterministic(self, spark):
        t = small(spark, {"c1": ["a", "b", "c"], "c2": ["x", "y", "z"]})
        m = EmbDIMatcher(seed=5, walks_per_start=2, sentence_length=12)
        cells = _cells(spark, t, "a", max_rows=10)
        assert m._walks(cells) == m._walks(cells)

    def test_walk_length_capped(self, spark):
        t = small(spark, {"c1": ["a", "b"], "c2": ["x", "y"]})
        m = EmbDIMatcher(sentence_length=9, walks_per_start=1)
        for sent in m._walks(_cells(spark, t, "a", max_rows=10)):
            assert len(sent) <= 9

    def test_walks_visit_columns_and_rows(self, spark):
        t = small(spark, {"c1": ["a", "b"], "c2": ["x", "y"]})
        m = EmbDIMatcher(sentence_length=20, walks_per_start=2)
        toks = {tok for s in m._walks(_cells(spark, t, "a", max_rows=10))
                for tok in s}
        assert any(tk.startswith("cid__") for tk in toks)
        assert any(tk.startswith("r__") for tk in toks)


class TestMatching:
    def test_shared_values_align_columns(self, spark):
        a = small(spark, {"u": [f"tok{i}" for i in range(20)],
                          "w": [f"left{i}" for i in range(20)]}, "a")
        b = small(spark, {"v": [f"tok{i}" for i in range(20)],
                          "z": [f"right{i}" for i in range(20)]}, "b")
        m = EmbDIMatcher(n_dimensions=30, walks_per_start=3, seed=1)
        res = m.match(spark, a, b)
        s = res.set_index(["source_col", "target_col"])["score"]
        assert s[("u", "v")] > s[("u", "z")]

    def test_output_contract(self, spark, unionable_verbatim):
        p = unionable_verbatim
        m = EmbDIMatcher(max_rows=100, max_starts=150, walks_per_start=2)
        res = m.match(spark, p.source, p.target)
        assert_valid_output(res, p.source, p.target, full_cross=True)

    def test_unionable_recall_reasonable(self, spark, unionable_verbatim):
        p = unionable_verbatim
        m = EmbDIMatcher(max_rows=100, max_starts=200, walks_per_start=2)
        res = m.match(spark, p.source, p.target)
        assert recall_at_ground_truth(res, set(p.ground_truth)) >= 0.4

    def test_deterministic(self, spark):
        a = small(spark, {"u": [f"t{i}" for i in range(15)]}, "a")
        b = small(spark, {"v": [f"t{i}" for i in range(15)]}, "b")
        m = EmbDIMatcher(seed=3, walks_per_start=2)
        pd.testing.assert_frame_equal(m.match(spark, a, b),
                                      m.match(spark, a, b))

    def test_params_reported(self):
        m = EmbDIMatcher()
        assert m.params() == {"n_dimensions": 300, "window_size": 3,
                              "sentence_length": 60}

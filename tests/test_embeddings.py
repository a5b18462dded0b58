"""Unit tests for the embedding substrates (pseudo-fastText, PPMI+SVD)."""
import numpy as np
import pandas as pd
import pytest

from repro.embeddings.ppmi_svd import cosine, ppmi_matrix, svd_embed
from repro.embeddings.pseudo_fasttext import PseudoFastText


@pytest.fixture(scope="module")
def emb():
    return PseudoFastText(dim=64)


class TestPseudoFastText:
    def test_deterministic(self, emb):
        v1 = emb.word("customer")
        v2 = PseudoFastText(dim=64).word("customer")
        np.testing.assert_allclose(v1, v2)

    def test_unit_norm(self, emb):
        assert np.linalg.norm(emb.word("anything")) == pytest.approx(1.0)

    def test_morphological_similarity(self, emb):
        # shared subwords -> closer than unrelated words
        sim_close = cosine(emb.word("customer"), emb.word("customers"))
        sim_far = cosine(emb.word("customer"), emb.word("velocity"))
        assert sim_close > sim_far + 0.2

    def test_synonyms_are_close(self, emb):
        # thesaurus pooling: client/customer pulled to a shared centroid
        assert cosine(emb.word("client"), emb.word("customer")) > 0.5

    def test_abbreviation_expansion(self, emb):
        np.testing.assert_allclose(emb.word("cust"), emb.word("customer"))

    def test_domain_identifiers_not_close(self, emb):
        # preserves the paper's negative SemProp finding: generic
        # embeddings know nothing about domain codes
        assert cosine(emb.word("chembl882341"), emb.word("assay")) < 0.35

    def test_text_averages_tokens(self, emb):
        v = emb.text("customer name")
        assert np.linalg.norm(v) == pytest.approx(1.0)
        assert cosine(v, emb.word("customer")) > 0.4

    def test_text_empty_is_zero(self, emb):
        assert np.linalg.norm(emb.text("___")) == 0.0


class TestPpmiSvd:
    def _cooc(self):
        return pd.DataFrame({
            "w": ["a", "a", "b", "b", "c"],
            "c": ["x", "y", "x", "y", "z"],
            "n": [10, 10, 10, 10, 20],
        })

    def test_ppmi_shape(self):
        M, ctx = ppmi_matrix(self._cooc(), ["a", "b", "c"])
        assert M.shape == (3, len(ctx))
        assert ctx == sorted(ctx)

    def test_ppmi_nonnegative(self):
        M, _ = ppmi_matrix(self._cooc(), ["a", "b", "c"])
        assert (M >= 0).all()

    def test_similar_contexts_similar_rows(self):
        M, _ = ppmi_matrix(self._cooc(), ["a", "b", "c"])
        E = svd_embed(M, 2)
        assert cosine(E[0], E[1]) > cosine(E[0], E[2])

    def test_empty_cooc(self):
        M, ctx = ppmi_matrix(pd.DataFrame(columns=["w", "c", "n"]), ["a"])
        assert M.shape == (1, 0) and ctx == []

    def test_svd_caps_dim_at_rank(self):
        M = np.eye(3)
        E = svd_embed(M, 300)
        assert E.shape[1] <= 3

    def test_svd_zero_matrix(self):
        E = svd_embed(np.zeros((2, 5)), 4)
        assert E.shape[0] == 2
        assert not np.any(E)

    def test_cosine_zero_guard(self):
        assert cosine(np.zeros(3), np.ones(3)) == 0.0

    def test_cosine_identity(self):
        v = np.array([1.0, 2.0, 3.0])
        assert cosine(v, v) == pytest.approx(1.0)

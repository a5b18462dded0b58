"""Embedding substrates (substitutes for pre-trained word2vec / gensim).

``pseudo_fasttext`` — deterministic char-n-gram hash embeddings with
thesaurus-injected synonymy; stands in for the pre-trained embeddings
SemProp loads (DESIGN.md §5).

``ppmi_svd`` — co-occurrence -> PPMI -> truncated SVD; the closed-form
analogue of skip-gram-with-negative-sampling used to train EmbDI's local
embeddings.
"""
from repro.embeddings.pseudo_fasttext import PseudoFastText
from repro.embeddings.ppmi_svd import ppmi_matrix, svd_embed, cosine

__all__ = ["PseudoFastText", "ppmi_matrix", "svd_embed", "cosine"]

"""PPMI + truncated SVD embedding trainer (word2vec substitute).

EmbDI trains skip-gram word2vec over random-walk sentences. Levy &
Goldberg (NeurIPS 2014) showed skip-gram with negative sampling
implicitly factorizes the shifted PPMI co-occurrence matrix; SVD of the
PPMI matrix is its deterministic, closed-form analogue. We use that
analogue — no gensim, no training randomness, same geometry.

The co-occurrence *counts* are produced by Spark (see
``repro.matchers.embdi``); this module only does the small dense
linear algebra for the rows we actually need.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def ppmi_matrix(cooc: pd.DataFrame, rows: list[str]) -> tuple[np.ndarray, list[str]]:
    """PPMI rows for ``rows`` over the full context vocabulary.

    ``cooc`` has columns ``w`` (word), ``c`` (context), ``n`` (count),
    and must already be symmetric or treated as directed counts.
    Returns ``(M, contexts)`` where ``M[i, j] = PPMI(rows[i],
    contexts[j])`` and ``contexts`` is the sorted context vocabulary.
    """
    if cooc.empty:
        return np.zeros((len(rows), 0)), []
    total = float(cooc["n"].sum())
    pw = cooc.groupby("w")["n"].sum() / total
    pc = cooc.groupby("c")["n"].sum() / total
    contexts = sorted(pc.index)
    c_idx = {c: j for j, c in enumerate(contexts)}
    r_idx = {r: i for i, r in enumerate(rows)}
    M = np.zeros((len(rows), len(contexts)))
    sub = cooc[cooc["w"].isin(r_idx)]
    for w, c, n in zip(sub["w"], sub["c"], sub["n"]):
        p_wc = n / total
        pmi = np.log(p_wc / (pw[w] * pc[c]))
        if pmi > 0:
            M[r_idx[w], c_idx[c]] = pmi
    return M, contexts


def svd_embed(M: np.ndarray, dim: int) -> np.ndarray:
    """Rank-``dim`` SVD embedding of the PPMI rows: ``U_k * sqrt(S_k)``.

    ``dim`` is capped at the matrix rank; degenerate (all-zero) input
    yields zero vectors rather than raising.
    """
    if M.size == 0 or not np.any(M):
        return np.zeros((M.shape[0], 1))
    U, S, _ = np.linalg.svd(M, full_matrices=False)
    k = min(dim, int(np.sum(S > 1e-12)))
    k = max(k, 1)
    return U[:, :k] * np.sqrt(S[:k])


def cosine(a: np.ndarray, b: np.ndarray) -> float:
    """Cosine similarity with zero-vector guard (returns 0.0)."""
    na, nb = np.linalg.norm(a), np.linalg.norm(b)
    if na == 0 or nb == 0:
        return 0.0
    return float(np.dot(a, b) / (na * nb))

"""Deterministic "pre-trained" word embeddings.

SemProp needs pre-trained natural-language embeddings with two
properties: (1) morphologically similar words get close vectors, and
(2) known synonyms get close vectors. We reproduce both without any
downloaded model:

* property (1) via fastText's own trick — a word vector is the sum of
  hashed character n-gram vectors, so words sharing subwords share
  vector mass;
* property (2) by pooling: every token in a thesaurus synonym set is
  pulled toward the set centroid, emulating the distributional
  closeness a corpus-trained model gives synonyms.

Crucially this also preserves the paper's *negative* finding: just like
generic GloVe/word2vec, these vectors know nothing about domain-specific
identifiers (ChEMBL-style assay codes), so SemProp's semantic matcher
degrades on them exactly as reported (§VII-A3).
"""
from __future__ import annotations

import hashlib

import numpy as np

from repro.lexicon.thesaurus import SYNONYM_SETS, expand_token
from repro.lexicon.tokenize import tokenize


def _hash_vec(token: str, dim: int) -> np.ndarray:
    """A unit Gaussian vector seeded by the token's SHA-256 (stable)."""
    seed = int.from_bytes(hashlib.sha256(token.encode()).digest()[:8], "big")
    g = np.random.default_rng(seed)
    v = g.standard_normal(dim)
    return v / np.linalg.norm(v)


class PseudoFastText:
    """Subword-hash word embeddings with synonym pooling.

    ``dim`` is the embedding dimensionality; ``ngram`` the subword
    n-gram sizes; ``synonym_pull`` how far each thesaurus token moves
    toward its synonym-set centroid (0 = none, 1 = collapse onto it).
    """

    def __init__(self, dim: int = 100, ngram: tuple[int, ...] = (3, 4),
                 synonym_pull: float = 0.7):
        self.dim = dim
        self.ngram = ngram
        self.synonym_pull = synonym_pull
        self._syn_centroid: dict[str, np.ndarray] = {}
        for s in SYNONYM_SETS:
            vecs = [self._raw_word(t) for t in sorted(s)]
            centroid = np.mean(vecs, axis=0)
            centroid /= np.linalg.norm(centroid)
            for t in s:
                # first set wins if a token is in several sets
                self._syn_centroid.setdefault(t, centroid)

    def _raw_word(self, word: str) -> np.ndarray:
        """Sum of hashed char n-gram vectors + whole-word vector."""
        w = f"<{word.lower()}>"
        parts = [_hash_vec(w, self.dim)]
        for n in self.ngram:
            parts.extend(_hash_vec(w[i:i + n], self.dim)
                         for i in range(max(0, len(w) - n + 1)))
        v = np.sum(parts, axis=0)
        return v / np.linalg.norm(v)

    def word(self, word: str) -> np.ndarray:
        """Embedding of a single token (abbreviations expanded first)."""
        tok = expand_token(word.lower())
        v = self._raw_word(tok)
        c = self._syn_centroid.get(tok)
        if c is not None:
            v = (1 - self.synonym_pull) * v + self.synonym_pull * c
            v = v / np.linalg.norm(v)
        return v

    def text(self, text: str) -> np.ndarray:
        """Mean token embedding of a multi-token name/phrase.

        Returns the zero vector for text with no alphanumeric tokens
        (callers treat zero-norm vectors as "no embedding").
        """
        toks = tokenize(text)
        if not toks:
            return np.zeros(self.dim)
        v = np.mean([self.word(t) for t in toks], axis=0)
        n = np.linalg.norm(v)
        return v / n if n > 0 else v

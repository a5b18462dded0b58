"""SemProp matcher (paper §VI-A, [19] — Fernandez et al., "Seeping
Semantics"; the matcher shipped with the Aurum discovery system).

SemProp relates attributes *semantically* by linking their names to
classes of a domain ontology via word-embedding similarity, then
relating attributes transitively through shared (or ancestor-related)
classes. Attribute pairs the semantic matcher cannot relate fall
through to a *syntactic* matcher based on MinHash value signatures.

Substitutions (DESIGN.md §5): pre-trained word2vec is replaced by the
deterministic :class:`~repro.embeddings.pseudo_fasttext.PseudoFastText`
substrate; the EFO ontology by
:func:`~repro.valentine_data.ontology.efo_like_ontology` (callers pass
any :class:`~repro.valentine_data.ontology.Ontology`).

Table II parameters: ``sem_threshold`` (name→class link cosine),
``coh_sem_threshold`` (coherence of the attribute group linked to one
class), ``minhash_threshold`` (syntactic Jaccard estimate). MinHash
signatures are computed in Spark (one ``min(xxhash64(value, seed))``
aggregate per hash function).
"""
from __future__ import annotations

import itertools

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.embeddings.pseudo_fasttext import PseudoFastText
from repro.embeddings.ppmi_svd import cosine
from repro.matchers.base import Matcher, as_match_df
from repro.table import Table, distinct_values
from repro.valentine_data.ontology import Ontology


def minhash_signatures(spark: SparkSession, table: Table, *,
                       num_hashes: int = 64,
                       max_values: int = 2000) -> dict[str, np.ndarray]:
    """Per-column MinHash signatures over distinct (lowercased) values."""
    dv = (distinct_values(table, max_values=max_values)
          .select("col", F.lower(F.trim("value")).alias("v"))
          .where(F.length("v") > 0).distinct())
    aggs = [F.min(F.xxhash64("v", F.lit(i))).alias(f"h{i}")
            for i in range(num_hashes)]
    rows = dv.groupBy("col").agg(*aggs).collect()
    return {r["col"]: np.array([r[f"h{i}"] for i in range(num_hashes)])
            for r in rows}


def estimate_jaccard(sig_a: np.ndarray, sig_b: np.ndarray) -> float:
    """MinHash Jaccard estimate: fraction of agreeing components."""
    if len(sig_a) == 0:
        return 0.0
    return float(np.mean(sig_a == sig_b))


class SemPropMatcher(Matcher):
    """Semantic (ontology + embeddings) matcher with syntactic fallback."""

    name = "semprop"

    def __init__(self, ontology: Ontology, *,
                 minhash_threshold: float = 0.2,
                 sem_threshold: float = 0.5,
                 coh_sem_threshold: float = 0.3,
                 num_hashes: int = 64, max_values: int = 2000,
                 embeddings: PseudoFastText | None = None):
        self.ontology = ontology
        self.minhash_threshold = minhash_threshold
        self.sem_threshold = sem_threshold
        self.coh_sem_threshold = coh_sem_threshold
        self.num_hashes = num_hashes
        self.max_values = max_values
        self.emb = embeddings or PseudoFastText()

    def params(self) -> dict:
        return {"minhash_threshold": self.minhash_threshold,
                "sem_threshold": self.sem_threshold,
                "coh_sem_threshold": self.coh_sem_threshold}

    # --------------------------------------------------------- semantic
    def _class_vectors(self) -> dict[str, np.ndarray]:
        out = {}
        for c in self.ontology.classes:
            vecs = [self.emb.text(n) for n in c.names]
            v = np.mean(vecs, axis=0)
            n = np.linalg.norm(v)
            out[c.id] = v / n if n > 0 else v
        return out

    def _link(self, columns: list[str], cvecs: dict[str, np.ndarray]
              ) -> dict[str, tuple[str, float]]:
        """Best ontology class per attribute name, if above sem_threshold.

        An attribute is scored against a class by the better of its full
        name embedding and its head-noun (last alphabetic token)
        embedding — ``assay_organism`` should link to *organism*, not be
        diluted by the ``assay`` qualifier.
        """
        from repro.lexicon.tokenize import tokenize

        links = {}
        for col in columns:
            av_full = self.emb.text(col)
            toks = [t for t in tokenize(col) if t.isalpha()]
            av_head = self.emb.word(toks[-1]) if toks else av_full
            best_cid, best = None, self.sem_threshold
            for cid, cv in cvecs.items():
                sim = max(cosine(av_full, cv), cosine(av_head, cv))
                if sim >= best:
                    best_cid, best = cid, sim
            if best_cid is not None:
                links[col] = (best_cid, best)
        return links

    # ------------------------------------------------------------ match
    def match(self, spark: SparkSession, source: Table,
              target: Table) -> pd.DataFrame:
        cvecs = self._class_vectors()
        s_links = self._link(source.columns, cvecs)
        t_links = self._link(target.columns, cvecs)

        # coherence filter: the group of attributes linked to one class
        # must itself be mutually similar, else the links are spurious.
        by_class: dict[str, list[str]] = {}
        for col, (cid, _) in {**{f"s|{c}": v for c, v in s_links.items()},
                              **{f"t|{c}": v for c, v in t_links.items()}
                              }.items():
            by_class.setdefault(cid, []).append(col)
        incoherent: set[str] = set()
        for cid, cols in by_class.items():
            if len(cols) < 2:
                continue
            vecs = [self.emb.text(c.split("|", 1)[1]) for c in cols]
            sims = [cosine(a, b) for a, b in itertools.combinations(vecs, 2)]
            if np.mean(sims) < self.coh_sem_threshold:
                incoherent.add(cid)

        semantic: dict[tuple[str, str], float] = {}
        for s, (cs, sim_s) in s_links.items():
            if cs in incoherent:
                continue
            for t, (ct, sim_t) in t_links.items():
                if ct in incoherent:
                    continue
                if cs == ct:
                    semantic[(s, t)] = (sim_s + sim_t) / 2.0
                else:
                    # transitive relation through a parent class
                    anc_s = {a.id for a in self.ontology.ancestors(cs)}
                    anc_t = {a.id for a in self.ontology.ancestors(ct)}
                    if cs in anc_t or ct in anc_s:
                        semantic[(s, t)] = 0.8 * (sim_s + sim_t) / 2.0

        # --------- syntactic fallback for pairs without semantic links
        s_sigs = minhash_signatures(spark, source, num_hashes=self.num_hashes,
                                    max_values=self.max_values)
        t_sigs = minhash_signatures(spark, target, num_hashes=self.num_hashes,
                                    max_values=self.max_values)
        rows = []
        for s in source.columns:
            for t in target.columns:
                if (s, t) in semantic:
                    # semantic matches rank above all syntactic ones
                    rows.append((s, t, 1.0 + semantic[(s, t)]))
                    continue
                est = estimate_jaccard(s_sigs.get(s, np.array([])),
                                       t_sigs.get(t, np.array([])))
                if est >= self.minhash_threshold:
                    rows.append((s, t, est))
        return as_match_df(rows)

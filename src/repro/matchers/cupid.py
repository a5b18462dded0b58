"""Cupid schema matcher (paper §VI-A, [15]).

Cupid translates schemata into trees and scores element pairs by a
weighted sum of **linguistic** and **structural** similarity. For flat
relational tables the tree is two levels deep (relation root →
attribute leaves), which is exactly why the paper sweeps
``w_struct ≤ 0.6`` — there is little structure to exploit.

* Linguistic similarity: thesaurus-backed token-set name similarity
  (``repro.lexicon``; WordNet substitute per DESIGN.md §5), weighted by
  data-type compatibility — the paper notes it "rel[ies] on the name
  similarity formula to compute data compatibility scores".
* Structural similarity: leaves start from type compatibility; the root
  pair's similarity is the fraction of strongly-linked leaves (mutual
  ``wsim`` above ``th_high``); each leaf pair's structural score is then
  blended with its context (the root) by ``leaf_w_struct`` — the
  TreeMatch mutual-reinforcement step collapsed to depth 2.

Pairs scoring below ``th_accept`` are dropped from the output (Cupid's
acceptance threshold), which is how this grid axis affects Recall@k.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.lexicon.thesaurus import name_similarity
from repro.matchers.base import Matcher, all_column_pairs, as_match_df
from repro.matchers.coma import type_compatibility
from repro.table import Table


class CupidMatcher(Matcher):
    """Tree-based linguistic + structural matching, flattened to depth 2."""

    name = "cupid"

    def __init__(self, w_struct: float = 0.2, leaf_w_struct: float = 0.2,
                 th_accept: float = 0.3, th_high: float = 0.6):
        for nm, v in (("w_struct", w_struct), ("leaf_w_struct", leaf_w_struct),
                      ("th_accept", th_accept), ("th_high", th_high)):
            if not 0.0 <= v <= 1.0:
                raise ValueError(f"{nm} must be in [0,1], got {v}")
        self.w_struct = w_struct
        self.leaf_w_struct = leaf_w_struct
        self.th_accept = th_accept
        self.th_high = th_high

    def params(self) -> dict:
        return {"w_struct": self.w_struct, "leaf_w_struct": self.leaf_w_struct,
                "th_accept": self.th_accept}

    def match(self, spark: SparkSession, source: Table,
              target: Table) -> pd.DataFrame:
        pairs = all_column_pairs(source, target)

        # linguistic similarity: name sim weighted by type compatibility
        lsim: dict[tuple[str, str], float] = {}
        ssim0: dict[tuple[str, str], float] = {}
        for s, t in pairs:
            compat = type_compatibility(source.column_types[s],
                                        target.column_types[t])
            lsim[(s, t)] = name_similarity(s, t) * (0.5 + 0.5 * compat)
            ssim0[(s, t)] = compat

        # initial weighted similarity
        wsim0 = {p: self.w_struct * ssim0[p] + (1 - self.w_struct) * lsim[p]
                 for p in pairs}

        # root (relation-pair) structural similarity: fraction of leaves on
        # either side with a strong link (wsim above th_high)
        strong_s = {s for (s, t), w in wsim0.items() if w > self.th_high}
        strong_t = {t for (s, t), w in wsim0.items() if w > self.th_high}
        n_leaves = len(source.columns) + len(target.columns)
        root_sim = (len(strong_s) + len(strong_t)) / n_leaves if n_leaves else 0.0

        # leaf structural similarity blended with root context
        rows = []
        for p in pairs:
            ssim = ((1 - self.leaf_w_struct) * ssim0[p]
                    + self.leaf_w_struct * root_sim)
            wsim = self.w_struct * ssim + (1 - self.w_struct) * lsim[p]
            if wsim >= self.th_accept:
                rows.append((p[0], p[1], wsim))
        return as_match_df(rows)

"""Distribution-based matcher (paper §VI-A, [18] — Zhang et al. SIGMOD'11).

Columns are related when the *distributions* of their value sets are
close under the Earth Mover's Distance. The method runs in two phases:

* **Phase 1** — cluster all columns (of both tables) whose EMD over a
  global rank-histogram is ≤ θ₁ (transitively: union-find).
* **Phase 2** — within every cluster that spans both tables, compute a
  refined pairwise EMD on the *union rank space of the pair* and accept
  pairs with EMD ≤ θ₂.

Per the paper's setup we use two independent thresholds (they "split
the single global threshold that was proposed in two, one for each
phase") and replace the final CPLEX/PuLP integer program with greedy
maximum-weight assignment (DESIGN.md §5) — accepted matches are ranked
above the rest by their assignment order.

Spark does the data-scale work: the per-column value *frequency* tables
(``groupBy(col, value).count`` with a deterministic per-column cap);
EMD and clustering run on the collected per-column histograms.
"""
from __future__ import annotations

from collections import defaultdict

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession, Window
from pyspark.sql import functions as F

from repro.matchers.base import Matcher, all_column_pairs, as_match_df
from repro.table import Table, melt_values


def emd_1d(ranks_a: np.ndarray, weights_a: np.ndarray,
           ranks_b: np.ndarray, weights_b: np.ndarray,
           n_ranks: int, n_buckets: int = 50) -> float:
    """EMD between two 1-D distributions over a shared [0, n_ranks) space.

    Values are bucketed into ``n_buckets`` equal-width rank buckets;
    the EMD of two 1-D histograms is the L1 distance of their CDFs
    (normalized to [0, 1] by the bucket count).
    """
    if n_ranks <= 0:
        return 1.0
    def hist(r, w):
        b = np.minimum((r * n_buckets) // max(n_ranks, 1), n_buckets - 1)
        h = np.zeros(n_buckets)
        np.add.at(h, b.astype(int), w)
        s = h.sum()
        return h / s if s > 0 else h
    ha, hb = hist(ranks_a, weights_a), hist(ranks_b, weights_b)
    return float(np.abs(np.cumsum(ha) - np.cumsum(hb)).sum() / n_buckets)


class _UnionFind:
    def __init__(self, items):
        self.parent = {x: x for x in items}

    def find(self, x):
        while self.parent[x] != x:
            self.parent[x] = self.parent[self.parent[x]]
            x = self.parent[x]
        return x

    def union(self, a, b):
        ra, rb = self.find(a), self.find(b)
        if ra != rb:
            self.parent[rb] = ra


class DistributionBasedMatcher(Matcher):
    """Two-phase EMD clustering over column value distributions."""

    name = "distribution_based"

    def __init__(self, theta1: float = 0.15, theta2: float = 0.15,
                 n_buckets: int = 50, max_values: int = 2000):
        for nm, v in (("theta1", theta1), ("theta2", theta2)):
            if v <= 0:
                raise ValueError(f"{nm} must be positive, got {v}")
        self.theta1 = theta1
        self.theta2 = theta2
        self.n_buckets = n_buckets
        self.max_values = max_values

    def params(self) -> dict:
        return {"theta1": self.theta1, "theta2": self.theta2}

    # ------------------------------------------------------------ spark
    def _frequencies(self, spark: SparkSession, source: Table,
                     target: Table) -> pd.DataFrame:
        """(side, col, value, n): capped value frequencies of all columns."""
        freqs = []
        for side, tbl in (("s", source), ("t", target)):
            mv = melt_values(tbl).select(
                "col", F.lower(F.trim("value")).alias("value")
            ).where(F.length("value") > 0)
            freq = mv.groupBy("col", "value").agg(F.count("*").alias("n"))
            w = Window.partitionBy("col").orderBy(
                F.desc("n"), F.col("value"))
            freqs.append(
                freq.withColumn("_rn", F.row_number().over(w))
                .where(F.col("_rn") <= self.max_values)
                .select(F.lit(side).alias("side"), "col", "value", "n")
            )
        return freqs[0].unionByName(freqs[1]).toPandas()

    # ------------------------------------------------------------- match
    def match(self, spark: SparkSession, source: Table,
              target: Table) -> pd.DataFrame:
        freq = self._frequencies(spark, source, target)
        cols = ([("s", c) for c in source.columns]
                + [("t", c) for c in target.columns])

        # global rank space over the union of all values
        all_values = np.sort(freq["value"].unique())
        rank_of = {v: i for i, v in enumerate(all_values)}
        n_ranks = len(all_values)

        per_col: dict[tuple[str, str], tuple[np.ndarray, np.ndarray]] = {}
        for (side, col), grp in freq.groupby(["side", "col"]):
            ranks = grp["value"].map(rank_of).to_numpy()
            per_col[(side, col)] = (ranks, grp["n"].to_numpy(dtype=float))
        for key in cols:  # empty columns get empty distributions
            per_col.setdefault(key, (np.array([], dtype=int), np.array([])))

        # ---- phase 1: global-EMD clustering (union-find) ----
        uf = _UnionFind(cols)
        emd1: dict[tuple, float] = {}
        for i, a in enumerate(cols):
            ra, wa = per_col[a]
            for b in cols[i + 1:]:
                rb, wb = per_col[b]
                e = emd_1d(ra, wa, rb, wb, n_ranks, self.n_buckets)
                emd1[(a, b)] = emd1[(b, a)] = e
                if e <= self.theta1:
                    uf.union(a, b)

        clusters: dict = defaultdict(list)
        for c in cols:
            clusters[uf.find(c)].append(c)

        # ---- phase 2: refined EMD on the pair's own rank space ----
        def pair_emd(a, b) -> float:
            ra, wa = per_col[a]
            rb, wb = per_col[b]
            if len(ra) == 0 or len(rb) == 0:
                return 1.0
            union = np.sort(np.unique(np.concatenate([ra, rb])))
            remap = {r: i for i, r in enumerate(union)}
            ra2 = np.array([remap[r] for r in ra])
            rb2 = np.array([remap[r] for r in rb])
            return emd_1d(ra2, wa, rb2, wb, len(union), self.n_buckets)

        accepted: dict[tuple[str, str], float] = {}
        for members in clusters.values():
            s_side = [c for sd, c in members if sd == "s"]
            t_side = [c for sd, c in members if sd == "t"]
            cand = []
            for s in s_side:
                for t in t_side:
                    e2 = pair_emd(("s", s), ("t", t))
                    if e2 <= self.theta2:
                        cand.append((e2, s, t))
            # greedy max-weight (min-EMD) assignment: IP substitute. Each
            # source column takes its best free target; a target may be
            # reused only after every source in the cluster is assigned,
            # approximating the IP's soft 1-1 bias while still allowing
            # the one-to-many matches of e.g. ING#2.
            cand.sort()
            taken_s: set[str] = set()
            for e2, s, t in cand:
                if s not in taken_s:
                    taken_s.add(s)
                    accepted[(s, t)] = 1.0 / (1.0 + e2)
            for e2, s, t in cand:  # remaining pairs rank below assigned
                accepted.setdefault((s, t), 0.5 / (1.0 + e2))

        # full ranking: accepted first, everything else by global EMD
        rows = []
        for s, t in all_column_pairs(source, target):
            if (s, t) in accepted:
                rows.append((s, t, 1.0 + accepted[(s, t)]))
            else:
                e = emd1.get((("s", s), ("t", t)), 1.0)
                rows.append((s, t, 1.0 / (1.0 + e)))
        return as_match_df(rows)

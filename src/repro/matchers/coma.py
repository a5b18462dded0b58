"""COMA-style composite matcher (paper §VI-A, [17]/[29]/[32]).

COMA combines multiple matchers over a schema graph and aggregates
their similarity matrices. We reproduce its two default strategies:

* ``strategy="schema"`` — COMA's schema-level combination: Name (token
  alignment with synonyms), NamePath (``table.column``), character
  Trigram, and DataType matchers, aggregated by averaging (COMA's
  ``Average`` aggregation).
* ``strategy="instance"`` — the COMA++ instance extension [29]: adds a
  value-overlap matcher (exact distinct-value join in Spark, Jaccard +
  containment) and a numeric-statistics matcher; schema and instance
  components are averaged.

Per Table II the accept threshold is 0 — every pair is emitted, so the
downstream ranking sees the full similarity matrix.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.lexicon.thesaurus import name_similarity, normalize
from repro.matchers.base import Matcher, all_column_pairs, as_match_df
from repro.table import Table, distinct_values

#: data-type-class compatibility (symmetric).
_TYPE_COMPAT = {
    ("numeric", "numeric"): 1.0, ("string", "string"): 1.0,
    ("date", "date"): 1.0, ("boolean", "boolean"): 1.0,
    ("numeric", "string"): 0.4, ("date", "string"): 0.4,
    ("boolean", "string"): 0.4, ("numeric", "date"): 0.2,
    ("numeric", "boolean"): 0.2, ("date", "boolean"): 0.1,
}


def type_compatibility(a: str, b: str) -> float:
    """Compatibility of two type classes in [0, 1]."""
    return _TYPE_COMPAT.get((a, b)) or _TYPE_COMPAT.get((b, a)) or 0.0


def trigram_similarity(a: str, b: str) -> float:
    """Dice coefficient over padded character trigrams of the names."""
    pa, pb = f"##{normalize(a)}#", f"##{normalize(b)}#"
    ta = {pa[i:i + 3] for i in range(len(pa) - 2)}
    tb = {pb[i:i + 3] for i in range(len(pb) - 2)}
    if not ta or not tb:
        return 0.0
    return 2 * len(ta & tb) / (len(ta) + len(tb))


class ComaMatcher(Matcher):
    """COMA 3.0-style combination of schema (and instance) matchers."""

    name = "coma"

    def __init__(self, strategy: str = "schema", threshold: float = 0.0,
                 max_values: int = 1000):
        if strategy not in ("schema", "instance"):
            raise ValueError(f"strategy must be schema|instance, got {strategy}")
        self.strategy = strategy
        self.threshold = threshold
        self.max_values = max_values
        self.name = f"coma_{strategy}"

    def params(self) -> dict:
        return {"strategy": self.strategy, "threshold": self.threshold}

    # ------------------------------------------------------------ schema
    def _schema_score(self, source: Table, target: Table,
                      s: str, t: str) -> float:
        name = name_similarity(s, t)
        path = name_similarity(f"{source.name} {s}", f"{target.name} {t}")
        tri = trigram_similarity(s, t)
        typ = type_compatibility(source.column_types[s],
                                 target.column_types[t])
        return 0.4 * name + 0.2 * path + 0.2 * tri + 0.2 * typ

    # ---------------------------------------------------------- instance
    def _instance_scores(self, spark: SparkSession, source: Table,
                         target: Table) -> dict[tuple[str, str], float]:
        """Value-overlap + numeric-stats similarity per column pair."""
        sv = (distinct_values(source, max_values=self.max_values)
              .select(F.col("col").alias("scol"),
                      F.lower(F.trim("value")).alias("v"))
              .where(F.length("v") > 0).distinct())
        tv = (distinct_values(target, max_values=self.max_values)
              .select(F.col("col").alias("tcol"),
                      F.lower(F.trim("value")).alias("v"))
              .where(F.length("v") > 0).distinct())
        s_sizes = dict(sv.groupBy("scol").count().collect())
        t_sizes = dict(tv.groupBy("tcol").count().collect())
        inter = dict(
            ((r["scol"], r["tcol"]), r["count"])
            for r in sv.join(tv, on="v").groupBy("scol", "tcol").count().collect()
        )

        def overlap(s: str, t: str) -> float:
            i = inter.get((s, t), 0)
            a, b = s_sizes.get(s, 0), t_sizes.get(t, 0)
            if a == 0 or b == 0:
                return 0.0
            jac = i / (a + b - i)
            containment = i / min(a, b)
            return (jac + containment) / 2.0

        # numeric statistics similarity (COMA++'s constraint matchers)
        def stats(table: Table, cols: list[str]):
            num = [c for c in cols if table.column_types[c] == "numeric"]
            if not num:
                return {}
            aggs = []
            for c in num:
                aggs += [F.avg(F.col(c)).alias(f"avg__{c}"),
                         F.stddev_samp(F.col(c)).alias(f"std__{c}")]
            row = table.df.agg(*aggs).first().asDict()
            return {c: (row[f"avg__{c}"], row[f"std__{c}"]) for c in num}

        s_stats = stats(source, source.columns)
        t_stats = stats(target, target.columns)

        def num_sim(s: str, t: str) -> float | None:
            if s not in s_stats or t not in t_stats:
                return None
            (ma, sa), (mb, sb) = s_stats[s], t_stats[t]
            if ma is None or mb is None:
                return None
            pooled = max(abs(ma), abs(mb), (sa or 0) + (sb or 0), 1e-9)
            mean_sim = max(0.0, 1.0 - abs(ma - mb) / pooled)
            if sa is None or sb is None:
                return mean_sim
            std_sim = max(0.0, 1.0 - abs(sa - sb) / max(sa, sb, 1e-9))
            return 0.7 * mean_sim + 0.3 * std_sim

        out: dict[tuple[str, str], float] = {}
        for s, t in all_column_pairs(source, target):
            parts = [overlap(s, t)]
            ns = num_sim(s, t)
            if ns is not None:
                parts.append(ns)
            out[(s, t)] = sum(parts) / len(parts)
        return out

    # ------------------------------------------------------------- match
    def match(self, spark: SparkSession, source: Table,
              target: Table) -> pd.DataFrame:
        inst = (self._instance_scores(spark, source, target)
                if self.strategy == "instance" else None)
        rows = []
        for s, t in all_column_pairs(source, target):
            score = self._schema_score(source, target, s, t)
            if inst is not None:
                score = 0.5 * score + 0.5 * inst[(s, t)]
            if score >= self.threshold:
                rows.append((s, t, score))
        return as_match_df(rows)

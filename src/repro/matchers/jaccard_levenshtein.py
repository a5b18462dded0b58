"""Jaccard–Levenshtein baseline matcher (paper §VI-A, last entry).

"A naive instance-based matcher computing all pairwise column
similarities by using Jaccard similarity. We treat two values as being
identical if their Levenshtein distance is below a given threshold."

Implementation: distinct values per column (deterministically capped),
then a *blocked* fuzzy value join in Spark — candidate pairs must share
a first-character or last-character block key and lie within the length
band implied by the threshold, then pass the normalized-Levenshtein
test (Spark's ``levenshtein``). Per column pair, the matched-value
count yields Jaccard = |I| / (|A| + |B| − |I|).

The blocking is the one approximation versus an exhaustive cross join
(a value whose first *and* last characters both mutated can be missed);
it is what makes the method runnable at data scale, and typo noise from
the fabricator touches a single character.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.matchers.base import Matcher, all_column_pairs, as_match_df
from repro.table import Table, distinct_values


def _prep(table: Table, side: str, max_values: int) -> DataFrame:
    """Distinct, lowercased, non-empty values with block keys exploded."""
    dv = (
        distinct_values(table, max_values=max_values)
        .select(F.col("col").alias(f"{side}col"),
                F.lower(F.trim(F.col("value"))).alias(f"{side}v"))
        .where(F.length(f"{side}v") > 0)
        .distinct()
    )
    v = F.col(f"{side}v")
    return dv.withColumn(
        "bkey",
        F.explode(F.array_distinct(F.array(
            F.concat(F.lit("f:"), F.substring(v, 1, 1)),
            F.concat(F.lit("l:"), F.substring(v, -1, 1)),
        ))),
    )


class JaccardLevenshteinMatcher(Matcher):
    """Fuzzy-Jaccard column similarity with a Levenshtein value test."""

    name = "jaccard_levenshtein"

    def __init__(self, threshold: float = 0.5, max_values: int = 1000):
        if not 0.0 <= threshold <= 1.0:
            raise ValueError(f"threshold must be in [0,1], got {threshold}")
        self.threshold = threshold
        self.max_values = max_values

    def params(self) -> dict:
        return {"threshold": self.threshold}

    def match(self, spark: SparkSession, source: Table,
              target: Table) -> pd.DataFrame:
        sv = _prep(source, "s", self.max_values)
        tv = _prep(target, "t", self.max_values)

        # per-column distinct-value counts (denominator of Jaccard)
        s_sizes = dict(
            sv.select("scol", "sv").distinct().groupBy("scol").count().collect()
        )
        t_sizes = dict(
            tv.select("tcol", "tv").distinct().groupBy("tcol").count().collect()
        )

        t = self.threshold
        max_len = F.greatest(F.length("sv"), F.length("tv"))
        cand = (
            sv.join(tv, on="bkey")
            .where(F.abs(F.length("sv") - F.length("tv")) <= max_len * t)
            .select("scol", "tcol", "sv", "tv")
            .distinct()
            .where(F.levenshtein("sv", "tv") <= max_len * t)
        )
        # |I| estimated symmetrically: a source value counts as matched if
        # it fuzzily hits >=1 target value, and vice versa.
        inter = (
            cand.groupBy("scol", "tcol")
            .agg(F.countDistinct("sv").alias("m_s"),
                 F.countDistinct("tv").alias("m_t"))
            .withColumn("inter", (F.col("m_s") + F.col("m_t")) / 2.0)
            .collect()
        )
        inter_map = {(r["scol"], r["tcol"]): r["inter"] for r in inter}

        rows = []
        for s, tcol in all_column_pairs(source, target):
            i = inter_map.get((s, tcol), 0.0)
            union = s_sizes.get(s, 0) + t_sizes.get(tcol, 0) - i
            # cap at 1.0: the symmetric estimate can slightly exceed the
            # true intersection when one value fuzzily hits several
            rows.append((s, tcol, min(1.0, i / union) if union > 0 else 0.0))
        return as_match_df(rows)

"""EmbDI matcher (paper §VI-A, [20] — Cappuzzo et al., SIGMOD'20).

EmbDI builds *local* relational embeddings: both tables become one
tripartite graph (row ids ↔ cell values ↔ column ids, value nodes
shared across the two tables), random walks over the graph form
"sentences", and word embeddings trained on those sentences place
columns whose values co-occur in similar contexts close together.
Schema matches are the most-cosine-similar column pairs.

Reproduction layout (DESIGN.md §5/§6):
* walk generation is driver-side over the collected (capped) cell
  triples — the paper itself notes this stage "does not scale
  efficiently", and EmbDI is the slowest method of Table IV;
* window co-occurrence counting over the walk corpus is Spark dataflow
  (posexplode + bounded self-join + groupBy count);
* word2vec training is replaced by its closed-form analogue, PPMI +
  truncated SVD (``repro.embeddings.ppmi_svd``).

Table II parameters: ``sentence_length`` 60, ``window_size`` 3,
``n_dimensions`` 300 (capped by the matrix rank).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession, Window
from pyspark.sql import functions as F

from repro.embeddings.ppmi_svd import cosine, svd_embed
from repro.matchers.base import Matcher, as_match_df
from repro.table import Table


def _cells(spark: SparkSession, table: Table, side: str,
           max_rows: int) -> pd.DataFrame:
    """Collected (rid, col, token) triples of a deterministically capped
    row sample; value tokens are shared across tables (``v__`` prefix)."""
    df = table.df
    w = Window.orderBy(F.xxhash64(*[F.col(c).cast("string")
                                    for c in df.columns]))
    capped = (df.withColumn("_rid", F.row_number().over(w))
              .where(F.col("_rid") <= max_rows))
    quoted = ", ".join(f"'{c}', cast(`{c}` as string)" for c in df.columns)
    melted = capped.select(
        F.concat(F.lit(f"r__{side}__"), F.col("_rid").cast("string")
                 ).alias("rid"),
        F.expr(f"stack({len(df.columns)}, {quoted}) as (col, value)"),
    ).where(F.col("value").isNotNull())
    # EmbDI tokenizes cell values: every word of a (short) multi-word
    # cell becomes its own shared value node, so re-encoded values that
    # keep some words ("elvis presley" vs "elvis aaron presley") still
    # bridge the two datasets.
    words = F.slice(F.split(F.lower(F.trim("value")), r"[\s,;/()]+"), 1, 4)
    out = melted.select(
        "rid",
        F.concat(F.lit(f"cid__{side}__"), "col").alias("cid"),
        F.explode(words).alias("word"),
    ).where(F.length("word") > 0).select(
        "rid", "cid", F.concat(F.lit("v__"), "word").alias("token"),
    ).toPandas()
    return out


class EmbDIMatcher(Matcher):
    """Local relational embeddings from random walks over a value graph."""

    name = "embdi"

    def __init__(self, n_dimensions: int = 300, window_size: int = 3,
                 sentence_length: int = 60, walks_per_start: int = 3,
                 max_rows: int = 1500, max_starts: int = 1500,
                 seed: int = 0):
        self.n_dimensions = n_dimensions
        self.window_size = window_size
        self.sentence_length = sentence_length
        self.walks_per_start = walks_per_start
        self.max_rows = max_rows
        self.max_starts = max_starts
        self.seed = seed

    def params(self) -> dict:
        return {"n_dimensions": self.n_dimensions,
                "window_size": self.window_size,
                "sentence_length": self.sentence_length}

    # ------------------------------------------------------------ walks
    def _walks(self, cells: pd.DataFrame) -> list[list[str]]:
        """Seeded random walks value → column → value over the graph."""
        occ: dict[str, list[tuple[str, str]]] = {}
        row_cells: dict[str, list[tuple[str, str]]] = {}
        for rid, cid, tok in zip(cells["rid"], cells["cid"], cells["token"]):
            occ.setdefault(tok, []).append((rid, cid))
            row_cells.setdefault(rid, []).append((cid, tok))

        g = np.random.default_rng(self.seed)
        starts = sorted(occ)
        if len(starts) > self.max_starts:
            idx = g.choice(len(starts), size=self.max_starts, replace=False)
            starts = [starts[i] for i in sorted(idx)]

        sentences: list[list[str]] = []
        for start in starts:
            for _ in range(self.walks_per_start):
                sent = [start]
                v = start
                while len(sent) < self.sentence_length:
                    occs = occ.get(v)
                    if not occs:
                        break
                    rid, cid = occs[int(g.integers(0, len(occs)))]
                    cand = row_cells[rid]
                    cid2, v2 = cand[int(g.integers(0, len(cand)))]
                    sent.extend((cid, rid, cid2, v2))
                    v = v2
                sentences.append(sent[: self.sentence_length])
        return sentences

    # ------------------------------------------------------------- match
    def match(self, spark: SparkSession, source: Table,
              target: Table) -> pd.DataFrame:
        cells = pd.concat([
            _cells(spark, source, "a", self.max_rows),
            _cells(spark, target, "b", self.max_rows),
        ], ignore_index=True)
        sentences = self._walks(cells)

        # ---- window co-occurrence counting in Spark ----
        sent_df = spark.createDataFrame(
            pd.DataFrame({"sid": range(len(sentences)),
                          "tokens": sentences}))
        pos = sent_df.select(
            "sid", F.posexplode("tokens").alias("pos", "token"))
        left = pos.select("sid", F.col("pos").alias("p1"),
                          F.col("token").alias("w"))
        right = pos.select("sid", F.col("pos").alias("p2"),
                           F.col("token").alias("c"))
        joined = left.join(right, on="sid").where(
            (F.col("p2") > F.col("p1"))
            & (F.col("p2") - F.col("p1") <= self.window_size))
        # symmetric counts: each ordered pair counts for both directions
        cooc = (
            joined.select("w", "c")
            .unionAll(joined.select(F.col("c").alias("w"),
                                    F.col("w").alias("c")))
            .groupBy("w", "c").agg(F.count("*").alias("n"))
        )
        cooc.persist()
        try:
            total = cooc.agg(F.sum("n")).first()[0] or 0
            pw_rows = (cooc.where(F.col("w").startswith("cid__"))
                       .groupBy("w").agg(F.sum("n").alias("nw")).collect())
            pc_pdf = cooc.groupBy("c").agg(F.sum("n").alias("nc")).toPandas()
            sub = cooc.where(F.col("w").startswith("cid__")).toPandas()
        finally:
            cooc.unpersist()

        col_tokens = ([f"cid__a__{c}" for c in source.columns]
                      + [f"cid__b__{c}" for c in target.columns])
        if total == 0 or sub.empty:
            return as_match_df([(s, t, 0.0) for s in source.columns
                                for t in target.columns])

        # ---- PPMI over the column-token rows, with global marginals ----
        pw = {r["w"]: r["nw"] / total for r in pw_rows}
        pc = dict(zip(pc_pdf["c"], pc_pdf["nc"] / total))
        contexts = sorted(pc)
        c_idx = {c: j for j, c in enumerate(contexts)}
        r_idx = {w: i for i, w in enumerate(col_tokens)}
        M = np.zeros((len(col_tokens), len(contexts)))
        for w, c, n in zip(sub["w"], sub["c"], sub["n"]):
            if w not in r_idx:
                continue
            pmi = np.log((n / total) / (pw[w] * pc[c]))
            if pmi > 0:
                M[r_idx[w], c_idx[c]] = pmi

        vecs = svd_embed(M, self.n_dimensions)
        rows = []
        for i, s in enumerate(source.columns):
            vs = vecs[i]
            for j, t in enumerate(target.columns):
                vt = vecs[len(source.columns) + j]
                rows.append((s, t, max(0.0, cosine(vs, vt))))
        return as_match_df(rows)

"""Similarity Flooding matcher (paper §VI-A, [16]).

Schemata become directed labeled graphs (``table --column--> column
--type--> type`` plus ``--name--> literal`` nodes); the two graphs are
combined into a *pairwise connectivity graph* whose map pairs propagate
similarity to their neighbours until fixpoint.

Reproduction notes, mirroring the paper's own modifications:
* initial similarities use Levenshtein ratio over node labels — the
  paper also had to pick its own string similarity ("there are no
  details on the actual function that the authors used");
* propagation coefficients: ``inverse_average`` (Table II);
* fixpoint formula **C** of Melnik et al.:
  σ(i+1) = normalize(σ0 + σi + φ(σ0 + σi)).

The pairwise connectivity graph is *constructed* as Spark DataFrame
dataflow (edge-label joins + degree aggregation); the fixpoint itself
runs on the driver over the resulting (small, O(|cols|²)-node) graph,
since one iteration is a sparse matrix-vector product.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.lexicon.thesaurus import levenshtein_ratio
from repro.matchers.base import Matcher, as_match_df
from repro.table import Table


def schema_graph(table: Table, prefix: str) -> tuple[list[tuple[str, str]],
                                                     list[tuple[str, str, str]]]:
    """Nodes (id, label) and labeled edges (src, label, dst) of one schema."""
    tid = f"{prefix}:table"
    nodes = [(tid, table.name)]
    edges: list[tuple[str, str, str]] = []
    for c in table.columns:
        cid = f"{prefix}:col:{c}"
        nodes.append((cid, c))
        edges.append((tid, "column", cid))
        ty = table.column_types[c]
        ty_id = f"{prefix}:type:{ty}"
        if (ty_id, ty) not in nodes:
            nodes.append((ty_id, ty))
        edges.append((cid, "type", ty_id))
    return nodes, edges


class SimilarityFloodingMatcher(Matcher):
    """Graph similarity propagation with inverse-average coefficients."""

    name = "similarity_flooding"

    def __init__(self, max_iterations: int = 50, epsilon: float = 1e-3,
                 propagation: str = "inverse_average",
                 fixpoint: str = "C"):
        if propagation != "inverse_average":
            raise ValueError("only inverse_average coefficients implemented")
        if fixpoint != "C":
            raise ValueError("only fixpoint formula C implemented")
        self.max_iterations = max_iterations
        self.epsilon = epsilon

    def params(self) -> dict:
        return {"propagation": "inverse_average", "fixpoint": "C"}

    def match(self, spark: SparkSession, source: Table,
              target: Table) -> pd.DataFrame:
        nodes1, edges1 = schema_graph(source, "a")
        nodes2, edges2 = schema_graph(target, "b")

        # ---- pairwise connectivity graph via Spark edge-label joins ----
        e1 = spark.createDataFrame(
            pd.DataFrame(edges1, columns=["s1", "label", "d1"]))
        e2 = spark.createDataFrame(
            pd.DataFrame(edges2, columns=["s2", "label", "d2"]))
        pcg = (
            e1.join(e2, on="label")
            .select(
                F.concat_ws("|", "s1", "s2").alias("src_pair"),
                F.concat_ws("|", "d1", "d2").alias("dst_pair"),
                "label",
                F.col("s1"), F.col("s2"), F.col("d1"), F.col("d2"),
            )
        )
        # inverse-average coefficients per direction: the forward weight of
        # a pcg edge divides by the mean out-degree (for that label) of its
        # endpoints; the backward weight by the mean in-degree.
        out1 = e1.groupBy("s1", "label").agg(F.count("*").alias("od1"))
        out2 = e2.groupBy("s2", "label").agg(F.count("*").alias("od2"))
        in1 = e1.groupBy("d1", "label").agg(F.count("*").alias("id1"))
        in2 = e2.groupBy("d2", "label").agg(F.count("*").alias("id2"))
        pcg = (
            pcg.join(out1, on=["s1", "label"])
            .join(out2, on=["s2", "label"])
            .join(in1, on=["d1", "label"])
            .join(in2, on=["d2", "label"])
            .select(
                "src_pair", "dst_pair",
                (2.0 / (F.col("od1") + F.col("od2"))).alias("w_fwd"),
                (2.0 / (F.col("id1") + F.col("id2"))).alias("w_bwd"),
            )
        ).toPandas()

        # ---- initial similarity over same-kind node pairs ----
        def kind(nid: str) -> str:
            return nid.split(":")[1]

        labels1 = dict(nodes1)
        labels2 = dict(nodes2)
        pair_ids = [f"{n1}|{n2}" for n1 in labels1 for n2 in labels2
                    if kind(n1) == kind(n2)]
        idx = {p: i for i, p in enumerate(pair_ids)}
        sigma0 = np.zeros(len(pair_ids))
        for p, i in idx.items():
            n1, n2 = p.split("|")
            sigma0[i] = levenshtein_ratio(labels1[n1].lower(),
                                          labels2[n2].lower())

        # ---- sparse propagation structure (both directions) ----
        src_idx, dst_idx, weights = [], [], []
        for r in pcg.itertuples(index=False):
            if r.src_pair in idx and r.dst_pair in idx:
                src_idx.append(idx[r.src_pair])
                dst_idx.append(idx[r.dst_pair])
                weights.append(r.w_fwd)
                src_idx.append(idx[r.dst_pair])
                dst_idx.append(idx[r.src_pair])
                weights.append(r.w_bwd)
        src_a = np.asarray(src_idx, dtype=np.int64)
        dst_a = np.asarray(dst_idx, dtype=np.int64)
        w_a = np.asarray(weights)

        # ---- fixpoint C: sigma' = normalize(s0 + s + phi(s0 + s)) ----
        sigma = sigma0.copy()
        for _ in range(self.max_iterations):
            base = sigma0 + sigma
            phi = np.zeros_like(sigma)
            np.add.at(phi, dst_a, w_a * base[src_a])
            new = base + phi
            m = new.max()
            if m > 0:
                new = new / m
            if np.abs(new - sigma).max() < self.epsilon:
                sigma = new
                break
            sigma = new

        rows = []
        for s in source.columns:
            for t in target.columns:
                p = f"a:col:{s}|b:col:{t}"
                rows.append((s, t, float(sigma[idx[p]])))
        return as_match_df(rows)

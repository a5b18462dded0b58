"""Per-table / per-figure experiment harnesses (paper §VII).

Each ``*_results`` function reproduces one evaluation artifact:

* :func:`table3_results`  — Table III (Recall@GT on Magellan / ING#1 / ING#2)
* :func:`table4_results`  — Table IV (average runtime per method)
* :func:`fig4_results`    — Fig. 4 data (schema-based methods, noisy schemata)
* :func:`fig5_results`    — Fig. 5 data (instance-based methods)
* :func:`fig6_results`    — Fig. 6 data (hybrid methods)
* :func:`fig7_results`    — Fig. 7 data (WikiData pairs)

All take a :class:`Scale` preset; ``TEST`` keeps everything tiny for
unit tests, ``BENCH`` is what the benchmark harness and the jobs run
(reduced relative to the paper's 75K-experiment sweep — reductions are
spelled out in EXPERIMENTS.md).
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import SparkSession

from repro.fabrication.scenarios import DatasetPair, pair_census
from repro.matchers import (
    ComaMatcher,
    CupidMatcher,
    DistributionBasedMatcher,
    EmbDIMatcher,
    JaccardLevenshteinMatcher,
    SimilarityFloodingMatcher,
)
from repro.suite import grids
from repro.suite.aggregate import mean_runtime, min_median_max
from repro.suite.runner import best_per_pair, run_experiments
from repro.valentine_data.ing import ing1, ing2
from repro.valentine_data.magellan import magellan_pairs
from repro.valentine_data.ontology import efo_like_ontology
from repro.valentine_data.sources import (
    chembl_assays,
    opendata_table,
    tpcdi_prospect,
)
from repro.valentine_data.wikidata import wikidata_pairs


@dataclass(frozen=True)
class Scale:
    """Size preset for one harness run."""

    n_rows: int                     # fabrication-source rows
    max_values: int                 # per-column distinct-value cap
    magellan_scale: float           # row multiplier for Magellan pairs
    ing_rows: int                   # ING row count (both pairs)
    wikidata_rows: int
    embdi_rows: int                 # EmbDI row / walk-start cap
    row_overlaps: tuple = (0.5,)
    column_overlaps: tuple = (0.5,)
    noise_combos: tuple = ((False, False), (True, False),
                           (False, True), (True, True))
    jl_thresholds: tuple = (0.4, 0.6)
    dist_thetas: tuple = ((0.15, 0.15), (0.4, 0.4))
    cupid_reduced: bool = True


TEST = Scale(n_rows=120, max_values=200, magellan_scale=0.1, ing_rows=120,
             wikidata_rows=120, embdi_rows=150,
             noise_combos=((True, False), (True, True)),
             jl_thresholds=(0.4,), dist_thetas=((0.15, 0.15),))

BENCH = Scale(n_rows=600, max_values=500, magellan_scale=0.5, ing_rows=500,
              wikidata_rows=600, embdi_rows=600)


def _sources(spark: SparkSession, scale: Scale):
    return [tpcdi_prospect(spark, n_rows=scale.n_rows),
            opendata_table(spark, n_rows=scale.n_rows),
            chembl_assays(spark, n_rows=scale.n_rows)]


def _census(spark: SparkSession, scale: Scale,
            sources=None) -> list[DatasetPair]:
    out = []
    for tbl in (sources if sources is not None else _sources(spark, scale)):
        out.extend(pair_census(
            tbl, row_overlaps=scale.row_overlaps,
            column_overlaps=scale.column_overlaps,
            noise_combos=scale.noise_combos))
    return out


# ------------------------------------------------------------ method sets
def _schema_methods(scale: Scale):
    return (grids.cupid_grid(reduced=scale.cupid_reduced)
            + [SimilarityFloodingMatcher()]
            + [ComaMatcher("schema", max_values=scale.max_values)])


def _instance_methods(scale: Scale):
    return ([ComaMatcher("instance", max_values=scale.max_values)]
            + [DistributionBasedMatcher(theta1=a, theta2=b,
                                        max_values=scale.max_values)
               for a, b in scale.dist_thetas]
            + [JaccardLevenshteinMatcher(t, max_values=scale.max_values)
               for t in scale.jl_thresholds])


def _table3_methods(scale: Scale):
    """The seven Table III rows (SemProp excluded, as in the paper)."""
    return ([CupidMatcher(), SimilarityFloodingMatcher(),
             ComaMatcher("schema", max_values=scale.max_values),
             ComaMatcher("instance", max_values=scale.max_values)]
            + [DistributionBasedMatcher(theta1=a, theta2=b,
                                        max_values=scale.max_values)
               for a, b in scale.dist_thetas]
            + [JaccardLevenshteinMatcher(t, max_values=scale.max_values)
               for t in scale.jl_thresholds]
            + [EmbDIMatcher(max_rows=scale.embdi_rows,
                            max_starts=scale.embdi_rows)])


#: canonical Table III / IV row labels per matcher name.
METHOD_LABELS = {
    "cupid": "Cupid",
    "similarity_flooding": "Similarity Flooding",
    "coma_schema": "COMA Schema-based",
    "coma_instance": "COMA Instance-based",
    "distribution_based": "Distribution-based",
    "jaccard_levenshtein": "Jaccard Levenshtein",
    "embdi": "EmbDI",
    "semprop": "SemProp",
}


# ---------------------------------------------------------------- Table III
def table3_results(spark: SparkSession, scale: Scale = BENCH) -> pd.DataFrame:
    """Recall@GT per method on Magellan (mean of 7 pairs), ING#1, ING#2."""
    pairs = (magellan_pairs(spark, scale=scale.magellan_scale)
             + [ing1(spark, n_rows=(scale.ing_rows, scale.ing_rows + 40)),
                ing2(spark, n_rows=scale.ing_rows)])
    raw = run_experiments(spark, _table3_methods(scale), pairs)
    best = best_per_pair(raw)
    best["dataset"] = best["pair"].map(
        lambda p: "Magellan" if p.startswith("magellan")
        else ("ING#1" if p == "ing#1" else "ING#2"))
    table = (best.groupby(["method", "dataset"])["recall"].mean()
             .unstack("dataset").reset_index())
    table["method"] = table["method"].map(METHOD_LABELS).fillna(table["method"])
    return table[["method", "Magellan", "ING#1", "ING#2"]]


# ---------------------------------------------------------------- Table IV
def table4_results(spark: SparkSession, scale: Scale = BENCH) -> pd.DataFrame:
    """Average runtime (s) per method over a standard pair set.

    One configuration per method (runtime does not depend on thresholds
    to first order); SemProp runs on the ChEMBL-derived pairs only, as
    in the paper.
    """
    tpcdi = tpcdi_prospect(spark, n_rows=scale.n_rows)
    chembl = chembl_assays(spark, n_rows=scale.n_rows)
    common = _census(spark, scale, sources=[tpcdi])
    chembl_pairs = _census(spark, scale, sources=[chembl])
    methods = [
        CupidMatcher(), SimilarityFloodingMatcher(),
        ComaMatcher("schema", max_values=scale.max_values),
        ComaMatcher("instance", max_values=scale.max_values),
        DistributionBasedMatcher(max_values=scale.max_values),
        JaccardLevenshteinMatcher(0.4, max_values=scale.max_values),
        EmbDIMatcher(max_rows=scale.embdi_rows, max_starts=scale.embdi_rows),
    ]
    raw = run_experiments(spark, methods, common)
    sem = run_experiments(
        spark, [grids.semprop_grid(efo_like_ontology(), reduced=True,
                                   max_values=scale.max_values)[0]],
        chembl_pairs)
    out = mean_runtime(pd.concat([raw, sem], ignore_index=True))
    out["method"] = out["method"].map(METHOD_LABELS).fillna(out["method"])
    return out


# ------------------------------------------------------------- Fig. 4 data
def fig4_results(spark: SparkSession, scale: Scale = BENCH) -> pd.DataFrame:
    """Schema-based methods on noisy-schemata fabricated pairs:
    min/median/max best-config Recall@GT per method × scenario."""
    pairs = [p for p in _census(spark, scale) if p.meta["schema_noise"]]
    raw = run_experiments(spark, _schema_methods(scale), pairs)
    return min_median_max(best_per_pair(raw))


# ------------------------------------------------------------- Fig. 5 data
def fig5_results(spark: SparkSession, scale: Scale = BENCH) -> pd.DataFrame:
    """Instance-based methods over all fabricated pairs, split by
    verbatim vs noisy instances."""
    pairs = _census(spark, scale)
    raw = run_experiments(spark, _instance_methods(scale), pairs)
    return min_median_max(best_per_pair(raw),
                          by=("method", "scenario", "instance_noise"))


# ------------------------------------------------------------- Fig. 6 data
def fig6_results(spark: SparkSession, scale: Scale = BENCH) -> pd.DataFrame:
    """Hybrid methods: EmbDI over all three sources; SemProp over the
    ChEMBL-derived pairs only (it needs the domain ontology)."""
    pairs = _census(spark, scale)
    embdi = run_experiments(
        spark, [EmbDIMatcher(max_rows=scale.embdi_rows,
                             max_starts=scale.embdi_rows)], pairs)
    chembl = chembl_assays(spark, n_rows=scale.n_rows)
    sem_pairs = _census(spark, scale, sources=[chembl])
    sem = run_experiments(
        spark, grids.semprop_grid(efo_like_ontology(), reduced=True,
                                  max_values=scale.max_values), sem_pairs)
    raw = pd.concat([embdi, sem], ignore_index=True)
    best = best_per_pair(raw)
    best["noisy"] = best["schema_noise"] | best["instance_noise"]
    return min_median_max(best, by=("method", "scenario", "noisy"))


# ------------------------------------------------------------- Fig. 7 data
def fig7_results(spark: SparkSession, scale: Scale = BENCH) -> pd.DataFrame:
    """All (non-SemProp) methods on the four WikiData scenario pairs."""
    pairs = list(wikidata_pairs(spark, n_rows=scale.wikidata_rows).values())
    raw = run_experiments(spark, _table3_methods(scale), pairs)
    best = best_per_pair(raw)
    table = (best.groupby(["method", "scenario"])["recall"].mean()
             .unstack("scenario").reset_index())
    table["method"] = table["method"].map(METHOD_LABELS).fillna(table["method"])
    return table

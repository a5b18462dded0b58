"""Exhaustive experiment runner (paper Figure 1, right-hand box).

Executes every (method configuration × dataset pair) combination,
recording Recall@GroundTruth and wall-clock runtime per run, and offers
the grid-search reduction the paper applies ("grid search allows each
algorithm to operate under optimal conditions"): the best recall per
(method, pair) over all configurations.
"""
from __future__ import annotations

import time
from dataclasses import asdict, dataclass

import pandas as pd
from pyspark.sql import SparkSession

from repro.fabrication.scenarios import DatasetPair
from repro.matchers.base import Matcher
from repro.metrics import recall_at_ground_truth


@dataclass(frozen=True)
class ExperimentRecord:
    """One executed run: a method configuration applied to one pair."""

    method: str
    config: str
    pair: str
    scenario: str
    schema_noise: bool
    instance_noise: bool
    gt_size: int
    recall: float
    runtime_s: float


def run_one(spark: SparkSession, matcher: Matcher,
            pair: DatasetPair) -> ExperimentRecord:
    """Run a single matcher on a single pair, timing the match call."""
    t0 = time.perf_counter()
    result = matcher.match(spark, pair.source, pair.target)
    elapsed = time.perf_counter() - t0
    return ExperimentRecord(
        method=matcher.name,
        config=matcher.describe(),
        pair=pair.name,
        scenario=pair.scenario,
        schema_noise=bool(pair.meta.get("schema_noise", False)),
        instance_noise=bool(pair.meta.get("instance_noise", False)),
        gt_size=len(pair.ground_truth),
        recall=recall_at_ground_truth(result, set(pair.ground_truth)),
        runtime_s=elapsed,
    )


def run_experiments(spark: SparkSession, matchers: list[Matcher],
                    pairs: list[DatasetPair], *,
                    progress: bool = False) -> pd.DataFrame:
    """Run the full cross product; one row per executed experiment."""
    records = []
    total = len(matchers) * len(pairs)
    for i, m in enumerate(matchers):
        for j, p in enumerate(pairs):
            records.append(asdict(run_one(spark, m, p)))
            if progress:
                done = i * len(pairs) + j + 1
                print(f"\r[runner] {done}/{total} {m.describe()}",
                      end="", flush=True)
    if progress:
        print()
    return pd.DataFrame(records)


def best_per_pair(results: pd.DataFrame) -> pd.DataFrame:
    """Grid-search reduction: per (method, pair) the best-config recall.

    Runtime is summed over the grid (the cost actually paid to find the
    best configuration); scenario/noise columns are carried through.
    """
    keys = ["method", "pair", "scenario", "schema_noise", "instance_noise",
            "gt_size"]
    return (
        results.groupby(keys, as_index=False)
        .agg(recall=("recall", "max"), runtime_s=("runtime_s", "sum"),
             n_configs=("config", "nunique"))
    )

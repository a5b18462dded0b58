"""Aggregations behind the paper's result presentations.

Figures 4–6 report the minimum / median / maximum Recall@GroundTruth of
each method over a set of dataset pairs (after grid search); Table IV
reports mean runtime per method.
"""
from __future__ import annotations

import pandas as pd


def min_median_max(results: pd.DataFrame,
                   by: tuple[str, ...] = ("method", "scenario"),
                   value: str = "recall") -> pd.DataFrame:
    """min/median/max of ``value`` per group — the figures' box summary."""
    g = results.groupby(list(by))[value]
    return g.agg(min="min", median="median", max="max").reset_index()


def mean_runtime(results: pd.DataFrame) -> pd.DataFrame:
    """Average runtime per method over all runs (paper Table IV)."""
    return (results.groupby("method", as_index=False)["runtime_s"]
            .mean().rename(columns={"runtime_s": "avg_runtime_s"})
            .sort_values("avg_runtime_s").reset_index(drop=True))

"""Effectiveness metrics for ranked schema matches (paper §II-C).

The paper's single effectiveness metric is ``Recall@k`` with
``k = |ground_truth|`` (a.k.a. R-Precision): the fraction of the top-k
ranked column pairs that are in the ground truth. Because k equals the
ground-truth size, Recall@k == Precision@k, so one number suffices.
"""
from __future__ import annotations

import pandas as pd

#: A match is an ordered pair (source_column, target_column).
MatchPair = tuple[str, str]


def ranked_pairs(matches: pd.DataFrame) -> list[MatchPair]:
    """Deterministic ranking of a matcher's output DataFrame.

    ``matches`` must have columns ``source_col``, ``target_col``,
    ``score``. Sorted by score descending; ties broken lexicographically
    so rankings are stable across runs and partitionings.
    """
    need = {"source_col", "target_col", "score"}
    missing = need - set(matches.columns)
    if missing:
        raise ValueError(f"match output missing columns: {sorted(missing)}")
    ordered = matches.sort_values(
        ["score", "source_col", "target_col"],
        ascending=[False, True, True],
        kind="mergesort",
    )
    return list(zip(ordered["source_col"], ordered["target_col"]))


def recall_at_k(matches: pd.DataFrame, ground_truth: set[MatchPair], k: int) -> float:
    """``|top-k ∩ ground_truth| / k`` over the ranked match list."""
    if k <= 0:
        raise ValueError(f"k must be positive, got {k}")
    top = ranked_pairs(matches)[:k]
    return len(set(top) & set(ground_truth)) / k


def recall_at_ground_truth(matches: pd.DataFrame,
                           ground_truth: set[MatchPair]) -> float:
    """The paper's headline metric: Recall@k with k = |ground_truth|."""
    if not ground_truth:
        raise ValueError("ground truth is empty")
    return recall_at_k(matches, ground_truth, len(ground_truth))

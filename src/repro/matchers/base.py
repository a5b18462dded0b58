"""Matcher protocol and shared output conventions.

A matcher maps a (source, target) table pair to a pandas DataFrame with
columns ``source_col``, ``target_col``, ``score`` — one row per scored
column pair, higher scores first after ranking (``repro.metrics``).
Heavy per-value work happens inside ``match`` as Spark dataflow; the
output is at most |cols|×|cols| rows and lives on the driver.
"""
from __future__ import annotations

import abc
from typing import Iterable

import pandas as pd
from pyspark.sql import SparkSession

from repro.table import Table


class Matcher(abc.ABC):
    """Base class for all schema matching methods."""

    #: short method identifier used in experiment results
    name: str = "matcher"

    @abc.abstractmethod
    def match(self, spark: SparkSession, source: Table,
              target: Table) -> pd.DataFrame:
        """Score column pairs; returns [source_col, target_col, score]."""

    def params(self) -> dict:
        """The configuration that identifies this run (for Table II grids)."""
        return {}

    def describe(self) -> str:
        p = ",".join(f"{k}={v}" for k, v in sorted(self.params().items()))
        return f"{self.name}({p})"


def as_match_df(rows: Iterable[tuple[str, str, float]]) -> pd.DataFrame:
    """Normalize raw (source, target, score) triples into the output form."""
    df = pd.DataFrame(rows, columns=["source_col", "target_col", "score"])
    df["score"] = df["score"].astype(float)
    return df.sort_values(
        ["score", "source_col", "target_col"], ascending=[False, True, True],
        kind="mergesort",
    ).reset_index(drop=True)


def all_column_pairs(source: Table, target: Table) -> list[tuple[str, str]]:
    """The full cross product of column names (deterministic order)."""
    return [(s, t) for s in source.columns for t in target.columns]

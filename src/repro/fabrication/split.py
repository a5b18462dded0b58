"""Horizontal and vertical table splits with controlled overlap (§IV).

Row assignment is a pure function of row *content* (a hash over all
columns), never of partitioning, so splits are reproducible and the
DuckDB oracle can verify the algebra (A ∪ B ⊇ source, overlap fraction,
zero-overlap disjointness).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def _row_uniform(df: DataFrame, seed: int):
    """Deterministic per-row uniform in [0, 1) from a full-row hash."""
    h = F.xxhash64(*[F.col(c).cast("string") for c in df.columns], F.lit(seed))
    return F.pmod(h, F.lit(1_000_000)) / 1_000_000.0


def split_horizontal(df: DataFrame, *, row_overlap: float,
                     seed: int = 0) -> tuple[DataFrame, DataFrame]:
    """Split rows into two tables sharing ``row_overlap`` of the rows.

    Rows with u < ``row_overlap`` go to **both** sides; the remainder is
    split evenly between the two. ``row_overlap`` = 0 yields disjoint
    halves; 1 yields two copies.
    """
    if not 0.0 <= row_overlap <= 1.0:
        raise ValueError(f"row_overlap must be in [0,1], got {row_overlap}")
    u = _row_uniform(df, seed)
    half = row_overlap + (1.0 - row_overlap) / 2.0
    a = df.where((u < row_overlap) | ((u >= row_overlap) & (u < half)))
    b = df.where((u < row_overlap) | (u >= half))
    return a, b


def split_vertical_columns(columns: list[str], *, column_overlap: float,
                           seed: int = 0, min_shared: int = 1,
                           ) -> tuple[list[str], list[str], list[str]]:
    """Partition columns into (side-A columns, side-B columns, shared).

    ``column_overlap`` is the fraction of columns shared by both sides
    (at least ``min_shared``); the remaining columns are split evenly
    and exclusively. Column order within each side follows the source
    schema. Returns ``(cols_a, cols_b, shared)`` with shared ⊆ both.
    """
    if not 0.0 <= column_overlap <= 1.0:
        raise ValueError(f"column_overlap must be in [0,1], got {column_overlap}")
    if len(columns) < 2:
        raise ValueError("need at least 2 columns to split vertically")
    g = np.random.default_rng(seed)
    n_shared = max(min_shared, round(column_overlap * len(columns)))
    n_shared = min(n_shared, len(columns))
    perm = list(g.permutation(len(columns)))
    shared_idx = set(perm[:n_shared])
    rest = perm[n_shared:]
    a_only = set(rest[: len(rest) // 2])
    b_only = set(rest[len(rest) // 2:])
    cols_a = [c for i, c in enumerate(columns) if i in shared_idx or i in a_only]
    cols_b = [c for i, c in enumerate(columns) if i in shared_idx or i in b_only]
    shared = [c for i, c in enumerate(columns) if i in shared_idx]
    return cols_a, cols_b, shared

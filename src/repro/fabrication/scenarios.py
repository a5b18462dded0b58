"""The four dataset-relatedness scenarios of §III, as pair fabricators.

Each ``make_*`` function takes an original :class:`~repro.table.Table`
and returns a :class:`DatasetPair` — two derived tables plus the ground
truth that falls out of the split bookkeeping:

* **unionable** — horizontal split, varying row overlap; GT = all
  column correspondences.
* **view-unionable** — horizontal (zero row overlap) + vertical split,
  varying column overlap; GT = shared columns.
* **joinable** — vertical split with varying shared columns, full or
  50% row overlap, verbatim instances only; GT = shared columns.
* **semantically-joinable** — joinable + noisy instances on the target
  side, so an equality join no longer reconstructs the source.

Noise placement follows the paper: when schema or instance noise is on,
it is applied to **one** side (the target), and the ground truth is
expressed against the noisy names.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import types as T

from repro.fabrication.noise import (
    rename_with_noise,
    with_numeric_noise,
    with_string_noise,
)
from repro.fabrication.split import split_horizontal, split_vertical_columns
from repro.table import Table

SCENARIOS = ("unionable", "view_unionable", "joinable", "semantically_joinable")


@dataclass
class DatasetPair:
    """A fabricated matching problem with known ground truth."""

    name: str
    scenario: str
    source: Table
    target: Table
    ground_truth: frozenset[tuple[str, str]]
    meta: dict = field(default_factory=dict)

    def __post_init__(self):
        if self.scenario not in SCENARIOS and not self.meta.get("curated"):
            raise ValueError(f"unknown scenario {self.scenario!r}")
        if not self.ground_truth:
            raise ValueError(f"pair {self.name!r} has empty ground truth")


def _noisy_instances(df, columns, seed):
    """String typos + numeric perturbation on the given columns."""
    str_cols = [f.name for f in df.schema.fields
                if f.name in set(columns) and isinstance(f.dataType, T.StringType)]
    df = with_string_noise(df, str_cols, seed=seed)
    return with_numeric_noise(df, columns, seed=seed + 1)


def _finish(name, scenario, src_tbl, tgt_df, tgt_cols, shared, *,
            schema_noise, instance_noise, seed, meta):
    """Apply target-side noise, rename, and assemble the pair + GT."""
    base = src_tbl.name[:-2] if src_tbl.name.endswith("_s") else src_tbl.name
    tgt_name = f"{base}_t"
    if instance_noise:
        tgt_df = _noisy_instances(tgt_df, tgt_cols, seed + 101)
    mapping = (rename_with_noise(tgt_name, tgt_cols, seed=seed + 202)
               if schema_noise else {c: c for c in tgt_cols})
    tgt_df = tgt_df.select(*[tgt_df[c].alias(mapping[c]) for c in tgt_cols])
    gt = frozenset((c, mapping[c]) for c in shared)
    return DatasetPair(
        name=name,
        scenario=scenario,
        source=src_tbl,
        target=Table(tgt_name, tgt_df),
        ground_truth=gt,
        meta={"schema_noise": schema_noise, "instance_noise": instance_noise,
              "seed": seed, **meta},
    )


def make_unionable(table: Table, *, row_overlap: float = 0.5,
                   schema_noise: bool = True, instance_noise: bool = False,
                   seed: int = 0) -> DatasetPair:
    """Horizontal split: same columns both sides, controlled row overlap."""
    a, b = split_horizontal(table.df, row_overlap=row_overlap, seed=seed)
    src = Table(f"{table.name}_s", a)
    name = (f"{table.name}|unionable|ro={row_overlap}"
            f"|sn={int(schema_noise)}|in={int(instance_noise)}|s={seed}")
    return _finish(name, "unionable", src, b, table.columns, table.columns,
                   schema_noise=schema_noise, instance_noise=instance_noise,
                   seed=seed, meta={"row_overlap": row_overlap})


def make_view_unionable(table: Table, *, column_overlap: float = 0.5,
                        schema_noise: bool = True,
                        instance_noise: bool = False,
                        seed: int = 0) -> DatasetPair:
    """Horizontal (zero row overlap) + vertical split (shared columns)."""
    a, b = split_horizontal(table.df, row_overlap=0.0, seed=seed)
    cols_a, cols_b, shared = split_vertical_columns(
        table.columns, column_overlap=column_overlap, seed=seed + 7)
    src = Table(f"{table.name}_s", a.select(*cols_a))
    name = (f"{table.name}|view_unionable|co={column_overlap}"
            f"|sn={int(schema_noise)}|in={int(instance_noise)}|s={seed}")
    return _finish(name, "view_unionable", src, b, cols_b, shared,
                   schema_noise=schema_noise, instance_noise=instance_noise,
                   seed=seed, meta={"column_overlap": column_overlap})


def make_joinable(table: Table, *, column_overlap: float = 0.5,
                  row_overlap: float = 1.0, schema_noise: bool = True,
                  seed: int = 0) -> DatasetPair:
    """Vertical split with shared join columns; verbatim instances."""
    if row_overlap >= 1.0:
        a = b = table.df
    else:
        a, b = split_horizontal(table.df, row_overlap=row_overlap, seed=seed)
    cols_a, cols_b, shared = split_vertical_columns(
        table.columns, column_overlap=column_overlap, seed=seed + 7)
    src = Table(f"{table.name}_s", a.select(*cols_a))
    name = (f"{table.name}|joinable|co={column_overlap}|ro={row_overlap}"
            f"|sn={int(schema_noise)}|s={seed}")
    return _finish(name, "joinable", src, b, cols_b, shared,
                   schema_noise=schema_noise, instance_noise=False,
                   seed=seed, meta={"column_overlap": column_overlap,
                                    "row_overlap": row_overlap})


def make_semantically_joinable(table: Table, *, column_overlap: float = 0.5,
                               row_overlap: float = 1.0,
                               schema_noise: bool = True,
                               seed: int = 0) -> DatasetPair:
    """Joinable split, but target instances are perturbed with noise."""
    if row_overlap >= 1.0:
        a = b = table.df
    else:
        a, b = split_horizontal(table.df, row_overlap=row_overlap, seed=seed)
    cols_a, cols_b, shared = split_vertical_columns(
        table.columns, column_overlap=column_overlap, seed=seed + 7)
    src = Table(f"{table.name}_s", a.select(*cols_a))
    name = (f"{table.name}|semantically_joinable|co={column_overlap}"
            f"|ro={row_overlap}|sn={int(schema_noise)}|s={seed}")
    return _finish(name, "semantically_joinable", src, b, cols_b, shared,
                   schema_noise=schema_noise, instance_noise=True,
                   seed=seed, meta={"column_overlap": column_overlap,
                                    "row_overlap": row_overlap})


def pair_census(table: Table, *, seed: int = 0,
                row_overlaps=(0.25, 0.5, 0.75),
                column_overlaps=(0.3, 0.5),
                noise_combos=((False, False), (True, False),
                              (False, True), (True, True)),
                ) -> list[DatasetPair]:
    """The reduced fabricated-pair census for one dataset source.

    The paper fabricates 180 pairs per source; we enumerate the same
    axes (scenario × overlap × schema/instance-noise combination) at a
    coarser grid — see EXPERIMENTS.md for the exact counts.
    """
    pairs: list[DatasetPair] = []
    for ro in row_overlaps:
        for sn, inois in noise_combos:
            pairs.append(make_unionable(
                table, row_overlap=ro, schema_noise=sn,
                instance_noise=inois, seed=seed))
    for co in column_overlaps:
        for sn, inois in noise_combos:
            pairs.append(make_view_unionable(
                table, column_overlap=co, schema_noise=sn,
                instance_noise=inois, seed=seed))
    for co in column_overlaps:
        for ro in (1.0, 0.5):
            for sn in (False, True):
                pairs.append(make_joinable(
                    table, column_overlap=co, row_overlap=ro,
                    schema_noise=sn, seed=seed))
                pairs.append(make_semantically_joinable(
                    table, column_overlap=co, row_overlap=ro,
                    schema_noise=sn, seed=seed))
    return pairs

"""Dataset-pair fabrication (paper §IV).

Splits a source table horizontally/vertically with controlled overlap
and injects noise into instances and schemata; the split bookkeeping
yields the ground truth. See ``scenarios`` for the four relatedness
scenarios of §III.
"""
from repro.fabrication.noise import (
    keyboard_typo,
    rename_with_noise,
    with_numeric_noise,
    with_string_noise,
)
from repro.fabrication.split import split_horizontal, split_vertical_columns
from repro.fabrication.scenarios import (
    DatasetPair,
    make_unionable,
    make_view_unionable,
    make_joinable,
    make_semantically_joinable,
    pair_census,
)

__all__ = [
    "keyboard_typo",
    "rename_with_noise",
    "with_numeric_noise",
    "with_string_noise",
    "split_horizontal",
    "split_vertical_columns",
    "DatasetPair",
    "make_unionable",
    "make_view_unionable",
    "make_joinable",
    "make_semantically_joinable",
    "pair_census",
]

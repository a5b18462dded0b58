"""Fabrication dataset sources (stand-ins for TPC-DI / Open Data / ChEMBL).

Each generator returns a :class:`~repro.table.Table` whose *shape*
(column count, row count, type mix) matches the paper's source table;
the fabricator (``repro.fabrication``) then derives the actual matching
challenges, so only shape and value-overlap structure matter here
(DESIGN.md §5). Row counts default to the paper's scale and accept an
``n_rows`` override (tests use a few hundred rows).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.table import Table
from repro.valentine_data import vocab


def _dates(g: np.random.Generator, n: int, start: str, days: int) -> pd.Series:
    return pd.to_datetime(start) + pd.to_timedelta(g.integers(0, days, n), unit="D")


def tpcdi_prospect(spark: SparkSession, *, n_rows: int = 7500,
                   seed: int = 0) -> Table:
    """TPC-DI *Prospect*-like table: 22 columns of customer-prospect data.

    The real table (SF3) has 11–22 columns and 7.5k–15k rows after
    fabrication; we generate the 22-column source it is split from.
    """
    g = np.random.default_rng(seed)
    n = n_rows
    pdf = pd.DataFrame({
        "agency_id": vocab.hex_id(g, n, 10),
        "last_name": g.choice(vocab.LAST_NAMES, n),
        "first_name": g.choice(vocab.FIRST_NAMES, n),
        "middle_initial": g.choice(list("abcdefghijklm"), n),
        "gender": g.choice(["m", "f"], n),
        "address_line1": [f"{num} {st}" for num, st in
                          zip(g.integers(1, 9999, n), g.choice(vocab.STREETS, n))],
        "address_line2": g.choice(["apt 1", "apt 2", "suite 100", "unit b",
                                   "floor 3"], n),
        "postal_code": g.integers(10000, 99999, n).astype(str),
        "city": g.choice(vocab.CITIES, n),
        "state": g.choice(vocab.STATES, n),
        "country": g.choice(vocab.COUNTRIES, n),
        "phone": [f"{a:03d}-{b:03d}-{c:04d}" for a, b, c in
                  zip(g.integers(200, 999, n), g.integers(0, 999, n),
                      g.integers(0, 9999, n))],
        "income": (g.lognormal(10.8, 0.5, n)).round(0),
        "number_cars": g.integers(0, 5, n),
        "number_children": g.integers(0, 6, n),
        "marital_status": g.choice(["single", "married", "divorced",
                                    "widowed"], n),
        "age": g.integers(18, 90, n),
        "credit_rating": g.integers(300, 850, n),
        "own_or_rent": g.choice(["own", "rent"], n),
        "employer": g.choice(vocab.COMPANIES, n),
        "number_credit_cards": g.integers(0, 9, n),
        "net_worth": (g.lognormal(11.5, 1.0, n)).round(0),
    })
    return Table("prospect", spark.createDataFrame(pdf))


def opendata_table(spark: SparkSession, *, n_rows: int = 11628,
                   seed: int = 1) -> Table:
    """Open-Data-style wide table: 51 mixed-type columns.

    Mirrors the Canada/USA/UK open-data table used by the paper (26–51
    columns, 11.6k–23k rows after fabrication): agency/program metadata,
    regional codes, fiscal fields, and a block of numeric measures.
    """
    g = np.random.default_rng(seed)
    n = n_rows
    data: dict[str, object] = {
        "record_id": np.arange(1, n + 1),
        "agency_name": g.choice(vocab.COMPANIES, n),
        "program_name": vocab.phrases(g, n, vocab.SCRUM_WORDS,
                                      vocab.SCRUM_OBJECTS),
        "department": g.choice(vocab.DEPARTMENTS, n),
        "fiscal_year": g.integers(2005, 2021, n),
        "quarter": g.choice(["q1", "q2", "q3", "q4"], n),
        "region": g.choice(vocab.STATES, n),
        "province": g.choice(vocab.CITIES, n),
        "country": g.choice(vocab.COUNTRIES, n),
        "city": g.choice(vocab.CITIES, n),
        "postal_code": g.integers(10000, 99999, n).astype(str),
        "contact_name": g.choice(vocab.FIRST_NAMES, n),
        "contact_phone": [f"{a:03d}-{b:04d}" for a, b in
                          zip(g.integers(200, 999, n), g.integers(0, 9999, n))],
        "status": g.choice(["active", "closed", "pending", "suspended"], n),
        "category": g.choice(vocab.GENRES, n),
        "start_date": _dates(g, n, "2005-01-01", 5000),
        "end_date": _dates(g, n, "2010-01-01", 4000),
        "approved": g.choice(["yes", "no"], n),
        "funding_source": g.choice(["federal", "provincial", "municipal",
                                    "private"], n),
        "grant_code": vocab.hex_id(g, n, 8),
    }
    # numeric measure block (matches open data's many count/amount columns)
    for i in range(1, 16):
        data[f"measure_{i}"] = (g.random(n) * 10 ** (2 + i % 4)).round(2)
    for i in range(1, 9):
        data[f"count_{i}"] = g.integers(0, 10 ** (1 + i % 3 + 1), n)
    for i in range(1, 9):
        data[f"rate_{i}"] = (g.random(n)).round(4)
    pdf = pd.DataFrame(data)
    assert len(pdf.columns) == 51, len(pdf.columns)
    return Table("opendata", spark.createDataFrame(pdf))


def chembl_assays(spark: SparkSession, *, n_rows: int = 7500,
                  seed: int = 2) -> Table:
    """ChEMBL *Assays*-like table: 23 columns of bioassay metadata.

    Column vocabulary is drawn from the same pools that back the
    EFO-like ontology (``repro.valentine_data.ontology``), so SemProp's
    semantic matcher has a compatible knowledge source — and, as in the
    paper, the many domain-specific identifier columns (CHEMBL ids, BAO
    codes) defeat generic word embeddings.
    """
    g = np.random.default_rng(seed)
    n = n_rows
    pdf = pd.DataFrame({
        "assay_id": np.arange(1, n + 1),
        "assay_chembl_id": [f"chembl{x}" for x in g.integers(100000, 999999, n)],
        "description": vocab.phrases(
            g, n, ["inhibition of", "binding affinity to", "activity against",
                   "selectivity for", "potency against"],
            [f"protein {w}" for w in vocab.LAST_NAMES[:15]]),
        "assay_type": g.choice(vocab.ASSAY_TYPES, n),
        "assay_category": g.choice(["confirmatory", "screening", "panel",
                                    "other"], n),
        "assay_organism": g.choice(vocab.ORGANISMS, n),
        "assay_tax_id": g.integers(1000, 99999, n),
        "assay_strain": g.choice(["k12", "bl21", "c57bl/6", "wistar",
                                  "sprague dawley", "none"], n),
        "assay_tissue": g.choice(vocab.TISSUES, n),
        "assay_cell_type": g.choice(vocab.CELL_TYPES, n),
        "subcellular_fraction": g.choice(["membrane", "cytosol", "nucleus",
                                          "mitochondria", "none"], n),
        "target_chembl_id": [f"chembl{x}" for x in g.integers(1000, 9999, n)],
        "target_type": g.choice(vocab.TARGET_TYPES, n),
        "confidence_score": g.integers(0, 10, n),
        "curated_by": g.choice(["expert", "autocuration", "intermediate"], n),
        "src_id": g.integers(1, 50, n),
        "src_assay_id": vocab.hex_id(g, n, 8),
        "chembl_version": g.choice(["chembl_20", "chembl_21", "chembl_22"], n),
        "bao_format": [f"bao_{x:07d}" for x in g.integers(0, 999999, n)],
        "cell_chembl_id": [f"chembl{x}" for x in g.integers(3000000, 3999999, n)],
        "relationship_type": g.choice(["d", "h", "m", "u", "n"], n),
        "assay_test_type": g.choice(["in vitro", "in vivo", "ex vivo"], n),
        "doc_id": g.integers(1, 80000, n),
    })
    assert len(pdf.columns) == 23, len(pdf.columns)
    return Table("assays", spark.createDataFrame(pdf))

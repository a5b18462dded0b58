"""Magellan-repository-style dataset pairs (stand-in for §V-B Magellan).

Seven *unionable* pairs with **verbatim column names** and
high-but-imperfect value overlap — the two properties the paper says
drive its Table III results (schema-based methods perfect; instance
methods tripped up by minor value discrepancies and multi-valued
attributes such as actor/author lists). Rows per pair span the paper's
864–131k range at reduced scale.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.fabrication.scenarios import DatasetPair
from repro.table import Table
from repro.valentine_data import vocab


def _multi(g: np.random.Generator, pool: list[str], n: int,
           k_max: int = 4) -> list[str]:
    """Multi-valued attribute: '; '-joined samples from a pool."""
    return ["; ".join(g.choice(pool, size=int(g.integers(1, k_max + 1)),
                               replace=False)) for _ in range(n)]


def _discrepant(pdf: pd.DataFrame, g: np.random.Generator,
                rate: float = 0.25) -> pd.DataFrame:
    """B-side value discrepancies: formatting jitter on a cell fraction.

    Multi-valued cells get their parts reordered; prices gain a ``$``;
    other strings lose/gain spacing — minor, realistic mismatches.
    """
    out = pdf.copy()
    for c in out.columns:
        if out[c].dtype != object:
            continue
        mask = g.random(len(out)) < rate
        def tweak(v: str) -> str:
            if "; " in v:
                parts = v.split("; ")
                return " and ".join(reversed(parts))
            if v.replace(".", "").isdigit():
                return f"${v}"
            return v.replace(" ", "  ", 1) if " " in v else v + " "
        out.loc[mask, c] = out.loc[mask, c].map(tweak)
    return out


def _entity_pair(spark: SparkSession, name: str, pdf: pd.DataFrame,
                 *, overlap: float, seed: int) -> DatasetPair:
    """Split an entity pool into two row-overlapping unionable tables."""
    g = np.random.default_rng(seed)
    n = len(pdf)
    cut_a = int(n * (overlap + (1 - overlap) / 2))
    cut_b = int(n * (1 - overlap) / 2)
    a_pdf = pdf.iloc[:cut_a].reset_index(drop=True)
    b_pdf = _discrepant(pdf.iloc[cut_b:].reset_index(drop=True), g)
    return DatasetPair(
        name=f"magellan|{name}",
        scenario="unionable",
        source=Table(f"{name}_a", spark.createDataFrame(a_pdf)),
        target=Table(f"{name}_b", spark.createDataFrame(b_pdf)),
        ground_truth=frozenset((c, c) for c in pdf.columns),
        meta={"curated": True, "source_dataset": "magellan"},
    )


def magellan_pairs(spark: SparkSession, *, scale: float = 1.0,
                   seed: int = 0) -> list[DatasetPair]:
    """The seven Magellan-style pairs. ``scale`` scales row counts."""
    g = np.random.default_rng(seed)
    out: list[DatasetPair] = []

    def rows(base: int) -> int:
        return max(50, int(base * scale))

    # 1. restaurants — Fodors/Zagat style, 6 columns
    n = rows(864)
    out.append(_entity_pair(spark, "restaurants", pd.DataFrame({
        "name": vocab.phrases(g, n, ["golden", "blue", "royal", "little",
                                     "grand"], ["dragon", "olive", "fork",
                                                "table", "garden"]),
        "addr": [f"{x} {s}" for x, s in zip(g.integers(1, 999, n),
                                            g.choice(vocab.STREETS, n))],
        "city": g.choice(vocab.CITIES, n),
        "phone": [f"{a:03d}-{b:04d}" for a, b in
                  zip(g.integers(200, 999, n), g.integers(0, 9999, n))],
        "type": g.choice(["italian", "chinese", "american", "mexican",
                          "french", "thai"], n),
        "class": g.integers(0, 100, n),
    }), overlap=0.8, seed=seed + 1))

    # 2. beer — 4 columns
    n = rows(900)
    out.append(_entity_pair(spark, "beer", pd.DataFrame({
        "beer_name": vocab.phrases(g, n, ["hoppy", "dark", "golden", "old",
                                          "wild"], ["lager", "ale", "stout",
                                                    "pilsner", "porter"]),
        "brew_factory_name": g.choice(vocab.COMPANIES, n),
        "style": g.choice(["ipa", "stout", "lager", "porter", "saison"], n),
        "abv": (g.random(n) * 8 + 3).round(1).astype(str),
    }), overlap=0.7, seed=seed + 2))

    # 3. itunes/amazon songs — multi-valued genre column
    n = rows(1200)
    out.append(_entity_pair(spark, "itunes_amazon", pd.DataFrame({
        "song_name": vocab.phrases(g, n, ["blue", "lonely", "sweet", "wild"],
                                   ["heart", "river", "road", "moon"]),
        "artist_name": np.char.add(np.char.add(
            g.choice(vocab.FIRST_NAMES, n), " "),
            g.choice(vocab.LAST_NAMES, n)),
        "album_name": vocab.phrases(g, n, ["greatest", "live", "early"],
                                    ["hits", "sessions", "years"]),
        "genre": _multi(g, vocab.GENRES, n, 3),
        "price": (g.random(n) * 2 + 0.5).round(2).astype(str),
        "copyright": g.choice(vocab.RECORD_LABELS, n),
        "released": g.integers(1960, 2020, n).astype(str),
    }), overlap=0.6, seed=seed + 3))

    # 4. dblp/acm papers — multi-valued authors
    author_pool = [f"{f} {l}" for f, l in zip(vocab.FIRST_NAMES[:25],
                                              vocab.LAST_NAMES[:25])]
    for nm, venue_pool, base, sd in (
        ("dblp_acm", ["sigmod", "vldb", "icde", "sigir"], 1800, 4),
        ("dblp_scholar", ["sigmod record", "vldb journal", "tods",
                          "tkde"], 2500, 5),
    ):
        n = rows(base)
        out.append(_entity_pair(spark, nm, pd.DataFrame({
            "title": vocab.phrases(
                g, n, ["efficient", "scalable", "adaptive", "robust",
                       "incremental"],
                ["query processing", "schema matching", "join algorithms",
                 "data cleaning", "indexing", "view maintenance"]),
            "authors": _multi(g, author_pool, n, 4),
            "venue": g.choice(venue_pool, n),
            "year": g.integers(1995, 2020, n).astype(str),
        }), overlap=0.65, seed=seed + sd))

    # 6. amazon/google products — 3 columns
    n = rows(1300)
    out.append(_entity_pair(spark, "amazon_google", pd.DataFrame({
        "title": vocab.phrases(g, n, ["pro", "ultra", "mini", "max",
                                      "classic"],
                               ["keyboard", "mouse", "monitor", "router",
                                "webcam", "printer"]),
        "manufacturer": g.choice(vocab.COMPANIES, n),
        "price": (g.random(n) * 500 + 10).round(2).astype(str),
    }), overlap=0.6, seed=seed + 6))

    # 7. walmart/amazon products — 5 columns
    n = rows(1000)
    out.append(_entity_pair(spark, "walmart_amazon", pd.DataFrame({
        "title": vocab.phrases(g, n, ["deluxe", "basic", "premium",
                                      "compact"],
                               ["blender", "toaster", "kettle", "vacuum",
                                "heater", "fan"]),
        "category": g.choice(["kitchen", "home", "garden", "electronics"], n),
        "brand": g.choice(vocab.COMPANIES, n),
        "modelno": vocab.hex_id(g, n, 6),
        "price": (g.random(n) * 300 + 5).round(2).astype(str),
    }), overlap=0.6, seed=seed + 7))
    return out

"""WikiData singers pairs (stand-in for the paper's §V-B WikiData source).

Two tables covering USA-citizen singers: identical entities, but the
second table (i) renames several columns (``partner`` → ``spouse`` etc.)
and (ii) re-encodes the values of **six** selected columns with
alternative versions (``Elvis Presley`` → ``Elvis Aaron Presley``),
exactly the construction described in the paper. Variants for all four
relatedness scenarios are derived from the same base entities, with
relations in the paper's 13–20 column / ~5.4k–10.8k row range at the
default size.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.fabrication.scenarios import DatasetPair
from repro.table import Table
from repro.valentine_data import vocab

#: column renames applied to the second table (A name -> B name).
RENAMES: dict[str, str] = {
    "artist_name": "singer_name",
    "partner": "spouse",
    "genre": "music_style",
    "record_label": "label",
    "hit_song": "famous_track",
    "occupation": "profession",
    "birth_date": "date_of_birth",
    "residence_city": "home_city",
}

#: the six columns whose values get alternative encodings in table B.
ENCODED_COLUMNS = ("artist_name", "birth_date", "birth_place",
                   "citizenship", "record_label", "genre")

_GENRE_ALT = {"rock": "rock and roll", "pop": "pop music",
              "country": "country & western", "jazz": "jazz music",
              "blues": "blues music", "soul": "soul music",
              "folk": "folk music", "gospel": "gospel music",
              "rockabilly": "rockabilly rock",
              "rhythm and blues": "r&b"}

_MONTHS = ["january", "february", "march", "april", "may", "june", "july",
           "august", "september", "october", "november", "december"]


def singers_base(*, n_rows: int = 5400, seed: int = 0) -> pd.DataFrame:
    """The shared entity pool: one row per singer, 20 columns."""
    g = np.random.default_rng(seed)
    n = n_rows
    first = g.choice(vocab.FIRST_NAMES, n)
    middle = g.choice(vocab.FIRST_NAMES, n)
    last = g.choice(vocab.LAST_NAMES, n)
    by = g.integers(1930, 1995, n)
    bm = g.integers(1, 13, n)
    bd = g.integers(1, 29, n)
    songs = vocab.phrases(g, n, ["blue", "lonely", "sweet", "wild",
                                 "golden", "midnight", "broken"],
                          ["heart", "river", "road", "moon", "train",
                           "angel", "dream"])
    pdf = pd.DataFrame({
        "artist_name": np.char.add(np.char.add(first, " "), last),
        "birth_name": [f"{f} {m} {l}" for f, m, l in zip(first, middle, last)],
        "birth_date": [f"{y:04d}-{mo:02d}-{d:02d}" for y, mo, d in zip(by, bm, bd)],
        "birth_place": [f"{c}, {s}" for c, s in
                        zip(g.choice(vocab.CITIES, n), g.choice(vocab.STATES, n))],
        "genre": g.choice(vocab.GENRES, n),
        "record_label": g.choice(vocab.RECORD_LABELS, n),
        "partner": np.char.add(np.char.add(g.choice(vocab.FIRST_NAMES, n), " "),
                               g.choice(vocab.LAST_NAMES, n)),
        "mother_name": np.char.add(np.char.add(g.choice(vocab.FIRST_NAMES, n), " "),
                                   last),
        "father_name": np.char.add(np.char.add(g.choice(vocab.FIRST_NAMES, n), " "),
                                   last),
        "occupation": g.choice(["singer", "singer-songwriter", "musician",
                                "performer"], n),
        "instrument": g.choice(vocab.INSTRUMENTS, n),
        "citizenship": np.full(n, "United States"),
        "active_start": g.integers(1950, 2010, n),
        "active_end": g.integers(2010, 2024, n),
        "hit_song": songs,
        "debut_album": vocab.phrases(g, n, ["first", "early", "young",
                                            "live at", "introducing"],
                                     ["sessions", "days", "years", "tapes",
                                      "songs"]),
        "award": g.choice(vocab.AWARDS, n),
        "website": [f"www.{f}{l}.com" for f, l in zip(first, last)],
        "residence_city": g.choice(vocab.CITIES, n),
        "voice_type": g.choice(["tenor", "baritone", "soprano", "alto",
                                "bass"], n),
    })
    pdf.attrs["middle_names"] = middle
    return pdf


def alternative_encoding(pdf: pd.DataFrame) -> pd.DataFrame:
    """Re-encode the six :data:`ENCODED_COLUMNS` with alternative forms."""
    out = pdf.copy()
    middle = pdf.attrs["middle_names"]
    first_last = out["artist_name"].str.split(" ", n=1)
    out["artist_name"] = [f"{fl[0]} {m} {fl[1]}" for fl, m in
                          zip(first_last, middle)]
    out["birth_date"] = [
        f"{_MONTHS[int(d[5:7]) - 1]} {int(d[8:10])}, {d[:4]}"
        for d in pdf["birth_date"]]
    out["birth_place"] = [f"{p.split(', ')[0]} ({p.split(', ')[1]})"
                          for p in pdf["birth_place"]]
    out["citizenship"] = "USA"
    out["record_label"] = pdf["record_label"] + " records"
    out["genre"] = pdf["genre"].map(_GENRE_ALT)
    return out


def _tables(spark: SparkSession, n_rows: int, seed: int
            ) -> tuple[pd.DataFrame, pd.DataFrame]:
    base = singers_base(n_rows=n_rows, seed=seed)
    return base, alternative_encoding(base)


def _pair(spark, scenario, name, a_pdf, b_pdf, a_cols, b_cols_src, gt_cols):
    """Assemble a DatasetPair; B columns are renamed per RENAMES."""
    b_named = {c: RENAMES.get(c, c) for c in b_cols_src}
    b = b_pdf[list(b_cols_src)].rename(columns=b_named)
    return DatasetPair(
        name=f"wikidata|{scenario}|{name}",
        scenario=scenario,
        source=Table("singers_a", spark.createDataFrame(a_pdf[list(a_cols)])),
        target=Table("singers_b", spark.createDataFrame(b)),
        ground_truth=frozenset((c, b_named[c]) for c in gt_cols),
        meta={"curated": True, "source_dataset": "wikidata"},
    )


def wikidata_pairs(spark: SparkSession, *, n_rows: int = 5400,
                   seed: int = 0) -> dict[str, DatasetPair]:
    """The four scenario variants over the singers tables.

    * unionable — all 20 columns, 50% row overlap.
    * view_unionable — disjoint rows, 13-column views sharing 8 columns.
    * joinable — all rows, shared columns drawn from the *non*-re-encoded
      set, so an equality join works.
    * semantically_joinable — shared columns include re-encoded ones, so
      only a semantic join can relate them.
    """
    a_pdf, b_pdf = _tables(spark, n_rows, seed)
    cols = list(a_pdf.columns)
    n = len(a_pdf)
    pairs: dict[str, DatasetPair] = {}

    # unionable: 50% row overlap (rows [0, 3n/4) vs [n/4, n))
    pairs["unionable"] = _pair(
        spark, "unionable", "ro=0.5",
        a_pdf.iloc[: 3 * n // 4], b_pdf.iloc[n // 4:], cols, cols, cols)

    # view-unionable: disjoint halves, 8 shared + 5 exclusive columns each
    shared_vu = ["artist_name", "birth_date", "genre", "record_label",
                 "partner", "occupation", "citizenship", "hit_song"]
    a_only = ["birth_name", "mother_name", "instrument", "active_start",
              "award"]
    b_only = ["birth_place", "father_name", "debut_album", "active_end",
              "residence_city"]
    pairs["view_unionable"] = _pair(
        spark, "view_unionable", "co=0.6",
        a_pdf.iloc[: n // 2], b_pdf.iloc[n // 2:],
        shared_vu + a_only, shared_vu + b_only, shared_vu)

    # joinable: shared columns are verbatim-encoded -> equality join works
    shared_j = ["birth_name", "hit_song", "website", "partner"]
    pairs["joinable"] = _pair(
        spark, "joinable", "co=0.3",
        a_pdf, b_pdf,
        shared_j + ["artist_name", "birth_date", "genre", "mother_name",
                    "instrument", "award", "active_start", "occupation"],
        shared_j + ["birth_place", "record_label", "father_name",
                    "debut_album", "residence_city", "voice_type",
                    "active_end", "citizenship"],
        shared_j)

    # semantically-joinable: shared columns are re-encoded in B
    shared_sj = ["artist_name", "birth_date", "birth_place", "citizenship",
                 "record_label", "genre"]
    pairs["semantically_joinable"] = _pair(
        spark, "semantically_joinable", "co=0.4",
        a_pdf, b_pdf,
        shared_sj + ["birth_name", "mother_name", "instrument", "award",
                     "active_start", "hit_song", "partner"],
        shared_sj + ["father_name", "debut_album", "residence_city",
                     "voice_type", "active_end", "website"],
        shared_sj)
    return pairs

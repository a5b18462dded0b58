"""Instance and schema noise (paper §IV, following eTuner).

* String columns get random typos based on **keyboard proximity**.
* Numeric columns are perturbed **according to their value
  distribution** (shift by a fraction of the column's std deviation).
* Schemata get "noisy" column names via three transformation rules:
  (i) prefix with the table name, (ii) abbreviate, (iii) drop vowels.

Every decision is a pure function of ``(seed, column, value)`` — never
of partitioning or row order — so fabricated pairs are bit-identical
across runs and the DuckDB oracle can replay them.
"""
from __future__ import annotations

import zlib

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.lexicon.thesaurus import ABBREVIATIONS
from repro.lexicon.tokenize import drop_vowels, tokenize

#: qwerty neighbourhood used to pick plausible typo substitutions.
_KEYBOARD: dict[str, str] = {
    "q": "wa", "w": "qes", "e": "wrd", "r": "etf", "t": "ryg", "y": "tuh",
    "u": "yij", "i": "uok", "o": "ipl", "p": "ol",
    "a": "qsz", "s": "awdx", "d": "sefc", "f": "drgv", "g": "fthb",
    "h": "gyjn", "j": "hukm", "k": "jil", "l": "kop",
    "z": "asx", "x": "zsdc", "c": "xdfv", "v": "cfgb", "b": "vghn",
    "n": "bhjm", "m": "njk",
    "0": "19", "1": "02", "2": "13", "3": "24", "4": "35", "5": "46",
    "6": "57", "7": "68", "8": "79", "9": "80",
}

#: full word -> abbreviation, inverted from the lexicon so the
#: "abbreviate" rule produces names the matchers could plausibly undo.
_WORD_TO_ABBREV: dict[str, str] = {}
for _ab, _full in ABBREVIATIONS.items():
    _WORD_TO_ABBREV.setdefault(_full, _ab)


def _value_seed(seed: int, column: str, value: str) -> int:
    """Stable 32-bit seed derived from (experiment seed, column, value)."""
    return zlib.crc32(f"{seed}:{column}:{value}".encode())


def keyboard_typo(value: str, rng: np.random.Generator) -> str:
    """One keyboard-proximity edit: substitute, transpose, or duplicate.

    Operates on a random alphanumeric position; returns the value
    unchanged if it has no alphanumeric characters.
    """
    pos = [i for i, ch in enumerate(value) if ch.lower() in _KEYBOARD]
    if not pos:
        return value
    i = int(rng.choice(pos))
    op = rng.random()
    ch = value[i]
    if op < 0.6:  # substitute with a neighbouring key
        repl = str(rng.choice(list(_KEYBOARD[ch.lower()])))
        repl = repl.upper() if ch.isupper() else repl
        return value[:i] + repl + value[i + 1:]
    if op < 0.8 and i + 1 < len(value):  # transpose with the next char
        return value[:i] + value[i + 1] + value[i] + value[i + 2:]
    return value[:i] + ch + value[i:]  # duplicate the char


def with_string_noise(df: DataFrame, columns: list[str], *,
                      rate: float = 0.3, seed: int = 0) -> DataFrame:
    """Inject typos into a fraction ``rate`` of the values of ``columns``.

    Each value decides independently (and deterministically, from its
    own content) whether to mutate and how — re-running or repartitioning
    cannot change the outcome.
    """
    str_cols = set(columns)

    def _noise_series(s: pd.Series, col: str) -> pd.Series:
        def one(v):
            if v is None or (isinstance(v, float) and np.isnan(v)):
                return v
            g = np.random.default_rng(_value_seed(seed, col, str(v)))
            if g.random() >= rate:
                return v
            return keyboard_typo(str(v), g)
        return s.map(one)

    out = df
    for c, fld in zip(df.columns, df.schema.fields):
        if c in str_cols and isinstance(fld.dataType, T.StringType):
            udf = F.pandas_udf(
                lambda s, _c=c: _noise_series(s, _c), T.StringType()
            )
            out = out.withColumn(c, udf(F.col(c)))
    return out


def with_numeric_noise(df: DataFrame, columns: list[str], *,
                       rate: float = 0.3, scale: float = 0.1,
                       seed: int = 0) -> DataFrame:
    """Perturb numeric columns relative to their own distribution.

    A value ``v`` selected with probability ``rate`` becomes
    ``v + z * scale * std(column)`` with ``z`` deterministic-uniform in
    [-1, 1]. Integer columns stay integral (rounded). Implemented as
    pure Catalyst expressions — the std is the only aggregate.
    """
    num_cols = [
        f.name for f in df.schema.fields
        if f.name in set(columns) and isinstance(
            f.dataType, (T.ByteType, T.ShortType, T.IntegerType, T.LongType,
                         T.FloatType, T.DoubleType, T.DecimalType))
    ]
    if not num_cols:
        return df
    stds = df.agg(
        *[F.stddev_samp(F.col(c)).alias(c) for c in num_cols]
    ).first().asDict()
    out = df
    for c in num_cols:
        std = stds[c] or 0.0
        h = F.xxhash64(F.col(c).cast("string"), F.lit(c), F.lit(seed))
        pick = (F.pmod(h, F.lit(10_000)) / 10_000.0) < rate
        z = F.pmod(F.xxhash64(F.col(c).cast("string"), F.lit(c), F.lit(seed + 1)),
                   F.lit(20_001)) / 10_000.0 - 1.0
        perturbed = F.col(c) + z * F.lit(scale * std)
        fld = dict(zip(df.columns, df.schema.fields))[c]
        if isinstance(fld.dataType, (T.ByteType, T.ShortType, T.IntegerType,
                                     T.LongType)):
            perturbed = F.round(perturbed).cast(fld.dataType)
        else:
            perturbed = perturbed.cast(fld.dataType)
        out = out.withColumn(c, F.when(pick, perturbed).otherwise(F.col(c)))
    return out


def _abbreviate(name: str) -> str:
    """Abbreviate each token: lexicon abbreviation, else first 3 chars."""
    toks = tokenize(name)
    if not toks:
        return name
    return "_".join(_WORD_TO_ABBREV.get(t, t[:3]) for t in toks)


def rename_with_noise(table_name: str, columns: list[str], *,
                      seed: int = 0) -> dict[str, str]:
    """Noisy column names via the three §IV transformation rules.

    The paper uses "a combination of three transformation rules": each
    column deterministically draws one rule or a two-rule combination
    (prefix / abbreviate / drop-vowels); collisions are disambiguated
    with a numeric suffix so the result is a valid schema.
    """
    g = np.random.default_rng(seed)
    mapping: dict[str, str] = {}
    used: set[str] = set()
    for col in columns:
        rule = int(g.integers(0, 6))
        if rule == 0:
            new = f"{table_name}_{col}"
        elif rule == 1:
            new = _abbreviate(col)
        elif rule == 2:
            new = drop_vowels(col)
        elif rule == 3:
            new = f"{table_name}_{_abbreviate(col)}"
        elif rule == 4:
            new = drop_vowels(_abbreviate(col))
        else:
            new = f"{table_name}_{drop_vowels(col)}"
        if new == col and rule != 0:  # noise must change the name
            new = f"{table_name}_{col}"
        base, k = new, 2
        while new in used:
            new = f"{base}_{k}"
            k += 1
        used.add(new)
        mapping[col] = new
    return mapping

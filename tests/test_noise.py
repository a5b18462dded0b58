"""Unit + Spark tests for the fabricator's noise transforms (§IV)."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.fabrication.noise import (
    _abbreviate,
    keyboard_typo,
    rename_with_noise,
    with_numeric_noise,
    with_string_noise,
)


class TestKeyboardTypo:
    def test_changes_alnum_value(self):
        rng = np.random.default_rng(0)
        assert keyboard_typo("hello", rng) != "hello"

    def test_no_alnum_unchanged(self):
        rng = np.random.default_rng(0)
        assert keyboard_typo("!!!", rng) == "!!!"

    def test_single_edit_distance(self):
        from repro.lexicon.thesaurus import _lev
        rng = np.random.default_rng(1)
        for _ in range(30):
            v = "springfield"
            assert _lev(v, keyboard_typo(v, rng)) <= 2  # transpose = 2 subs

    @given(st.text(alphabet="abcdefghij0123456789", min_size=1, max_size=20))
    @settings(max_examples=50)
    def test_length_changes_at_most_one(self, v):
        rng = np.random.default_rng(42)
        out = keyboard_typo(v, rng)
        assert abs(len(out) - len(v)) <= 1

    def test_preserves_case_on_substitution(self):
        rng = np.random.default_rng(3)
        outs = {keyboard_typo("ABC", rng) for _ in range(20)}
        for o in outs:
            assert o.isupper()


class TestRenameWithNoise:
    COLS = ["customer_id", "address_line", "phone_number", "income"]

    def test_all_names_change(self):
        m = rename_with_noise("t1", self.COLS, seed=0)
        for old, new in m.items():
            assert new != old

    def test_no_collisions(self):
        m = rename_with_noise("t1", ["name", "nm", "n"], seed=1)
        assert len(set(m.values())) == 3

    def test_deterministic(self):
        assert (rename_with_noise("t1", self.COLS, seed=5)
                == rename_with_noise("t1", self.COLS, seed=5))

    def test_seed_changes_result(self):
        results = {tuple(rename_with_noise("t1", self.COLS, seed=s).values())
                   for s in range(6)}
        assert len(results) > 1

    def test_abbreviate_uses_lexicon(self):
        assert _abbreviate("customer_number") == "cust_num"
        assert _abbreviate("velocity") == "vel"


class TestStringNoiseSpark:
    def test_rate_and_determinism(self, spark):
        pdf = pd.DataFrame({"s": [f"value number {i}" for i in range(300)],
                            "k": range(300)})
        df = spark.createDataFrame(pdf)
        noisy1 = with_string_noise(df, ["s"], rate=0.4, seed=7).toPandas()
        noisy2 = with_string_noise(df.repartition(7), ["s"], rate=0.4,
                                   seed=7).toPandas()
        # deterministic regardless of partitioning
        m1 = dict(zip(noisy1["k"], noisy1["s"]))
        m2 = dict(zip(noisy2["k"], noisy2["s"]))
        assert m1 == m2
        changed = sum(m1[i] != f"value number {i}" for i in range(300)) / 300
        assert 0.2 < changed < 0.6  # ~rate

    def test_non_string_columns_untouched(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"n": [1, 2, 3]}))
        out = with_string_noise(df, ["n"], rate=1.0, seed=0).toPandas()
        assert list(out["n"]) == [1, 2, 3]

    def test_nulls_preserved(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"s": ["a", None, "b"]}))
        out = with_string_noise(df, ["s"], rate=1.0, seed=0).toPandas()
        assert out["s"].isna().sum() == 1


class TestNumericNoiseSpark:
    def test_perturbs_fraction_within_scale(self, spark):
        g = np.random.default_rng(0)
        pdf = pd.DataFrame({"x": g.normal(100, 10, 500)})
        df = spark.createDataFrame(pdf)
        out = with_numeric_noise(df, ["x"], rate=0.5, scale=0.1,
                                 seed=3).toPandas()
        delta = (out["x"].sort_index() - pdf["x"]).abs()
        changed = (delta > 1e-12).mean()
        assert 0.3 < changed < 0.7
        # bounded by scale * std
        assert delta.max() <= 0.1 * pdf["x"].std() + 1e-6

    def test_integer_columns_stay_integer(self, spark):
        pdf = pd.DataFrame({"x": np.arange(200, dtype="int64")})
        df = spark.createDataFrame(pdf)
        out = with_numeric_noise(df, ["x"], rate=1.0, scale=0.2, seed=1)
        assert dict(out.dtypes)["x"] == "bigint"

    def test_string_columns_ignored(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"s": ["a", "b"]}))
        out = with_numeric_noise(df, ["s"], seed=0).toPandas()
        assert list(out["s"]) == ["a", "b"]

    def test_deterministic_across_partitions(self, spark):
        pdf = pd.DataFrame({"x": np.linspace(0, 1000, 300)})
        df = spark.createDataFrame(pdf)
        a = with_numeric_noise(df, ["x"], seed=9).toPandas()["x"].sort_values()
        b = with_numeric_noise(df.repartition(5), ["x"],
                               seed=9).toPandas()["x"].sort_values()
        np.testing.assert_allclose(a.to_numpy(), b.to_numpy())

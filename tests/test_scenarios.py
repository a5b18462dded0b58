"""Tests for the four relatedness-scenario fabricators (§III/§IV).

The DuckDB oracle verifies the defining algebra of each scenario:
unionable targets are projections/selections of the source table;
joinable pairs actually join back together on the shared columns.
"""
import numpy as np
import pandas as pd
import pytest

from repro.fabrication.scenarios import (
    DatasetPair,
    make_joinable,
    make_semantically_joinable,
    make_unionable,
    make_view_unionable,
    pair_census,
)
from repro.oracle import assert_equivalent
from repro.table import Table


@pytest.fixture(scope="module")
def base(spark):
    g = np.random.default_rng(1)
    pdf = pd.DataFrame({
        "pid": np.arange(300),
        "person": [f"person {i}" for i in range(300)],
        "town": g.choice(["delft", "lyon", "athens", "milan"], 300),
        "salary": g.normal(50_000, 9_000, 300).round(2),
        "grade": g.integers(1, 10, 300),
    })
    return Table("staff", spark.createDataFrame(pdf)), pdf


class TestUnionable:
    def test_ground_truth_covers_all_columns(self, base):
        t, _ = base
        p = make_unionable(t, schema_noise=True, seed=0)
        assert len(p.ground_truth) == len(t.columns)
        assert {s for s, _ in p.ground_truth} == set(t.columns)

    def test_same_arity(self, base):
        t, _ = base
        p = make_unionable(t, seed=1)
        assert len(p.source.columns) == len(p.target.columns)

    def test_verbatim_target_is_selection_of_source(self, base):
        """No noise: the target must be a row subset of the original."""
        t, pdf = base
        p = make_unionable(t, schema_noise=False, instance_noise=False, seed=2)
        tgt = p.target.df.toPandas()
        assert_equivalent(
            p.target.df,
            "select * from staff where pid in (select pid from tgt)",
            staff=pdf, tgt=tgt)

    def test_schema_noise_renames_target_only(self, base):
        t, _ = base
        p = make_unionable(t, schema_noise=True, seed=3)
        assert p.source.columns == t.columns
        assert set(p.target.columns).isdisjoint(set(t.columns))

    @pytest.mark.parametrize("ro", [0.0, 0.5, 1.0])
    def test_row_overlap_recorded(self, base, ro):
        t, _ = base
        p = make_unionable(t, row_overlap=ro, seed=4)
        assert p.meta["row_overlap"] == ro


class TestViewUnionable:
    def test_zero_row_overlap(self, base):
        t, _ = base
        p = make_view_unionable(t, schema_noise=False, seed=0)
        shared = [s for s, _ in p.ground_truth]
        inter = p.source.df.select(*shared).join(
            p.target.df.select(*shared), on=shared).count()
        assert inter == 0

    def test_ground_truth_is_shared_subset(self, base):
        t, _ = base
        p = make_view_unionable(t, column_overlap=0.4, seed=1)
        assert 0 < len(p.ground_truth) < len(t.columns)
        for s, tcol in p.ground_truth:
            assert s in p.source.columns
            assert tcol in p.target.columns

    def test_views_union_compatible(self, base):
        # projecting both sides onto the GT columns yields same arity
        t, _ = base
        p = make_view_unionable(t, seed=2)
        assert len({s for s, _ in p.ground_truth}) == len(p.ground_truth)


class TestJoinable:
    def test_join_reconstructs_rows(self, base):
        """Verbatim joinable: equi-join on shared columns is non-trivial
        (defining property: R1 ⋈ R2 ≠ R1 × R2)."""
        t, pdf = base
        p = make_joinable(t, schema_noise=False, seed=0)
        shared = [s for s, _ in p.ground_truth]
        joined = p.source.df.join(p.target.df, on=shared)
        n_join = joined.count()
        n_cross = p.source.df.count() * p.target.df.count()
        assert 0 < n_join < n_cross

    def test_instances_verbatim(self, base):
        t, pdf = base
        p = make_joinable(t, schema_noise=True, seed=1)
        # target values (modulo rename) all appear in the source table
        rev = {tc: sc for sc, tc in p.ground_truth}
        for tcol, scol in list(rev.items())[:2]:
            tvals = {r[0] for r in p.target.df.select(tcol).distinct().collect()}
            svals = set(pdf[scol].astype(str)) | set(pdf[scol])
            assert tvals <= svals

    def test_full_row_overlap_default(self, base):
        t, pdf = base
        p = make_joinable(t, row_overlap=1.0, seed=2)
        assert p.source.df.count() == len(pdf)
        assert p.target.df.count() == len(pdf)


class TestSemanticallyJoinable:
    def test_target_instances_noisy(self, base):
        """Noise must break the equality join the joinable case had."""
        t, pdf = base
        p = make_semantically_joinable(t, schema_noise=False, seed=0)
        shared = [s for s, _ in p.ground_truth]
        str_shared = [c for c in shared if t.column_types[c] == "string"]
        num_changed = 0
        for c in shared:
            tvals = set(map(str, p.target.df.select(c).toPandas()[c]))
            svals = set(map(str, pdf[c]))
            if tvals - svals:
                num_changed += 1
        assert num_changed > 0  # at least one shared column was perturbed

    def test_same_split_as_joinable(self, base):
        t, _ = base
        pj = make_joinable(t, schema_noise=False, seed=7)
        ps = make_semantically_joinable(t, schema_noise=False, seed=7)
        assert ({s for s, _ in pj.ground_truth}
                == {s for s, _ in ps.ground_truth})


class TestDatasetPair:
    def test_rejects_unknown_scenario(self, base):
        t, _ = base
        with pytest.raises(ValueError, match="unknown scenario"):
            DatasetPair("x", "nope", t, t, frozenset({("a", "b")}))

    def test_rejects_empty_ground_truth(self, base):
        t, _ = base
        with pytest.raises(ValueError, match="empty ground truth"):
            DatasetPair("x", "unionable", t, t, frozenset())


class TestPairCensus:
    def test_census_covers_all_scenarios(self, base):
        t, _ = base
        pairs = pair_census(t, row_overlaps=(0.5,), column_overlaps=(0.5,),
                            noise_combos=((True, False),))
        assert {p.scenario for p in pairs} == {
            "unionable", "view_unionable", "joinable",
            "semantically_joinable"}

    def test_census_size(self, base):
        t, _ = base
        pairs = pair_census(t, row_overlaps=(0.25, 0.5), column_overlaps=(0.5,),
                            noise_combos=((True, False), (True, True)))
        # unionable 2*2 + view-unionable 1*2 + joinable 1*2*2 + semj 1*2*2
        assert len(pairs) == 4 + 2 + 4 + 4

    def test_names_unique(self, base):
        t, _ = base
        pairs = pair_census(t)
        names = [p.name for p in pairs]
        assert len(names) == len(set(names))

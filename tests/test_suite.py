"""Tests for the experiment suite: grids (Table II), runner, aggregation."""
import pandas as pd
import pytest

from repro.matchers import CupidMatcher, JaccardLevenshteinMatcher
from repro.suite.aggregate import mean_runtime, min_median_max
from repro.suite.grids import (
    coma_grid,
    cupid_grid,
    distribution_grid,
    embdi_grid,
    grid_size,
    jaccard_levenshtein_grid,
    semprop_grid,
    similarity_flooding_grid,
)
from repro.suite.runner import best_per_pair, run_experiments, run_one
from repro.valentine_data.ontology import efo_like_ontology


class TestGrids:
    def test_paper_grid_sizes(self):
        """Full grids must reproduce Table II's axes exactly."""
        assert len(cupid_grid()) == 4 * 4 * 6          # 96
        assert len(similarity_flooding_grid()) == 1
        assert len(coma_grid()) == 2
        assert len(distribution_grid(variant=1)) == 9
        assert len(distribution_grid(variant=2)) == 9
        assert len(jaccard_levenshtein_grid()) == 5
        assert len(embdi_grid()) == 1
        assert len(semprop_grid(efo_like_ontology())) == 12

    def test_total_configurations_135(self):
        """The paper runs 135 configurations; our full grids match."""
        assert grid_size(with_semprop_ontology=efo_like_ontology()) == 135

    def test_reduced_grids_smaller(self):
        assert len(cupid_grid(reduced=True)) < len(cupid_grid())
        assert len(jaccard_levenshtein_grid(reduced=True)) < 5

    def test_dist_variant_thresholds(self):
        t1 = {m.theta1 for m in distribution_grid(variant=1)}
        t2 = {m.theta1 for m in distribution_grid(variant=2)}
        assert t1 == {0.1, 0.15, 0.2}
        assert t2 == {0.3, 0.4, 0.5}

    def test_invalid_variant(self):
        with pytest.raises(ValueError):
            distribution_grid(variant=3)

    def test_grid_configs_distinct(self):
        descs = [m.describe() for m in cupid_grid()]
        assert len(descs) == len(set(descs))


class TestRunner:
    def test_run_one_record(self, spark, unionable_verbatim):
        rec = run_one(spark, CupidMatcher(), unionable_verbatim)
        assert rec.method == "cupid"
        assert rec.scenario == "unionable"
        assert 0.0 <= rec.recall <= 1.0
        assert rec.runtime_s > 0
        assert rec.gt_size == len(unionable_verbatim.ground_truth)

    def test_run_experiments_cross_product(self, spark, unionable_verbatim,
                                           joinable_pair):
        ms = [CupidMatcher(), CupidMatcher(th_accept=0.5)]
        out = run_experiments(spark, ms, [unionable_verbatim, joinable_pair])
        assert len(out) == 4
        assert set(out["scenario"]) == {"unionable", "joinable"}

    def test_best_per_pair_takes_max(self, spark, unionable_verbatim):
        ms = [CupidMatcher(th_accept=0.3), CupidMatcher(th_accept=0.99)]
        raw = run_experiments(spark, ms, [unionable_verbatim])
        best = best_per_pair(raw)
        assert len(best) == 1
        assert best["recall"].iloc[0] == raw["recall"].max()
        assert best["n_configs"].iloc[0] == 2


class TestAggregate:
    def _results(self):
        return pd.DataFrame({
            "method": ["m1"] * 3 + ["m2"] * 3,
            "scenario": ["unionable"] * 6,
            "recall": [0.2, 0.5, 0.8, 1.0, 1.0, 0.4],
            "runtime_s": [1, 2, 3, 10, 20, 30],
        })

    def test_min_median_max(self):
        out = min_median_max(self._results())
        m1 = out[out["method"] == "m1"].iloc[0]
        assert (m1["min"], m1["median"], m1["max"]) == (0.2, 0.5, 0.8)

    def test_mean_runtime_sorted(self):
        out = mean_runtime(self._results())
        assert list(out["method"]) == ["m1", "m2"]
        assert out["avg_runtime_s"].iloc[0] == pytest.approx(2.0)

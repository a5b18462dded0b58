"""Tests for the Distribution-based (EMD clustering) matcher."""
import numpy as np
import pandas as pd
import pytest

from repro.matchers import DistributionBasedMatcher
from repro.matchers.distribution_based import _UnionFind, emd_1d
from repro.metrics import recall_at_ground_truth
from repro.table import Table
from tests.conftest import assert_valid_output


class TestEmd1d:
    def test_identical_distributions_zero(self):
        r = np.arange(100)
        w = np.ones(100)
        assert emd_1d(r, w, r, w, 100) == pytest.approx(0.0)

    def test_disjoint_distributions_large(self):
        ra, rb = np.arange(0, 50), np.arange(50, 100)
        w = np.ones(50)
        assert emd_1d(ra, w, rb, w, 100) > 0.3

    def test_symmetric(self):
        g = np.random.default_rng(0)
        ra, rb = g.integers(0, 100, 60), g.integers(0, 100, 60)
        wa, wb = g.random(60), g.random(60)
        assert emd_1d(ra, wa, rb, wb, 100) == pytest.approx(
            emd_1d(rb, wb, ra, wa, 100))

    def test_shift_increases_emd(self):
        w = np.ones(50)
        base = np.arange(50)
        near = emd_1d(base, w, base + 5, w, 100)
        far = emd_1d(base, w, base + 50, w, 100)
        assert far > near > 0

    def test_empty_rank_space(self):
        assert emd_1d(np.array([]), np.array([]), np.array([]),
                      np.array([]), 0) == 1.0


class TestUnionFind:
    def test_transitive_clustering(self):
        uf = _UnionFind(["a", "b", "c", "d"])
        uf.union("a", "b")
        uf.union("b", "c")
        assert uf.find("a") == uf.find("c")
        assert uf.find("d") != uf.find("a")


class TestParams:
    @pytest.mark.parametrize("kw", [{"theta1": 0}, {"theta2": -1}])
    def test_invalid_thetas(self, kw):
        with pytest.raises(ValueError):
            DistributionBasedMatcher(**kw)

    def test_params_reported(self):
        m = DistributionBasedMatcher(theta1=0.1, theta2=0.2)
        assert m.params() == {"theta1": 0.1, "theta2": 0.2}


class TestMatching:
    def test_output_contract(self, spark, unionable_verbatim):
        p = unionable_verbatim
        res = DistributionBasedMatcher().match(spark, p.source, p.target)
        assert_valid_output(res, p.source, p.target, full_cross=True)

    def test_identical_distributions_matched(self, spark):
        g = np.random.default_rng(3)
        vals = g.choice([f"w{i}" for i in range(30)], 400)
        a = pd.DataFrame({"u": vals[:200], "noise": [f"x{i}" for i in range(200)]})
        b = pd.DataFrame({"v": vals[200:], "other": [f"y{i}" for i in range(200)]})
        ta, tb = Table("a", spark.createDataFrame(a)), Table("b", spark.createDataFrame(b))
        res = DistributionBasedMatcher(theta1=0.3, theta2=0.3).match(spark, ta, tb)
        top = res.iloc[0]
        assert (top["source_col"], top["target_col"]) == ("u", "v")

    def test_name_agnostic(self, spark):
        """Pure instance method: renaming columns must not change scores."""
        g = np.random.default_rng(4)
        pdf = pd.DataFrame({"a": g.integers(0, 50, 300).astype(str),
                            "b": g.integers(100, 200, 300).astype(str)})
        t1 = Table("t", spark.createDataFrame(pdf))
        t2 = Table("t", spark.createDataFrame(
            pdf.rename(columns={"a": "zzz", "b": "qqq"})))
        r1 = DistributionBasedMatcher().match(spark, t1, t1)
        r2 = DistributionBasedMatcher().match(spark, t1, t2)
        s1 = r1.set_index(["source_col", "target_col"])["score"]
        s2 = r2.set_index(["source_col", "target_col"])["score"]
        assert s1[("a", "a")] == pytest.approx(s2[("a", "zzz")])
        assert s1[("a", "b")] == pytest.approx(s2[("a", "qqq")])

    def test_unionable_recall(self, spark, unionable_verbatim):
        p = unionable_verbatim
        res = DistributionBasedMatcher().match(spark, p.source, p.target)
        assert recall_at_ground_truth(res, set(p.ground_truth)) >= 0.5

    def test_view_unionable_harder_than_unionable(self, spark,
                                                  unionable_verbatim,
                                                  view_unionable_pair):
        """Paper §VII-A2: zero row overlap makes view-unionable harder
        for instance-based methods."""
        m = DistributionBasedMatcher()
        ru = recall_at_ground_truth(
            m.match(spark, unionable_verbatim.source,
                    unionable_verbatim.target),
            set(unionable_verbatim.ground_truth))
        rv = recall_at_ground_truth(
            m.match(spark, view_unionable_pair.source,
                    view_unionable_pair.target),
            set(view_unionable_pair.ground_truth))
        assert ru >= rv - 0.25  # allow noise, but unionable should not lose

    def test_deterministic(self, spark, unionable_verbatim):
        p = unionable_verbatim
        m = DistributionBasedMatcher()
        pd.testing.assert_frame_equal(m.match(spark, p.source, p.target),
                                      m.match(spark, p.source, p.target))

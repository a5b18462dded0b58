"""Unit tests for Recall@k / Recall@GroundTruth (paper §II-C)."""
import pandas as pd
import pytest

from repro.metrics import ranked_pairs, recall_at_ground_truth, recall_at_k


def _df(rows):
    return pd.DataFrame(rows, columns=["source_col", "target_col", "score"])


class TestRankedPairs:
    def test_sorts_by_score_descending(self):
        df = _df([("a", "x", 0.1), ("b", "y", 0.9), ("c", "z", 0.5)])
        assert ranked_pairs(df) == [("b", "y"), ("c", "z"), ("a", "x")]

    def test_ties_broken_lexicographically(self):
        df = _df([("b", "y", 0.5), ("a", "z", 0.5), ("a", "y", 0.5)])
        assert ranked_pairs(df) == [("a", "y"), ("a", "z"), ("b", "y")]

    def test_stable_under_input_order(self):
        rows = [("a", "x", 0.3), ("b", "y", 0.7), ("c", "z", 0.7)]
        assert ranked_pairs(_df(rows)) == ranked_pairs(_df(rows[::-1]))

    def test_missing_columns_raises(self):
        with pytest.raises(ValueError, match="missing columns"):
            ranked_pairs(pd.DataFrame({"source_col": [], "score": []}))

    def test_empty_input_ok(self):
        assert ranked_pairs(_df([])) == []


class TestRecallAtK:
    def test_perfect_ranking(self):
        df = _df([("a", "x", 0.9), ("b", "y", 0.8), ("c", "z", 0.1)])
        assert recall_at_k(df, {("a", "x"), ("b", "y")}, 2) == 1.0

    def test_half_right(self):
        df = _df([("a", "x", 0.9), ("c", "z", 0.8), ("b", "y", 0.1)])
        assert recall_at_k(df, {("a", "x"), ("b", "y")}, 2) == 0.5

    def test_zero_when_gt_at_bottom(self):
        df = _df([("c", "z", 0.9), ("d", "w", 0.8), ("a", "x", 0.1)])
        assert recall_at_k(df, {("a", "x")}, 1) == 0.0

    @pytest.mark.parametrize("k", [0, -1])
    def test_nonpositive_k_raises(self, k):
        with pytest.raises(ValueError, match="positive"):
            recall_at_k(_df([("a", "x", 1.0)]), {("a", "x")}, k)

    def test_k_larger_than_output_counts_misses(self):
        df = _df([("a", "x", 0.9)])
        assert recall_at_k(df, {("a", "x"), ("b", "y")}, 2) == 0.5

    def test_directional_pairs(self):
        # (s, t) is ordered: a reversed pair is not a hit
        df = _df([("x", "a", 0.9)])
        assert recall_at_k(df, {("a", "x")}, 1) == 0.0


class TestRecallAtGroundTruth:
    def test_k_equals_gt_size(self):
        df = _df([("a", "x", 0.9), ("b", "y", 0.8), ("c", "z", 0.7)])
        gt = {("a", "x"), ("b", "y"), ("c", "q")}
        # top-3 contains 2 of the 3 gt pairs
        assert recall_at_ground_truth(df, gt) == pytest.approx(2 / 3)

    def test_empty_ground_truth_raises(self):
        with pytest.raises(ValueError, match="empty"):
            recall_at_ground_truth(_df([("a", "x", 1.0)]), set())

    def test_equivalent_to_precision_at_k(self):
        # with k = |GT|, hits/k is both precision@k and recall@k
        df = _df([("a", "x", 0.9), ("b", "y", 0.8), ("c", "z", 0.7),
                  ("d", "w", 0.6)])
        gt = {("a", "x"), ("c", "z")}
        hits_in_top2 = 1  # only (a, x)
        assert recall_at_ground_truth(df, gt) == hits_in_top2 / len(gt)

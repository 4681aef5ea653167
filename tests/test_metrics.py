"""Tests for the ranking-accuracy metrics (Fig. 7/8, paper §4.3)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.metrics.ranking import kendall_tau_distance, ndcg, precision_at_k
from repro.metrics.skew import fisher_pearson_skew


class TestPrecisionAtK:
    def test_perfect(self):
        assert precision_at_k(["a", "b", "c"], ["a", "b", "c"], 3) == 1.0

    def test_order_within_topk_irrelevant(self):
        assert precision_at_k(["c", "a", "b"], ["a", "b", "c"], 3) == 1.0

    def test_partial_overlap(self):
        assert precision_at_k(["a", "x", "y"], ["a", "b", "c"], 3) == pytest.approx(1 / 3)

    def test_no_overlap(self):
        assert precision_at_k(["x", "y"], ["a", "b"], 2) == 0.0

    def test_truth_shorter_than_k(self):
        # A perfect predictor stays at 1.0 when |truth| < k.
        assert precision_at_k(["a", "b"], ["a"], 3) == 1.0

    def test_empty_truth(self):
        assert precision_at_k([], [], 3) == 1.0
        assert precision_at_k(["a"], [], 3) == 0.0


class TestKendallTau:
    def test_identical_zero(self):
        assert kendall_tau_distance(["a", "b", "c"], ["a", "b", "c"]) == 0.0

    def test_reversed_max(self):
        # n*(n-1)/2 discordant pairs for a full reversal.
        assert kendall_tau_distance(["c", "b", "a"], ["a", "b", "c"]) == 3.0

    def test_single_swap(self):
        assert kendall_tau_distance(["b", "a", "c"], ["a", "b", "c"]) == 1.0

    def test_missing_item_ranked_last(self):
        # 'a' missing from prediction: discordant with b and c.
        assert kendall_tau_distance(["b", "c"], ["a", "b", "c"]) == 2.0

    def test_extra_items_ignored(self):
        assert kendall_tau_distance(["x", "a", "y", "b"], ["a", "b"]) == 0.0

    @given(st.permutations(list("abcdef")))
    @settings(max_examples=50, deadline=None)
    def test_bounds(self, perm):
        d = kendall_tau_distance(perm, list("abcdef"))
        assert 0 <= d <= 15  # 6*5/2


class TestNDCG:
    def test_perfect(self):
        assert ndcg(["a", "b", "c"], ["a", "b", "c"]) == 1.0

    def test_empty_truth(self):
        assert ndcg(["a"], []) == 1.0

    def test_worse_with_displacement(self):
        good = ndcg(["a", "b", "c"], ["a", "b", "c"])
        bad = ndcg(["c", "b", "a"], ["a", "b", "c"])
        assert bad < good

    def test_irrelevant_items_zero_gain(self):
        assert ndcg(["x", "y", "z"], ["a", "b", "c"]) == 0.0

    def test_known_value(self):
        # truth = [a, b]; rel(a)=2, rel(b)=1; predicted [b, a]:
        # DCG = 1/log2(2) + 2/log2(3); IDCG = 2/log2(2) + 1/log2(3).
        import math

        expected = (1 + 2 / math.log2(3)) / (2 + 1 / math.log2(3))
        assert ndcg(["b", "a"], ["a", "b"]) == pytest.approx(expected)

    @given(st.permutations(list("abcde")))
    @settings(max_examples=50, deadline=None)
    def test_bounds(self, perm):
        assert 0.0 <= ndcg(perm, list("abcde")) <= 1.0


class TestSkew:
    def test_symmetric_zero(self):
        assert fisher_pearson_skew([1, 2, 3, 4, 5]) == pytest.approx(0.0)

    def test_right_skewed_positive(self):
        assert fisher_pearson_skew([1, 1, 1, 1, 10]) > 1.0

    def test_constant_zero(self):
        assert fisher_pearson_skew([3, 3, 3]) == 0.0

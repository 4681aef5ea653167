"""Tests for the simulated user-study machinery (paper §4.2 proxies)."""
import pytest

from repro.studysim.ground_truth import INSIGHTS, insights_for
from repro.studysim.judge import (
    SCORE_COLUMN_ONLY,
    SCORE_FULL,
    SCORE_MISS,
    Claim,
    claims_from_expert,
    grade_notebook,
    grade_query,
)
from repro.studysim.unassisted import count_insights
from repro.workload.queries import NOTEBOOKS


class TestGroundTruth:
    def test_covers_all_notebook_queries(self):
        covered = {gt.query for gt in INSIGHTS}
        for nums in NOTEBOOKS.values():
            for n in nums:
                assert n in covered, f"query {n} has no planted ground truth"

    def test_insights_for_lookup(self):
        assert all(gt.query == 6 for gt in insights_for(6))
        assert insights_for(999) == []


class TestJudge:
    def test_full_hit(self):
        score = grade_query(6, [Claim("decade", "2010")])
        assert score == SCORE_FULL

    def test_column_only(self):
        score = grade_query(6, [Claim("decade", "1950")])
        assert score == SCORE_COLUMN_ONLY

    def test_miss(self):
        score = grade_query(6, [Claim("tempo", "fast")])
        assert score == SCORE_MISS

    def test_no_claims(self):
        assert grade_query(6, []) == SCORE_MISS

    def test_best_claim_wins(self):
        claims = [Claim("tempo", ""), Claim("decade", "2010")]
        assert grade_query(6, claims) == SCORE_FULL

    def test_column_level_insight_full_credit_with_any_set(self):
        # Query 11's planted insight is column-level (set_keys=None): a
        # concrete set annotation earns the full score.
        assert grade_query(11, [Claim("Total_Trans_Ct", "[10, 45]")]) == SCORE_FULL
        assert grade_query(11, [Claim("Total_Trans_Ct", "")]) == SCORE_COLUMN_ONLY

    def test_non_comparative_claim_capped_on_comparative_insight(self):
        # Query 6's planted insight is about the *shift* the filter
        # caused; an output-only (RATH-style) claim naming the right rows
        # caps at column-level credit.
        static = Claim("decade", "2010", comparative=False)
        assert grade_query(6, [static]) == SCORE_COLUMN_ONLY
        # Group-by insights are static view properties: output-only
        # methods compete on equal footing there.
        static_gb = Claim("mean_pop", "year=2012 outstanding", comparative=False)
        assert grade_query(21, [static_gb]) == SCORE_FULL

    def test_notebook_mean(self):
        per_query = {6: [Claim("decade", "2010")], 7: [Claim("tempo", "")]}
        expected = (SCORE_FULL + SCORE_MISS) / 2
        assert grade_notebook(per_query) == pytest.approx(expected)


class TestExpertModel:
    def test_expert_full_hit_everywhere_but_join(self):
        for q in (6, 7, 21, 22, 11, 13, 27, 5, 16):
            assert grade_query(q, claims_from_expert(q)) == SCORE_FULL

    def test_expert_misses_products_join(self):
        # §4.2: "Expert did not explain this join".
        assert claims_from_expert(1) == []
        assert grade_query(1, claims_from_expert(1)) == SCORE_MISS


class TestUnassisted:
    class _E:  # minimal Explanation stub
        def __init__(self, column, set_label, attr=None, via=None):
            self.column = column
            self.set_label = set_label
            self.attr = attr or column
            self.via = via

    def test_assisted_counts_full_hits(self):
        per_query = {6: [self._E("decade", "2010")], 7: []}
        c = count_insights(per_query)
        assert c.assisted == 1.0

    def test_partial_hits_half_weight(self):
        per_query = {6: [self._E("decade", "1950")]}
        c = count_insights(per_query)
        assert c.assisted == 0.5

    def test_unassisted_limited_to_obvious_and_budget(self):
        # Queries 6 and 7 are obvious; 21, 22 are not. Budget of 2
        # queries -> unassisted finds exactly the two obvious ones.
        per_query = {6: [], 7: [], 21: [], 22: []}
        c = count_insights(per_query, queries_in_budget=2)
        assert c.unassisted == 2.0

    def test_unassisted_budget_excludes_later_obvious_queries(self):
        # Query 27 is obvious but sits outside a 2-query budget in the
        # bank notebook ordering (11, 12, 13, 27).
        per_query = {11: [], 12: [], 13: [], 27: []}
        c = count_insights(per_query, queries_in_budget=2)
        assert c.unassisted == 1.0  # only query 11's obvious insight

    def test_assisted_beats_unassisted_when_fedex_hits(self):
        per_query = {
            6: [self._E("decade", "2010")],
            7: [self._E("year", "[1991, 2023]")],
            21: [self._E("mean_pop", "2010", via="decade")],
            22: [self._E("mean_dance", "2020", via="decade")],
        }
        c = count_insights(per_query, queries_in_budget=2)
        assert c.assisted > c.unassisted

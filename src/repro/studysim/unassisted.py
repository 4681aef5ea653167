"""Simulated unassisted-vs-assisted EDA (paper §4.2, Fig. 5).

The paper counts correct task-related insights users find in 10 minutes
with and without FEDEX. Our deterministic analyst model:

* **assisted**: the analyst reads FEDEX's explanations — every distinct
  planted insight hit by a skyline explanation across the notebook's
  queries is found (explanations are read in seconds, so the 10-minute
  budget covers the whole notebook). FEDEX surfacing *near-miss* extras
  (skyline members pointing at a true column with a different set) adds
  partial discoveries, counted at half weight — mirroring how study
  participants turned explanations into further probes.
* **unassisted**: the analyst eyeballs raw query outputs; only insights
  whose pattern is blatant in the output dataframe
  (``PlantedInsight.obvious_in_output``) are found, and the 10-minute
  budget limits them to the first ``queries_in_budget`` queries they
  compose.

This is a model, not a measurement of humans; EXPERIMENTS.md flags the
derived numbers as simulated.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.studysim.ground_truth import insights_for
from repro.studysim.judge import Claim, _column_hit, _set_hit, claims_from_fedex


@dataclass
class InsightCount:
    assisted: float
    unassisted: float


def count_insights(
    per_query_explanations: dict[int, list],
    *,
    queries_in_budget: int = 2,
) -> InsightCount:
    """Insights found with vs without FEDEX over one notebook."""
    assisted = 0.0
    unassisted = 0.0
    for qi, (query, exps) in enumerate(per_query_explanations.items()):
        claims = claims_from_fedex(exps, top_k=len(exps))
        for gt in insights_for(query):
            full = any(
                _column_hit(gt, c) and _set_hit(gt, c) for c in claims
            )
            partial = any(_column_hit(gt, c) for c in claims)
            if full:
                assisted += 1.0
            elif partial:
                assisted += 0.5
            if gt.obvious_in_output and qi < queries_in_budget:
                unassisted += 1.0
    return InsightCount(assisted=assisted, unassisted=unassisted)

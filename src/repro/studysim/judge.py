"""Deterministic explanation judge — the simulated §4.2 user studies.

Every method's output for a query is reduced to a list of
:class:`Claim` s — "(column-ish text, set-of-rows-ish text)". The judge
grades a query's explanation set on the paper's 1-7 scale against the
planted ground truth (``ground_truth.py``):

* **7.0** — some claim names a true insight's column *and* its
  set-of-rows (a full explanation, what FEDEX/EXPERT produce);
* **4.5** — a claim names a true column but no (or a wrong) row set
  (what IO and SeeDB can at best produce — column-level only);
* **2.0** — no claim touches a true insight (generic or off-target
  facts).

The paper's per-dimension scores (coherency / insight / usefulness) are
human judgments we cannot reproduce; this proxy collapses them into one
"recovers-the-true-pattern" scale. EXPERIMENTS.md reports it side by side
with the paper's averages and flags it as simulated.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.studysim.ground_truth import PlantedInsight, insights_for

SCORE_FULL = 7.0
SCORE_COLUMN_ONLY = 4.5
SCORE_MISS = 2.0


@dataclass(frozen=True)
class Claim:
    """What one explanation asserts: a column reference, (optionally) a
    set-of-rows label, and whether the claim *compares* the output to the
    input (FEDEX/IO/SeeDB/EXPERT do; RATH analyzes the output view alone,
    so its claims are static facts)."""

    column_text: str
    set_text: str = ""
    comparative: bool = True


def _column_hit(gt: PlantedInsight, claim: Claim) -> bool:
    return any(k.lower() in claim.column_text.lower() for k in gt.column_keys)


def _set_hit(gt: PlantedInsight, claim: Claim) -> bool:
    if gt.set_keys is None:
        # Column-level insight: any non-empty set annotation counts as a
        # full explanation (the method pointed at concrete rows).
        return bool(claim.set_text)
    return any(k.lower() in claim.set_text.lower() for k in gt.set_keys)


def grade_query(query: int, claims: list[Claim]) -> float:
    """1-7 grade of a method's claims for one workload query.

    A *comparative* planted insight (how the operation shifted a
    distribution) requires a comparative claim for full credit — naming
    the right rows from the output view alone caps at column-level
    credit, mirroring that such a fact does not explain the *operation*.
    """
    best = SCORE_MISS
    for gt in insights_for(query):
        for claim in claims:
            if not _column_hit(gt, claim):
                continue
            if _set_hit(gt, claim) and (claim.comparative or not gt.comparative):
                return SCORE_FULL
            best = max(best, SCORE_COLUMN_ONLY)
    return best


def grade_notebook(per_query_claims: dict[int, list[Claim]]) -> float:
    """Mean grade over a notebook's queries (a Fig. 3 bar)."""
    if not per_query_claims:
        return SCORE_MISS
    return sum(grade_query(q, c) for q, c in per_query_claims.items()) / len(
        per_query_claims
    )


# ---- claim extractors, one per method --------------------------------
def claims_from_fedex(explanations, top_k: int = 2) -> list[Claim]:
    """FEDEX explanations carry both a column and a set label."""
    return [
        Claim(
            column_text=f"{e.column} {e.attr} {e.via or ''}",
            set_text=f"{e.set_label} {e.via or ''}",
        )
        for e in explanations[:top_k]
    ]


def claims_from_io(io_explanations) -> list[Claim]:
    """IO names columns only — it can never earn the full-hit score."""
    return [Claim(column_text=e.column) for e in io_explanations]


def claims_from_seedb(views) -> list[Claim]:
    """A SeeDB view names a (dimension, measure) pair, no row set."""
    return [Claim(column_text=f"{v.dimension} {v.measure}") for v in views]


def claims_from_rath(insights) -> list[Claim]:
    """A RATH insight names a (dimension, measure) and its top value —
    but it is computed on d_out alone, so it hits planted *operation*
    insights only when they happen to be visible in the output view."""
    return [
        Claim(
            column_text=f"{i.dimension} {i.measure}",
            set_text=i.detail,
            comparative=False,  # computed on d_out alone
        )
        for i in insights
    ]


def claims_from_expert(query: int) -> list[Claim]:
    """EXPERT is modeled as an oracle over the planted ground truth —
    except on the Products join (query 1), which §4.2 reports the experts
    did not explain ("Expert did not explain this join while FEDEX
    noticed a change in the distribution")."""
    if query == 1:
        return []
    return [
        Claim(
            column_text=" ".join(gt.column_keys),
            set_text=" ".join(gt.set_keys) if gt.set_keys else "the planted rows",
        )
        for gt in insights_for(query)
    ]

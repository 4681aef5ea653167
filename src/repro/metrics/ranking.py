"""Ranking-accuracy metrics for the Fig. 7/8 experiments (paper §4.3).

FEDEX-SAMPLING's explanation ranking is compared against exact FEDEX
(the ground truth) with:

* :func:`precision_at_k` — overlap of the two top-k sets [64];
* :func:`kendall_tau_distance` — raw discordant-pair count between the
  two rankings [37] (the paper reports unnormalized counts: 74.8 at
  sample size 50 down to 10.8 at 50K);
* :func:`ndcg` — normalized discounted cumulative gain [35] with graded
  relevance derived from the ground-truth rank.

Items are arbitrary hashables (we use ``Explanation.candidate_id``).
"""
from __future__ import annotations

import math
from collections.abc import Hashable, Sequence


def precision_at_k(
    predicted: Sequence[Hashable], truth: Sequence[Hashable], k: int
) -> float:
    """|top-k(predicted) ∩ top-k(truth)| / k' where k' = min(k, |truth|).

    Clamping to |truth| keeps a perfect predictor at 1.0 when the ground
    truth has fewer than k items (the paper sets k=3 because skylines are
    usually ≤3).
    """
    kk = min(k, len(truth))
    if kk == 0:
        return 1.0 if not predicted else 0.0
    return len(set(predicted[:k]) & set(truth[:kk])) / kk


def kendall_tau_distance(
    predicted: Sequence[Hashable], truth: Sequence[Hashable]
) -> float:
    """Number of discordant pairs between the two rankings.

    Counted over all pairs of ground-truth items; an item missing from
    ``predicted`` is treated as ranked after every present item (so a
    truncated prediction is penalized against every item it displaced).
    Items ``predicted`` ranks but the truth does not are ignored.
    """
    truth_pos = {x: i for i, x in enumerate(truth)}
    pred_pos = {x: i for i, x in enumerate(predicted)}
    items = [x for x in truth if x in truth_pos]
    inf = len(predicted) + len(truth) + 1
    disc = 0
    for i in range(len(items)):
        for j in range(i + 1, len(items)):
            a, b = items[i], items[j]
            pa = pred_pos.get(a, inf)
            pb = pred_pos.get(b, inf)
            # truth says a before b; discordant if predicted says b first.
            if pb < pa:
                disc += 1
    return float(disc)


def ndcg(
    predicted: Sequence[Hashable], truth: Sequence[Hashable], k: int | None = None
) -> float:
    """nDCG with graded relevance rel(x) = |truth| - rank_truth(x).

    The ideal ordering is ``truth`` itself; items absent from the ground
    truth have zero gain. Returns 1.0 for empty ground truth.
    """
    if not truth:
        return 1.0
    L = len(truth)
    rel = {x: float(L - i) for i, x in enumerate(truth)}
    kk = k or max(len(predicted), L)

    def dcg(ranking: Sequence[Hashable]) -> float:
        return sum(
            rel.get(x, 0.0) / math.log2(i + 2)
            for i, x in enumerate(ranking[:kk])
        )

    ideal = dcg(truth)
    return dcg(predicted) / ideal if ideal > 0 else 1.0

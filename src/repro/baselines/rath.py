"""RATH-style top-k insight extractor (paper §4.1, baseline 2; [72, 59]).

Rath implements the "Extracting top-k insights from multi-dimensional
data" family (Tang et al. [72]): enumerate subspaces (dimension,
measure, aggregate) over the *result* dataframe alone, compute each
subspace's aggregate series, and score insight types with a single
score = impact × significance:

* **outstanding-#1**: the top value's z-score against its siblings;
* **attribution**: the top value's share of the total mass;
* **trend**: |Pearson r| of the series against an ordered dimension.

Insights are generic facts about the view — *not* tied to the user's
operation — which is exactly the contrast the paper draws with FEDEX.

The real RATH materializes the full data in memory (no sampling) and the
paper reports it failing with OOM at 3M rows on a 16 GB laptop
(§4.3). We mirror the algorithm's full materialization and expose a
``memory_budget_bytes`` knob; the benchmark configures the budget to the
paper's 16 GB envelope so the published failure point reproduces at our
scale (documented substitution, DESIGN.md §2).
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.interestingness import is_numeric
from repro.core.model import Step

#: Approximate bytes-per-cell of a materialized pandas frame (the real
#: RATH holds several derived copies; 3 copies × 8 bytes is conservative).
BYTES_PER_CELL = 24


class RathOOMError(MemoryError):
    """Raised when the full materialization would exceed the budget —
    reproducing the paper's observed RATH failure at 3M rows / 16 GB."""


@dataclass
class RathInsight:
    kind: str  # 'outstanding_1' | 'attribution' | 'trend'
    dimension: str
    measure: str
    agg: str
    score: float
    detail: str

    @property
    def caption(self) -> str:
        return f"[{self.kind}] {self.detail} (score {self.score:.3f})"


def _score_series(
    series: pd.Series, dim: str, measure: str, agg: str, impact: float
) -> list[RathInsight]:
    s = series.dropna().astype(float)
    out: list[RathInsight] = []
    if len(s) < 3:
        return out
    top_idx = s.idxmax()
    rest = s.drop(top_idx)
    if rest.std(ddof=1) > 1e-12:
        z = (s[top_idx] - rest.mean()) / rest.std(ddof=1)
        sig = 1.0 - math.exp(-max(z, 0.0) / 3.0)
        out.append(
            RathInsight(
                "outstanding_1", dim, measure, agg, impact * sig,
                f"{dim}={top_idx} is an outstanding #1 for {agg}({measure})",
            )
        )
    total = s.clip(lower=0).sum()
    if total > 0:
        share = float(s.clip(lower=0).max() / total)
        out.append(
            RathInsight(
                "attribution", dim, measure, agg, impact * share,
                f"{dim}={top_idx} holds {share:.0%} of {agg}({measure})",
            )
        )
    if np.issubdtype(s.index.dtype, np.number) and len(s) >= 5:
        x = s.index.to_numpy(float)
        y = s.to_numpy(float)
        if np.std(x) > 0 and np.std(y) > 0:
            r = float(np.corrcoef(x, y)[0, 1])
            out.append(
                RathInsight(
                    "trend", dim, measure, agg, impact * abs(r),
                    f"{agg}({measure}) {'rises' if r > 0 else 'falls'} with "
                    f"{dim} (r={r:.2f})",
                )
            )
    return out


def rath_insights(
    step: Step,
    *,
    top_k: int = 3,
    memory_budget_bytes: int | None = None,
    max_dim_cardinality: int = 100,
) -> list[RathInsight]:
    """Top-k insights over the step's output dataframe.

    Materializes the full output (RATH does not sample); raises
    :class:`RathOOMError` when the estimated footprint exceeds
    ``memory_budget_bytes``.
    """
    d_out = step.output()
    n_rows = d_out.count()
    n_cols = len(d_out.columns)
    if (
        memory_budget_bytes is not None
        and n_rows * n_cols * BYTES_PER_CELL > memory_budget_bytes
    ):
        raise RathOOMError(
            f"materializing {n_rows}x{n_cols} (~"
            f"{n_rows * n_cols * BYTES_PER_CELL / 1e9:.1f} GB est.) exceeds "
            f"budget {memory_budget_bytes / 1e9:.1f} GB"
        )
    pdf = d_out.toPandas()  # full materialization, as RATH does
    measures = [c for c in d_out.columns if is_numeric(d_out, c)]
    dims = [
        c
        for c in d_out.columns
        if 2 <= pdf[c].nunique(dropna=True) <= max_dim_cardinality
    ]
    total_mass = {m: pdf[m].abs().sum() for m in measures}
    insights: list[RathInsight] = []
    for dim in dims:
        grouped = pdf.groupby(dim)
        for m in measures:
            if m == dim:
                continue
            for agg in ("mean", "sum", "count"):
                series = getattr(grouped[m], agg)()
                # Impact: the subspace's share of the measure's total mass.
                impact = (
                    float(pdf[m].abs().sum() / total_mass[m])
                    if total_mass[m] > 0
                    else 0.0
                )
                insights.extend(_score_series(series, dim, m, agg, impact))
    insights.sort(key=lambda i: (-i.score, i.dimension, i.measure, i.agg, i.kind))
    return insights[:top_k]

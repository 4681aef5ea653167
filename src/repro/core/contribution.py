"""Contribution of sets-of-rows (paper §3.3, Def. 3.3) — leave-one-out
interventions computed from one pass of Spark aggregates per partition.

Def. 3.3 asks for ``C(R, A, Q) = I_A(Q) − I_A(D_in − R, q, d'_out)`` for
every set-of-rows R in a partition. Recomputing ``q`` per set would cost
|partition| full jobs; instead we exploit provenance:

* **filter/join/union** — removing input set ``i`` removes exactly the
  output rows annotated ``__pid == i`` (the operations commute with row
  removal on the partitioned side). So per-``(value, __pid)`` frequency
  aggregates of the input and output columns, computed **once**, determine
  every leave-one-out KS by column subtraction
  (:func:`repro.core.reference.leave_one_out_ks`).
* **group-by** — per-``(group, __pid)`` algebraic partials (sum/count/
  min/max), computed once, recombine into every leave-one-out aggregate;
  groups whose rows all belonged to the removed set vanish, exactly as if
  the query had been re-run (Def. 3.3 semantics, asserted by tests against
  the naive recompute).

Driver-side work is O(|distinct values| × |sets|) numpy — never raw rows.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import functions as F

from repro.core import reference
from repro.core.interestingness import bin_pair, cv_diversity, is_numeric, ks_statistic
from repro.core.model import IGNORE_PID, PID, GroupByStep, Step
from repro.core.partition import Partition


@dataclass
class ContributionResult:
    """Contributions of one partition's sets to one output column."""

    column: str
    partition: Partition
    score_full: float  # I_A(Q) computed on the full data
    contributions: dict[int, float]  # set id -> C(R_i, A, Q)
    stats: dict[int, dict] = field(default_factory=dict)  # caption stats
    extra: dict = field(default_factory=dict)  # column-level caption stats

    @property
    def standardized(self) -> dict[int, float]:
        """C̄ per set (z-score within this partition, §3.6)."""
        return reference.standardize(self.contributions)


def _pivot_counts(pdf: pd.DataFrame, attr: str, numeric: bool) -> pd.DataFrame:
    """(value, __pid, count) rows → value-indexed pivot in CDF order."""
    if pdf.empty:
        return pd.DataFrame()
    piv = pdf.pivot_table(
        index=attr, columns=PID, values="__cnt", aggfunc="sum", fill_value=0
    )
    order = np.argsort(
        piv.index.to_numpy(dtype=float if numeric else str, copy=False)
    )
    return piv.iloc[order]


def exceptionality_contributions_multi(
    step: Step,
    groups: list[tuple[Partition, list[str]]],
    *,
    max_distinct: int = 2000,
) -> list[ContributionResult]:
    """Leave-one-out KS contributions for many partitions of the *same*
    input dataframe, sharing every Spark pass.

    All partitions' pid expressions are attached to one annotated input,
    the operation is applied **once**, both sides are persisted, and each
    (partition, column) pair costs two in-memory frequency aggregates.
    Per-set shares (caption stats) for every partition come from a single
    conditional-count aggregate per side.
    """
    if not groups:
        return []
    base = groups[0][0].base
    pid_cols = {id(p): f"{PID}_{i}" for i, (p, _) in enumerate(groups)}
    ann_in = base.select(
        "*", *[p.pid.alias(pid_cols[id(p)]) for p, _ in groups]
    ).persist()
    ann_out = step.apply_annotated(ann_in).persist()
    results: list[ContributionResult] = []
    try:
        # One conditional-count aggregate per side covers every
        # (partition, set) share.
        share_exprs = []
        for p, _ in groups:
            pc = pid_cols[id(p)]
            for s in p.set_ids:
                share_exprs.append(
                    F.sum((F.col(pc) == s).cast("long")).alias(f"{pc}__{s}")
                )
        share_exprs.append(F.count(F.lit(1)).alias("__total"))
        sin = ann_in.agg(*share_exprs).collect()[0]
        sout = ann_out.agg(*share_exprs).collect()[0]

        # Bin decisions are per column, shared by all partitions.
        binned: dict[str, tuple] = {}
        all_cols = sorted({c for _, cols in groups for c in cols})
        for c in all_cols:
            if c in ann_in.columns and c in ann_out.columns:
                binned[c] = bin_pair(ann_in, ann_out, c, max_distinct)

        for p, columns in groups:
            pc = pid_cols[id(p)]
            tot_in, tot_out = sin["__total"], sout["__total"]
            stats = {
                i: {
                    "share_in": (sin[f"{pc}__{i}"] or 0) / tot_in if tot_in else 0.0,
                    "share_out": (sout[f"{pc}__{i}"] or 0) / tot_out if tot_out else 0.0,
                }
                for i in p.set_ids
            }
            for c in columns:
                if c not in binned:
                    continue
                bin_in, bin_out = binned[c]
                numeric = is_numeric(ann_in, c)
                cin = (
                    bin_in.select(F.col(c), F.col(pc).alias(PID))
                    .na.drop(subset=[c])
                    .groupBy(c, PID)
                    .agg(F.count(F.lit(1)).alias("__cnt"))
                    .toPandas()
                )
                cout = (
                    bin_out.select(F.col(c), F.col(pc).alias(PID))
                    .na.drop(subset=[c])
                    .groupBy(c, PID)
                    .agg(F.count(F.lit(1)).alias("__cnt"))
                    .toPandas()
                )
                piv_in = _pivot_counts(cin, c, numeric)
                piv_out = _pivot_counts(cout, c, numeric)
                if piv_in.empty or piv_out.empty:
                    continue
                # Align both pivots on the union of values, in CDF order.
                values = piv_in.index.union(piv_out.index)
                values = values[
                    np.argsort(values.to_numpy(dtype=float if numeric else str))
                ]
                piv_in = piv_in.reindex(values, fill_value=0)
                piv_out = piv_out.reindex(values, fill_value=0)
                full, loo = reference.leave_one_out_ks(piv_in, piv_out, p.set_ids)
                results.append(
                    ContributionResult(
                        column=c,
                        partition=p,
                        score_full=full,
                        contributions={i: full - loo[i] for i in p.set_ids},
                        stats=stats,
                    )
                )
    finally:
        ann_in.unpersist()
        ann_out.unpersist()
    return results


def exceptionality_contributions(
    step: Step,
    partition: Partition,
    columns: list[str],
    *,
    max_distinct: int = 2000,
) -> list[ContributionResult]:
    """Single-partition convenience wrapper around
    :func:`exceptionality_contributions_multi`."""
    return exceptionality_contributions_multi(
        step, [(partition, columns)], max_distinct=max_distinct
    )


def _recombine(partials: pd.DataFrame, step: GroupByStep, keep: pd.Series) -> pd.DataFrame:
    """Combine per-(group, set) partials over the sets selected by ``keep``
    into per-group aggregate values — the dataframe ``q(D_in − R)`` would
    produce. Groups left with zero rows disappear, as in a real re-run."""
    sub = partials[keep]
    if sub.empty:
        return pd.DataFrame(columns=step.keys + [a.alias for a in step.aggs])
    spec: dict[str, tuple] = {"__n": ("__n", "sum")}
    for a in step.aggs:
        if a.fn == "mean":
            spec[f"__sum__{a.alias}"] = (f"__sum__{a.alias}", "sum")
            spec[f"__cnt__{a.alias}"] = (f"__cnt__{a.alias}", "sum")
        elif a.fn == "sum":
            spec[f"__sum__{a.alias}"] = (f"__sum__{a.alias}", "sum")
        elif a.fn == "count":
            spec[f"__cnt__{a.alias}"] = (f"__cnt__{a.alias}", "sum")
        elif a.fn == "min":
            spec[f"__min__{a.alias}"] = (f"__min__{a.alias}", "min")
        elif a.fn == "max":
            spec[f"__max__{a.alias}"] = (f"__max__{a.alias}", "max")
    g = sub.groupby(step.keys, dropna=False, as_index=False).agg(**spec)
    g = g[g["__n"] > 0]
    out = g[step.keys].copy()
    for a in step.aggs:
        if a.fn == "mean":
            cnt = g[f"__cnt__{a.alias}"].to_numpy(float)
            with np.errstate(invalid="ignore", divide="ignore"):
                out[a.alias] = np.where(
                    cnt > 0, g[f"__sum__{a.alias}"].to_numpy(float) / cnt, np.nan
                )
        elif a.fn == "sum":
            out[a.alias] = g[f"__sum__{a.alias}"]
        elif a.fn == "count":
            out[a.alias] = g[f"__cnt__{a.alias}"]
        elif a.fn == "min":
            out[a.alias] = g[f"__min__{a.alias}"]
        elif a.fn == "max":
            out[a.alias] = g[f"__max__{a.alias}"]
    return out


def diversity_contributions(
    step: GroupByStep,
    partition: Partition,
    columns: list[str],
) -> list[ContributionResult]:
    """Leave-one-out CV contributions for a group-by step.

    A single per-``(group, __pid)`` partial-aggregate job feeds every
    intervention; CVs are recomputed on the (small) per-group values.
    """
    partials = step.partial_aggregates(partition.df).toPandas()
    if partials.empty:
        return []
    full_vals = _recombine(partials, step, partials[PID].notna())
    loo_vals = {
        i: _recombine(partials, step, partials[PID] != i)
        for i in partition.set_ids
    }
    # Dominant set per group (by row count) — caption attribution only.
    dom = (
        partials.groupby(step.keys, dropna=False)
        .apply(lambda g: g.loc[g["__n"].idxmax(), PID], include_groups=False)
        .rename("__dom")
        .reset_index()
    )
    full_dom = full_vals.merge(dom, on=step.keys, how="left")
    results: list[ContributionResult] = []
    for c in columns:
        if c not in full_vals.columns:
            continue
        full_cv = reference.cv(full_vals[c])
        contribs = {
            i: full_cv - reference.cv(loo_vals[i][c]) if c in loo_vals[i] else 0.0
            for i in partition.set_ids
        }
        overall_mean = float(pd.to_numeric(full_vals[c], errors="coerce").mean())
        overall_std = float(pd.to_numeric(full_vals[c], errors="coerce").std(ddof=1))
        stats = {}
        for i in partition.set_ids:
            vals = pd.to_numeric(
                full_dom.loc[full_dom["__dom"] == i, c], errors="coerce"
            ).dropna()
            stats[i] = {
                "set_mean": float(vals.mean()) if len(vals) else float("nan"),
                "n_groups": int(len(vals)),
            }
        results.append(
            ContributionResult(
                column=c,
                partition=partition,
                score_full=full_cv,
                contributions=contribs,
                stats=stats,
                extra={"overall_mean": overall_mean, "overall_std": overall_std},
            )
        )
    return results


def compute_contributions(
    step: Step,
    partition: Partition,
    columns: list[str],
    *,
    max_distinct: int = 2000,
) -> list[ContributionResult]:
    """Dispatch to the measure matching the step type (§3.2)."""
    if isinstance(step, GroupByStep):
        return diversity_contributions(step, partition, columns)
    return exceptionality_contributions(
        step, partition, columns, max_distinct=max_distinct
    )


def naive_contribution(
    step: Step, partition: Partition, column: str, set_id: int
) -> float:
    """Literal Def. 3.3: drop set ``set_id`` from the input, re-run ``q``
    in Spark, re-score. Used by tests as ground truth for the incremental
    computation above (and by no production path — it is |sets|× slower).
    """
    d_in_minus = partition.df.filter(F.col(PID) != F.lit(set_id)).drop(PID)
    d_out_minus = step.apply_annotated(d_in_minus)
    if isinstance(step, GroupByStep):
        full = cv_diversity(step.output(), column)
        return full - cv_diversity(d_out_minus, column)
    full = ks_statistic(step.partitioned_input, step.output(), column)
    return full - ks_statistic(d_in_minus, d_out_minus, column)

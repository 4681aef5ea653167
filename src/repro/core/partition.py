"""Row-partition methods (paper §3.5, Def. 3.8).

A :class:`Partition` divides an input dataframe into ``n`` disjoint
sets-of-rows plus an ignore-set, realized as an integer annotation column
``__pid`` (``0..n-1``; ignore-set = ``IGNORE_PID``) added by a pure Spark
expression (a broadcast-free ``when``-chain — no shuffle, no join).

Three methods, as in the paper:

* :func:`frequency_partition` — one set per top-``n`` most prevalent value
  of an attribute; everything else goes to the ignore-set.
* :func:`numeric_partition` — equal-frequency (quantile) intervals of a
  numeric attribute; ignore-set holds only nulls.
* :func:`many_to_one_partitions` — for attribute A, find attributes B with
  a functional dependency A→B that is strictly coarser, then
  frequency-partition on B (Ex. 3.9: 'year' → 'decade').

:func:`partitions_for_attribute` builds all of them for the requested set
counts while sharing the underlying Spark statistics (one top-values
collect, one quantile call, one FD scan) across sizes.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core.interestingness import is_numeric
from repro.core.model import IGNORE_PID, PID


@dataclass
class Partition:
    """A realized row partition: a pure pid *expression* over the base
    dataframe plus metadata.

    ``labels`` maps each candidate set id (0..n-1) to a human-readable
    label used in captions; the ignore-set has no label and is never an
    explanation candidate (Def. 3.8). Carrying the expression (not a
    materialized column) lets the contribution engine annotate one
    dataframe with *many* partitions at once and share Spark passes.
    """

    base: DataFrame  # the input dataframe the partition divides
    pid: Column  # integer set-id expression (IGNORE_PID for ignore-set)
    attr: str  # attribute the partition was requested for
    method: str  # 'frequency' | 'numeric' | 'many_to_one'
    labels: dict[int, str]
    via: str | None = None  # the B attribute, for many-to-one
    n_requested: int = 0

    @property
    def df(self) -> DataFrame:
        """The base dataframe with the ``__pid`` annotation column."""
        return self.base.withColumn(PID, self.pid)

    @property
    def set_ids(self) -> list[int]:
        return sorted(self.labels)

    def key(self) -> tuple:
        """Stable identity of this partition for candidate ids."""
        return (self.attr, self.method, self.via, self.n_requested)


def _fmt(v) -> str:
    """Stable display form for a partition-set label."""
    if isinstance(v, float) and v == int(v):
        return str(int(v))
    return str(v)


def _top_values(d_in: DataFrame, attr: str, n: int) -> list:
    """The ``n`` most frequent non-null values of ``d_in[attr]`` (ties
    broken by value, for determinism)."""
    rows = (
        d_in.select(attr)
        .na.drop()
        .groupBy(attr)
        .agg(F.count(F.lit(1)).alias("__cnt"))
        .orderBy(F.desc("__cnt"), F.asc(attr))
        .limit(n)
        .collect()
    )
    return [r[attr] for r in rows]


def _freq_partition_from_values(
    d_in: DataFrame, attr: str, values: list, n: int
) -> Partition | None:
    values = values[:n]
    if len(values) < 2:
        return None
    pid = F.lit(IGNORE_PID)
    # Build the when-chain in reverse so earlier (more frequent) values win.
    for i in reversed(range(len(values))):
        pid = F.when(F.col(attr) == F.lit(values[i]), F.lit(i)).otherwise(pid)
    return Partition(
        base=d_in,
        pid=pid,
        attr=attr,
        method="frequency",
        labels={i: _fmt(v) for i, v in enumerate(values)},
        n_requested=n,
    )


def frequency_partition(d_in: DataFrame, attr: str, n: int) -> Partition | None:
    """Top-``n``-values partition of ``d_in`` on ``attr`` (§3.5).

    Set ``i`` holds the rows whose ``attr`` equals the i-th most frequent
    value; remaining rows form the ignore-set. Returns ``None`` when the
    column has fewer than 2 distinct values (no meaningful partition).
    """
    return _freq_partition_from_values(d_in, attr, _top_values(d_in, attr, n), n)


def _numeric_partition_from_stats(
    d_in: DataFrame, attr: str, qs: list[float], lo, hi, n: int
) -> Partition | None:
    if lo is None or lo == hi or not qs:
        return None
    bounds = sorted(set(qs))
    # Intervals: (-inf, b0], (b0, b1], ..., (b_last, +inf)
    pid = F.lit(len(bounds))
    for i in reversed(range(len(bounds))):
        pid = F.when(F.col(attr) <= F.lit(bounds[i]), F.lit(i)).otherwise(pid)
    pid = F.when(F.col(attr).isNull(), F.lit(IGNORE_PID)).otherwise(pid)
    edges = [lo, *bounds, hi]
    labels = {
        i: f"[{_fmt(edges[i])}, {_fmt(edges[i + 1])}]"
        for i in range(len(bounds) + 1)
    }
    return Partition(
        base=d_in,
        pid=pid,
        attr=attr,
        method="numeric",
        labels=labels,
        n_requested=n,
    )


def numeric_partition(d_in: DataFrame, attr: str, n: int) -> Partition | None:
    """Equal-frequency interval partition of a numeric attribute (§3.5).

    Interval boundaries are the ``1/n .. (n-1)/n`` quantiles
    (``approxQuantile`` with tight error — deterministic for a given
    dataframe). Every non-null row lands in a set (the paper's ignore-set
    is empty here; we route nulls to it). Collapsing quantiles (heavy
    ties) simply yield fewer, still-disjoint intervals; ``None`` when the
    column is non-numeric or effectively constant.
    """
    if not is_numeric(d_in, attr):
        return None
    probs = [i / n for i in range(1, n)]
    qs = d_in.na.drop(subset=[attr]).approxQuantile(attr, probs, 1e-3)
    lo_hi = d_in.agg(F.min(attr).alias("lo"), F.max(attr).alias("hi")).collect()[0]
    return _numeric_partition_from_stats(
        d_in, attr, qs, lo_hi["lo"], lo_hi["hi"], n
    )


def find_many_to_one(
    d_in: DataFrame, attr: str, candidates: list[str] | None = None
) -> list[str]:
    """Attributes B with a strictly-coarser functional dependency A→B.

    Condition 1 (consistency): every A-value maps to exactly one B-value —
    ``max over A-groups of countDistinct(B) == 1``. Condition 2 (strictly
    coarser): some B-value covers ≥2 distinct A-values —
    ``countDistinct(B) < countDistinct(A)``. Both checks are two Spark
    aggregates covering *all* candidate columns at once.
    """
    cols = [
        c
        for c in (candidates if candidates is not None else d_in.columns)
        if c not in (attr, PID)
    ]
    if not cols:
        return []
    per_a = d_in.na.drop(subset=[attr]).groupBy(attr).agg(
        *[F.countDistinct(c).alias(c) for c in cols]
    )
    max_per_a = per_a.agg(*[F.max(c).alias(c) for c in cols]).collect()[0]
    n_distinct = (
        d_in.agg(
            F.countDistinct(attr).alias("__a"),
            *[F.countDistinct(c).alias(c) for c in cols],
        )
        .collect()[0]
        .asDict()
    )
    return [
        c
        for c in cols
        if max_per_a[c] == 1 and 0 < n_distinct[c] < n_distinct["__a"]
    ]


def many_to_one_partitions(
    d_in: DataFrame,
    attr: str,
    n: int,
    candidates: list[str] | None = None,
    max_targets: int = 2,
) -> list[Partition]:
    """Many-to-one partitions for ``attr`` (§3.5): frequency-partition on
    each detected coarser attribute B, labeled by B's values.

    ``max_targets`` caps how many B columns are used (the coarsest — i.e.
    fewest-distinct — first), bounding candidate blow-up on wide schemas.
    """
    out: list[Partition] = []
    targets = find_many_to_one(d_in, attr, candidates)
    if not targets:
        return out
    counts = (
        d_in.agg(*[F.countDistinct(c).alias(c) for c in targets])
        .collect()[0]
        .asDict()
    )
    for b in sorted(targets, key=lambda c: counts[c])[:max_targets]:
        p = frequency_partition(d_in, b, n)
        if p is not None:
            out.append(
                Partition(
                    base=p.base,
                    pid=p.pid,
                    attr=attr,
                    method="many_to_one",
                    labels=p.labels,
                    via=b,
                    n_requested=n,
                )
            )
    return out


def partitions_for_attribute(
    d_in: DataFrame,
    attr: str,
    n_sets: tuple[int, ...] = (5, 10),
    *,
    many_to_one_candidates: list[str] | None = None,
    max_m2o_targets: int = 2,
) -> list[Partition]:
    """All partitions FEDEX builds for one attribute (§3.5, §3.7): for
    each requested size n — frequency, numeric (if numeric), and
    many-to-one partitions.

    The Spark statistics are shared across sizes: one top-``max(n)``
    frequency collect, one combined quantile call, one min/max aggregate,
    and one functional-dependency scan feed every size's partition.
    Partitions that different sizes realize identically (e.g. many-to-one
    on a 4-value 'decade' at n=5 and n=10) are deduplicated.
    """
    out: list[Partition] = []
    seen: set[tuple] = set()

    def _add(p: Partition | None) -> None:
        if p is None:
            return
        sig = (p.method, p.via, tuple(sorted(p.labels.values())))
        if sig in seen:
            return
        seen.add(sig)
        out.append(p)

    n_max = max(n_sets)
    top = _top_values(d_in, attr, n_max)
    numeric = is_numeric(d_in, attr)
    quantiles: dict[int, list[float]] = {}
    lo = hi = None
    if numeric:
        probs, spans = [], {}
        for n in sorted(set(n_sets)):
            grid = [i / n for i in range(1, n)]
            spans[n] = (len(probs), len(probs) + len(grid))
            probs.extend(grid)
        qs = d_in.na.drop(subset=[attr]).approxQuantile(attr, probs, 1e-3)
        if qs:
            for n, (a, b) in spans.items():
                quantiles[n] = qs[a:b]
        lo_hi = d_in.agg(F.min(attr).alias("lo"), F.max(attr).alias("hi")).collect()[0]
        lo, hi = lo_hi["lo"], lo_hi["hi"]

    m2o_targets = find_many_to_one(d_in, attr, many_to_one_candidates)
    m2o_tops: dict[str, list] = {}
    if m2o_targets:
        counts = (
            d_in.agg(*[F.countDistinct(c).alias(c) for c in m2o_targets])
            .collect()[0]
            .asDict()
        )
        chosen = sorted(m2o_targets, key=lambda c: counts[c])[:max_m2o_targets]
        m2o_tops = {b: _top_values(d_in, b, n_max) for b in chosen}

    for n in n_sets:
        _add(_freq_partition_from_values(d_in, attr, top, n))
        if numeric and n in quantiles:
            _add(_numeric_partition_from_stats(d_in, attr, quantiles[n], lo, hi, n))
        for b, btop in m2o_tops.items():
            p = _freq_partition_from_values(d_in, b, btop, n)
            if p is not None:
                _add(
                    Partition(
                        base=p.base,
                        pid=p.pid,
                        attr=attr,
                        method="many_to_one",
                        labels=p.labels,
                        via=b,
                        n_requested=n,
                    )
                )
    return out

"""Data model for notebook-based EDA steps (paper §3.1).

An exploratory step is ``Q = (D_in, q, d_out)``: one of the four EDA
operations the paper supports (filter, group-by, join, union) applied to
its input dataframe(s). Each step class knows how to

* produce its output (``output``), and
* propagate a partition annotation column ``__pid`` from the partitioned
  input through the operation (``apply_annotated``) — the provenance hook
  the leave-one-out contribution computation (``contribution.py``) relies
  on. Removing the set-of-rows with ``__pid == i`` from the input is
  equivalent to removing the output rows carrying ``__pid == i`` for
  filter/join/union, and to dropping set ``i``'s partial aggregates for
  group-by.

The internal annotation column name is :data:`PID`. Rows annotated with
``IGNORE_PID`` belong to the ignore-set (Def. 3.8) or to inputs that are
not being partitioned; they are never removed in an intervention.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from functools import reduce

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

#: Name of the internal partition-set-id column.
PID = "__pid"
#: Prefix shared by all partition-annotation columns (the contribution
#: engine may attach several partitions at once as __pid, __pid_0, ...).
PID_PREFIX = "__pid"
#: Set id of the ignore-set / non-partitioned rows (never removed).
IGNORE_PID = -1


def pid_columns(df: DataFrame) -> list[str]:
    """All partition-annotation columns present on ``df``."""
    return [c for c in df.columns if c.startswith(PID_PREFIX)]

#: Aggregate functions supported by group-by steps. Each is algebraic so
#: leave-one-out aggregates can be combined from per-set partials.
AGG_FNS = ("mean", "sum", "count", "min", "max")


@dataclass(frozen=True)
class Aggregation:
    """One aggregate in a group-by step: ``alias = fn(column)``.

    ``column=None`` with ``fn='count'`` is ``count(*)``.
    """

    fn: str
    column: str | None
    alias: str

    def __post_init__(self) -> None:
        if self.fn not in AGG_FNS:
            raise ValueError(f"unsupported aggregate {self.fn!r}; use one of {AGG_FNS}")
        if self.column is None and self.fn != "count":
            raise ValueError(f"{self.fn} requires a column")

    def expr(self) -> Column:
        """The Spark aggregate expression for this aggregation."""
        if self.fn == "count":
            target = F.lit(1) if self.column is None else F.col(self.column)
            return F.count(target).alias(self.alias)
        return getattr(F, {"mean": "avg"}.get(self.fn, self.fn))(
            F.col(self.column)
        ).alias(self.alias)


class Step:
    """Base class for an exploratory step ``Q = (D_in, q, d_out)``."""

    op: str = "abstract"

    @property
    def inputs(self) -> dict[str, DataFrame]:
        """Named input dataframes ``D_in``."""
        raise NotImplementedError

    @property
    def partitioned_input(self) -> DataFrame:
        """The input dataframe row partitions are built over (paper builds
        partitions over one input at a time; for join/union the side is
        selected at construction)."""
        raise NotImplementedError

    def output(self) -> DataFrame:
        """``d_out = q(D_in)``."""
        return self.apply_annotated(self.partitioned_input)

    def apply_annotated(self, annotated: DataFrame) -> DataFrame:
        """Apply ``q`` with ``annotated`` substituted for the partitioned
        input. ``annotated`` may carry the extra ``__pid`` column, which is
        propagated to the output for filter/join/union."""
        raise NotImplementedError


@dataclass
class FilterStep(Step):
    """``SELECT * FROM d_in WHERE predicate`` (paper Ex. 3.1)."""

    d_in: DataFrame
    predicate: str  # Spark SQL boolean expression

    op: str = field(default="filter", init=False)

    @property
    def inputs(self) -> dict[str, DataFrame]:
        return {"d_in": self.d_in}

    @property
    def predicate_columns(self) -> set[str]:
        """Input columns referenced by the predicate. These are excluded
        from interestingness scoring: a filter on A trivially maximizes
        A's own KS deviation, and the paper's running example scores
        'decade' (0.56) as the top column for ``popularity > 65`` — the
        predicate column itself is never the explanation target."""
        import re

        tokens = set(re.findall(r"[A-Za-z_][A-Za-z0-9_]*", self.predicate))
        return {c for c in self.d_in.columns if c in tokens}

    @property
    def partitioned_input(self) -> DataFrame:
        return self.d_in

    def apply_annotated(self, annotated: DataFrame) -> DataFrame:
        return annotated.filter(F.expr(self.predicate))


@dataclass
class JoinStep(Step):
    """``SELECT * FROM left INNER JOIN right ON key`` (Table 2, queries 1-3).

    ``partition_side`` names the input whose rows are partitioned for the
    contribution analysis ('left' or 'right'). Join keys are equi-join
    column names shared by both sides (Spark's ``on=[...]`` form, so the
    key appears once in the output, as in the paper's SQL ``SELECT *``).
    """

    left: DataFrame
    right: DataFrame
    on: list[str]
    how: str = "inner"
    partition_side: str = "left"

    op: str = field(default="join", init=False)

    @property
    def inputs(self) -> dict[str, DataFrame]:
        return {"left": self.left, "right": self.right}

    @property
    def partitioned_input(self) -> DataFrame:
        return self.left if self.partition_side == "left" else self.right

    def apply_annotated(self, annotated: DataFrame) -> DataFrame:
        if self.partition_side == "left":
            return annotated.join(self.right, on=self.on, how=self.how)
        return self.left.join(annotated, on=self.on, how=self.how)


@dataclass
class UnionStep(Step):
    """Union (by name) of two or more inputs. The first input is the
    partitioned one; rows of the other inputs are annotated with
    ``IGNORE_PID`` so interventions never remove them."""

    dfs: list[DataFrame]

    op: str = field(default="union", init=False)

    @property
    def inputs(self) -> dict[str, DataFrame]:
        return {f"d{i}": df for i, df in enumerate(self.dfs)}

    @property
    def partitioned_input(self) -> DataFrame:
        return self.dfs[0]

    def apply_annotated(self, annotated: DataFrame) -> DataFrame:
        extra = pid_columns(annotated)

        def _tag(df: DataFrame) -> DataFrame:
            for c in extra:
                df = df.withColumn(c, F.lit(IGNORE_PID))
            return df

        return reduce(lambda a, b: a.unionByName(_tag(b)), self.dfs[1:], annotated)


@dataclass
class GroupByStep(Step):
    """``SELECT aggs FROM d_in GROUP BY keys`` (Table 3 queries).

    The output schema is ``keys + [a.alias for a in aggs]``. Group keys are
    part of the output (the paper's Fig. 1b shows 'year' in the result),
    matching pandas' ``as_index=False`` semantics.
    """

    d_in: DataFrame
    keys: list[str]
    aggs: list[Aggregation]

    op: str = field(default="groupby", init=False)

    @property
    def inputs(self) -> dict[str, DataFrame]:
        return {"d_in": self.d_in}

    @property
    def partitioned_input(self) -> DataFrame:
        return self.d_in

    def apply_annotated(self, annotated: DataFrame) -> DataFrame:
        # __pid columns on the input are *not* propagated through a
        # group-by (groups mix rows of several sets); contribution.py uses
        # partial_aggregates() instead.
        extra = pid_columns(annotated)
        if extra:
            annotated = annotated.drop(*extra)
        return annotated.groupBy(*self.keys).agg(*[a.expr() for a in self.aggs])

    # ---- leave-one-out machinery -------------------------------------
    def partial_aggregates(self, annotated: DataFrame) -> DataFrame:
        """Per-``(keys, __pid)`` algebraic partials, one Spark aggregate.

        For every aggregation we emit the partials needed to recombine a
        leave-one-set-out aggregate on the driver: sum+count for mean,
        sum for sum, count for count, min/max for min/max. ``__n`` is the
        raw row count per cell (to detect groups that vanish entirely when
        a set is removed).
        """
        exprs: list[Column] = [F.count(F.lit(1)).alias("__n")]
        for a in self.aggs:
            if a.fn == "mean":
                exprs.append(F.sum(a.column).alias(f"__sum__{a.alias}"))
                exprs.append(F.count(a.column).alias(f"__cnt__{a.alias}"))
            elif a.fn == "sum":
                exprs.append(F.sum(a.column).alias(f"__sum__{a.alias}"))
            elif a.fn == "count":
                target = F.lit(1) if a.column is None else F.col(a.column)
                exprs.append(F.count(target).alias(f"__cnt__{a.alias}"))
            elif a.fn == "min":
                exprs.append(F.min(a.column).alias(f"__min__{a.alias}"))
            elif a.fn == "max":
                exprs.append(F.max(a.column).alias(f"__max__{a.alias}"))
        return annotated.groupBy(*self.keys, PID).agg(*exprs)

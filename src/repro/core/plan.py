"""Relational IR for Dynamic Table defining queries.

Snowflake expresses DT definitions as SQL compiled to a relational plan on
which the differentiation rewrites of §5.5 operate. A true Catalyst
``Rule[LogicalPlan]`` is Scala-only and unreachable from PySpark, so the
reproduction carries its own small IR; :mod:`repro.core.compile` lowers it to
DataFrame expressions (Catalyst optimizes those), and
:mod:`repro.core.differentiation` implements the paper's rewrite rules on it.

Scalar expressions are SQL strings, interpreted identically by Spark
(``F.expr``) and by the DuckDB oracle — keeping every test cross-checkable.

The IR covers exactly the operator classes §3.3.2 lists as incrementally
supported (projections, filters, union-all, inner and outer joins, LATERAL
FLATTEN, distinct and grouped aggregations, partitioned window functions)
plus markers for the unsupported ones (scalar aggregates, IN/EXISTS, scalar
subqueries) so ``refresh_mode = AUTO`` can resolve to FULL for them.
"""
from __future__ import annotations

from dataclasses import dataclass, field


class Plan:
    """Base class for IR nodes."""

    def children(self) -> tuple["Plan", ...]:
        return ()

    def tables(self) -> set[str]:
        """Names of all tables scanned (direct source dependencies)."""
        out: set[str] = set()
        for c in self.children():
            out |= c.tables()
        return out

    def walk(self):
        yield self
        for c in self.children():
            yield from c.walk()


@dataclass(frozen=True)
class Scan(Plan):
    """Scan a named table (base table or upstream DT)."""

    table: str

    def tables(self) -> set[str]:
        return {self.table}


@dataclass(frozen=True)
class Filter(Plan):
    """``WHERE predicate`` — predicate is a SQL boolean expression."""

    child: Plan
    predicate: str

    def children(self):
        return (self.child,)


@dataclass(frozen=True)
class Project(Plan):
    """``SELECT expr AS name, ...`` — exprs is (name, sql_expr) pairs."""

    child: Plan
    exprs: tuple[tuple[str, str], ...]

    def children(self):
        return (self.child,)


@dataclass(frozen=True)
class Join(Plan):
    """Equi-join on column lists, optionally with a residual predicate.

    ``how`` ∈ {inner, left, right, full}. User column names of the two sides
    must be disjoint (validated at compile time) so no renaming is needed —
    the same restriction the random query generator obeys.
    """

    left: Plan
    right: Plan
    left_on: tuple[str, ...]
    right_on: tuple[str, ...]
    how: str = "inner"
    residual: str | None = None

    def children(self):
        return (self.left, self.right)


@dataclass(frozen=True)
class UnionAll(Plan):
    """``UNION ALL`` of two inputs with identical user columns."""

    left: Plan
    right: Plan

    def children(self):
        return (self.left, self.right)


@dataclass(frozen=True)
class Aggregate(Plan):
    """``GROUP BY keys`` with aggregate exprs (name, sql_agg_expr) pairs.

    ``keys = ()`` is a *scalar aggregate*, which §3.3.2 lists as unsupported
    for incremental refresh; it still compiles for FULL mode.
    """

    child: Plan
    keys: tuple[str, ...]
    aggs: tuple[tuple[str, str], ...]

    def children(self):
        return (self.child,)


@dataclass(frozen=True)
class Distinct(Plan):
    """``SELECT DISTINCT *`` over the child."""

    child: Plan

    def children(self):
        return (self.child,)


@dataclass(frozen=True)
class Window(Plan):
    """Partitioned window functions: child columns plus (name, window_expr).

    ``partition_by`` must be non-empty — §3.3.2 supports *partitioned* window
    functions only; an empty partition list marks the plan full-refresh-only.
    Window expressions must break ORDER BY ties repeatably (paper caveat).
    """

    child: Plan
    partition_by: tuple[str, ...]
    exprs: tuple[tuple[str, str], ...]

    def children(self):
        return (self.child,)


@dataclass(frozen=True)
class Flatten(Plan):
    """LATERAL FLATTEN: explode array column ``col`` into ``out`` (+ ``pos``)."""

    child: Plan
    col: str
    out: str

    def children(self):
        return (self.child,)


# -- markers for operator classes outside incremental coverage (§3.3.2) ----


@dataclass(frozen=True)
class ScalarSubqueryFilter(Plan):
    """``WHERE col <op> (SELECT agg FROM sub)`` — unsupported incrementally.

    ``sub_agg`` is a SQL aggregate over the subquery plan's output.
    """

    child: Plan
    col: str
    op: str
    sub: Plan
    sub_agg: str

    def children(self):
        return (self.child, self.sub)


@dataclass(frozen=True)
class InSubqueryFilter(Plan):
    """``WHERE col [NOT] IN (SELECT sub_col FROM sub)`` — unsupported incrementally."""

    child: Plan
    col: str
    sub: Plan
    sub_col: str
    negated: bool = False

    def children(self):
        return (self.child, self.sub)


_UNSUPPORTED = (ScalarSubqueryFilter, InSubqueryFilter)


def unsupported_reason(plan: Plan) -> str | None:
    """Why a plan cannot be incrementally refreshed, or None if it can.

    Mirrors §3.3.2's operator coverage list.
    """
    for node in plan.walk():
        if isinstance(node, _UNSUPPORTED):
            return type(node).__name__
        if isinstance(node, Aggregate) and not node.keys:
            return "ScalarAggregate"
        if isinstance(node, Window) and not node.partition_by:
            return "UnpartitionedWindow"
    return None


def incremental_supported(plan: Plan) -> bool:
    """True if the differentiation framework covers every operator in ``plan``."""
    return unsupported_reason(plan) is None


def operator_names(plan: Plan) -> list[str]:
    """Operator class of every node (for the Fig. 6 frequency experiment)."""
    return [type(n).__name__ for n in plan.walk()]

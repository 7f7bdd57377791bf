"""Logical plan algebra for the Tempura reproduction.

Immutable operator trees over named base tables. Predicates and scalar
expressions are restricted SQL strings valid in both Spark SQL and
DuckDB, so one query definition drives three consumers: the Tempura
optimizer (via the memo), the Spark incremental executor, and the
DuckDB batch oracle (`to_sql`).

Only the operator family the paper's query workloads need is modeled:
Scan, Filter, Project, equi-Join (inner / left-outer / left-semi /
left-anti), Aggregate (SUM / COUNT(*) / AVG with mergeable states), and
bag Union.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Optional


@dataclass(frozen=True)
class AggSpec:
    """One aggregate column.

    ``func``: 'sum' | 'count' | 'avg'. ``expr`` is the measure (SQL over
    the child's columns; ignored for 'count'). Measures are COALESCEd to
    0 on both the incremental and oracle sides so SQL null semantics
    cannot diverge. ``hov_split`` optionally declares the HOV measure
    decomposition for aggregates over two-fact joins:
    ``(right_measure_sql, combined_sql)`` where the complement view M
    pre-aggregates ``SUM(right_measure_sql)`` per join key and
    ``combined_sql`` recomputes the measure per left row, referencing
    the pre-aggregated sum as ``__m__`` and the per-key match count as
    ``__mc__`` (see rules.hov_rewrite).
    """

    func: str
    expr: str
    alias: str
    hov_split: Optional[tuple[str, str]] = None

    def __post_init__(self):
        assert self.func in ("sum", "count", "avg"), self.func


class Plan:
    """Base class for logical operators (frozen dataclasses below)."""


@dataclass(frozen=True)
class Scan(Plan):
    table: str


@dataclass(frozen=True)
class Filter(Plan):
    child: Plan
    pred: str
    sel: float = 0.3  # planner-visible selectivity estimate


@dataclass(frozen=True)
class Project(Plan):
    child: Plan
    exprs: tuple[tuple[str, str], ...]  # (alias, sql_expr)


# 'left_anti_pad' (anti join null-padded to the outer-join schema) is
# internal — produced by the IM-2 Q^N decomposition, never by user
# queries, and not SQL-rendered.
JOIN_KINDS = ("inner", "left_outer", "left_semi", "left_anti", "left_anti_pad")


@dataclass(frozen=True)
class Join(Plan):
    left: Plan
    right: Plan
    how: str
    lkeys: tuple[str, ...]
    rkeys: tuple[str, ...]

    def __post_init__(self):
        assert self.how in JOIN_KINDS, self.how
        assert len(self.lkeys) == len(self.rkeys) and self.lkeys


@dataclass(frozen=True)
class Aggregate(Plan):
    child: Plan
    keys: tuple[str, ...]
    aggs: tuple[AggSpec, ...]


@dataclass(frozen=True)
class Union(Plan):
    children: tuple[Plan, ...]


# ---------------------------------------------------------------------------
# Schema inference


def output_cols(plan: Plan, schemas: dict[str, tuple[str, ...]]) -> tuple[str, ...]:
    """Output column names of ``plan`` given base-table ``schemas``."""
    if isinstance(plan, Scan):
        return tuple(schemas[plan.table])
    if isinstance(plan, Filter):
        return output_cols(plan.child, schemas)
    if isinstance(plan, Project):
        return tuple(a for a, _ in plan.exprs)
    if isinstance(plan, Join):
        lc = output_cols(plan.left, schemas)
        if plan.how in ("left_semi", "left_anti"):
            return lc
        rc = output_cols(plan.right, schemas)  # left_anti_pad: padded rc
        dup = set(lc) & set(rc)
        assert not dup, f"join sides must have disjoint columns: {dup}"
        return lc + rc
    if isinstance(plan, Aggregate):
        return plan.keys + tuple(a.alias for a in plan.aggs)
    if isinstance(plan, Union):
        first = output_cols(plan.children[0], schemas)
        for c in plan.children[1:]:
            assert output_cols(c, schemas) == first, "union schema mismatch"
        return first
    raise TypeError(plan)


def base_tables(plan: Plan) -> set[str]:
    if isinstance(plan, Scan):
        return {plan.table}
    if isinstance(plan, (Filter, Project, Aggregate)):
        return base_tables(plan.child)
    if isinstance(plan, Join):
        return base_tables(plan.left) | base_tables(plan.right)
    if isinstance(plan, Union):
        return set().union(*(base_tables(c) for c in plan.children))
    raise TypeError(plan)


def plan_stats(plan: Plan) -> dict[str, int]:
    """#joins / #aggregates / #subqueries of a query (Table-2 stats).

    A "subquery" is an Aggregate that feeds into a Join above it (a
    pre-aggregated derived table), matching how the paper's TPC-DS
    queries count EXISTS / derived-table subqueries.
    """
    joins = aggs = subqs = 0

    def walk(p: Plan, under_join: bool):
        nonlocal joins, aggs, subqs
        if isinstance(p, Join):
            joins += 1
            walk(p.left, True)
            walk(p.right, True)
        elif isinstance(p, Aggregate):
            aggs += 1
            if under_join:
                subqs += 1
            walk(p.child, under_join)
        elif isinstance(p, (Filter, Project)):
            walk(p.child, under_join)
        elif isinstance(p, Union):
            for c in p.children:
                walk(c, under_join)

    walk(plan, False)
    return {"joins": joins, "aggregates": aggs, "subqueries": subqs}


# ---------------------------------------------------------------------------
# SQL rendering (DuckDB oracle side)


def _agg_sql(a: AggSpec) -> str:
    if a.func == "count":
        return f"COUNT(*) AS {a.alias}"
    if a.func == "sum":
        return f"SUM(COALESCE({a.expr}, 0)) AS {a.alias}"
    # avg rendered as sum/count so the incremental state algebra and the
    # oracle compute the identical arithmetic
    return f"(SUM(COALESCE({a.expr}, 0)) * 1.0 / COUNT(*)) AS {a.alias}"


def to_sql(plan: Plan, schemas: dict[str, tuple[str, ...]]) -> str:
    """Render ``plan`` as a DuckDB SQL query over the base table names."""
    n = 0

    def alias() -> str:
        nonlocal n
        n += 1
        return f"t{n}"

    def rec(p: Plan) -> str:
        if isinstance(p, Scan):
            cols = ", ".join(schemas[p.table])
            return f"SELECT {cols} FROM {p.table}"
        if isinstance(p, Filter):
            return f"SELECT * FROM ({rec(p.child)}) {alias()} WHERE {p.pred}"
        if isinstance(p, Project):
            cols = ", ".join(f"{e} AS {a}" for a, e in p.exprs)
            return f"SELECT {cols} FROM ({rec(p.child)}) {alias()}"
        if isinstance(p, Join):
            la, ra = alias(), alias()
            on = " AND ".join(
                f"{la}.{lk} = {ra}.{rk}" for lk, rk in zip(p.lkeys, p.rkeys)
            )
            kw = {
                "inner": "JOIN",
                "left_outer": "LEFT JOIN",
                "left_semi": "SEMI JOIN",
                "left_anti": "ANTI JOIN",
            }[p.how]
            proj = (
                f"{la}.*"
                if p.how in ("left_semi", "left_anti")
                else f"{la}.*, {ra}.*"
            )
            return (
                f"SELECT {proj} FROM ({rec(p.left)}) {la} "
                f"{kw} ({rec(p.right)}) {ra} ON {on}"
            )
        if isinstance(p, Aggregate):
            sel = list(p.keys) + [_agg_sql(a) for a in p.aggs]
            grp = f" GROUP BY {', '.join(p.keys)}" if p.keys else ""
            return f"SELECT {', '.join(sel)} FROM ({rec(p.child)}) {alias()}{grp}"
        if isinstance(p, Union):
            return " UNION ALL ".join(f"({rec(c)})" for c in p.children)
        raise TypeError(p)

    return rec(plan)

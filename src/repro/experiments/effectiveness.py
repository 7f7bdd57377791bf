"""E1–E6 harnesses (Fig. 6(a)–(d), Fig. 7(a)–(g)).

A generic grid runner optimizes (and optionally executes) every
(query × arrival pattern × incremental method) cell under the IVM-PD or
PDW-PD scenario and reports:

* estimated cost — the planner's optimal-plan cost (Fig. 6); for IVM-PD
  the most-significant entry of ``c̃_v`` (the update-run cost), for
  PDW-PD the weighted ``c̃_w`` total, both reported relative to IM-1 as
  in the paper;
* real cost — the executed plan's measured rows-work (Fig. 7(a)–(d));
* state size — rows of materialized cross-boundary states (Fig. 7(e)(f)).

E6 (Fig. 7(g)) feeds the planner the statistics of the *other* arrival
pattern and executes the resulting (mis-)optimized plan.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.core.stats import StatsProvider
from repro.core.tempura import IQPProblem, Tempura, ivm_problem, pdw_problem
from repro.incr.executor import release, run_plan
from repro.workloads.arrival import make_scenario
from repro.workloads.queries import EFFECTIVENESS

METHODS = ("IM1", "IM2", "OJV", "HOV", "ALL")
PATTERNS = ("delta-big", "delta-small", "delta-R", "delta-RS")
QUERIES = tuple(EFFECTIVENESS)


class Bench:
    """Scenario/stats cache for one (spark, sf, k) configuration."""

    def __init__(self, spark: SparkSession | None, sf: float = 0.01, k: int = 2):
        self.spark, self.sf, self.k = spark, sf, k
        self._scen = {}

    def scenario(self, pattern: str):
        if pattern not in self._scen:
            self._scen[pattern] = make_scenario(
                self.spark, pattern, k=self.k, sf=self.sf
            )
        return self._scen[pattern]

    def stats(self, pattern: str, source_pattern: str | None = None):
        src = self.scenario(source_pattern) if source_pattern else None
        return StatsProvider(self.scenario(pattern), source=src)

    def release(self):
        for s in self._scen.values():
            s.release()


def _problem(q, stats, kind: str, k: int, w_early: float) -> IQPProblem:
    if kind == "ivm":
        return ivm_problem(q, stats, k)
    return pdw_problem(q, stats, k, w_early=w_early)


def _est_metric(res, kind: str) -> float:
    return res.cost_vec[-1] if kind == "ivm" else res.cost_weighted


def cell(
    bench: Bench,
    qname: str,
    pattern: str,
    method: str,
    kind: str,
    *,
    w_early: float = 0.3,
    execute: bool = False,
    stats_pattern: str | None = None,
) -> dict:
    """Optimize (and optionally execute) one grid cell."""
    q = EFFECTIVENESS[qname]()
    stats = bench.stats(pattern, stats_pattern)
    res = Tempura(method).optimize(_problem(q, stats, kind, bench.k, w_early))
    out = {
        "query": qname,
        "pattern": pattern,
        "method": method,
        "est": _est_metric(res, kind),
        "est_vec": tuple(round(c, 1) for c in res.cost_vec),
        "tasks": len(res.plan.tasks),
    }
    if execute:
        rep = run_plan(bench.spark, bench.scenario(pattern), res.plan, bench.k)
        out["real"] = (
            rep.work_vec[-1] if kind == "ivm" else rep.weighted(res.problem.weights)
        )
        out["real_total"] = rep.total_work
        out["state_rows"] = rep.state_rows
        release(rep)
    return out


def _relativize(rows: list[dict], keys: tuple[str, ...]) -> list[dict]:
    """Divide est/real by the IM-1 value of the same (keys) cell group."""
    base: dict[tuple, dict] = {}
    for r in rows:
        if r["method"] == "IM1":
            base[tuple(r[k] for k in keys)] = r
    for r in rows:
        b = base.get(tuple(r[k] for k in keys))
        if b:
            for m in ("est", "real"):
                if m in r and b.get(m):
                    r[f"{m}_rel_IM1"] = round(r[m] / b[m], 3)
    return rows


def e1_ivm_queries(bench: Bench, execute: bool = False, queries=QUERIES) -> list[dict]:
    """Fig. 6(a) / 7(a): IVM-PD, delta-big, all queries × methods."""
    rows = [
        cell(bench, q, "delta-big", m, "ivm", execute=execute)
        for q in queries
        for m in METHODS
    ]
    return _relativize(rows, ("query",))


def e2_ivm_patterns(bench: Bench, execute: bool = False, qname="q10") -> list[dict]:
    """Fig. 6(b) / 7(b): IVM-PD, q10, all patterns × methods."""
    rows = [
        cell(bench, qname, p, m, "ivm", execute=execute)
        for p in PATTERNS
        for m in METHODS
    ]
    return _relativize(rows, ("pattern",))


def e3_pdw(
    bench: Bench, execute: bool = False, queries=QUERIES, qname="q10"
) -> list[dict]:
    """Fig. 6(c)(d) / 7(c)(d): PDW-PD — queries at w1=0.3, plus q10
    across patterns for w1 in {0.3, 0.7}."""
    rows = []
    for q in queries:
        for m in METHODS:
            r = cell(bench, q, "delta-big", m, "pdw", w_early=0.3, execute=execute)
            r["w1"] = 0.3
            rows.append(r)
    for p in PATTERNS:
        for w1 in (0.3, 0.7):
            for m in METHODS:
                r = cell(bench, qname, p, m, "pdw", w_early=w1, execute=execute)
                r["w1"] = w1
                rows.append(r)
    return _relativize(rows, ("query", "pattern", "w1"))


def e5_state_sizes(bench: Bench, queries=QUERIES, qname="q10") -> list[dict]:
    """Fig. 7(e)(f): materialized-state rows of the IVM plans."""
    rows = [
        cell(bench, q, "delta-big", m, "ivm", execute=True)
        for q in queries
        for m in METHODS
    ]
    rows += [
        cell(bench, qname, p, m, "ivm", execute=True)
        for p in ("delta-small", "delta-R", "delta-RS")
        for m in METHODS
    ]
    return [
        {k: r[k] for k in ("query", "pattern", "method", "state_rows")}
        for r in rows
    ]


def e6_sensitivity(bench: Bench, qname="q10") -> list[dict]:
    """Fig. 7(g): run with the *other* pattern's statistics."""
    rows = []
    for actual, assumed in (
        ("delta-big", "delta-small"),
        ("delta-small", "delta-big"),
    ):
        acc = cell(bench, qname, actual, "ALL", "ivm", execute=True)
        acc["stats"] = "accurate"
        rows.append(acc)
        inacc = cell(
            bench, qname, actual, "ALL", "ivm", execute=True, stats_pattern=assumed
        )
        inacc["stats"] = f"assumed {assumed}"
        rows.append(inacc)
        for m in ("IM1", "IM2", "OJV", "HOV"):
            r = cell(bench, qname, actual, m, "ivm", execute=True)
            r["stats"] = "accurate"
            rows.append(r)
    return [
        {k: r.get(k) for k in ("query", "pattern", "method", "stats", "real")}
        for r in rows
    ]

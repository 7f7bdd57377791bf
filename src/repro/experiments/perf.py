"""E8–E12 — planner-performance experiments (§8.4, Fig. 8, Fig. 9).

All harnesses time the two IQP phases the paper reports: PSE
(plan-space exploration — memo saturation) and SMO (state-
materialization optimization — greedy MQO incl. its DP evaluations).
`traditional` plans the same query as a one-time batch problem (k=1),
the Fig. 8(a) baseline.
"""
from __future__ import annotations

import time

from repro.core.dp import PlanContext, Selector, extract
from repro.core.explore import explore
from repro.core.memo import snap
from repro.core.mqo import optimize_materialization
from repro.core import rules as R
from repro.core.stats import StatsProvider
from repro.core.tempura import Tempura, pdw_problem
from repro.core.logical import plan_stats
from repro.synth_data import TPCDS_SCHEMAS
from repro.workloads.queries import TABLE2, table2_query

SCH = dict(TPCDS_SCHEMAS)


class _FinalSnapshotStats:
    """Adapter: a k=1 'traditional' problem sees the full data as the
    single snapshot (what a batch optimizer would plan against)."""

    def __init__(self, stats: StatsProvider):
        self._s = stats

    def rows(self, table, kind, i):
        return self._s.rows(table, "snap", self._s.k) if kind == "snap" else 0

    def ndv(self, col):
        return self._s.ndv(col)

    @property
    def k(self):
        return 1


def iqp_times(
    q, stats, k: int = 3, cfg=R.ALL, speedups=("TS", "PNA", "GE")
) -> dict:
    """One IQP optimization, timed by phase."""
    t0 = time.perf_counter()
    er = explore(q, k, SCH, cfg, speedups)
    ctx = PlanContext(er.memo, stats, k, "weighted", tuple([0.3] * (k - 1) + [1.0]))
    pse = time.perf_counter() - t0
    roots = [(er.memo.group_of(er.root_tid, snap(k)), k)]
    mq = optimize_materialization(ctx, roots)
    return {
        "pse_s": pse,
        "smo_s": mq.seconds,
        "total_s": pse + mq.seconds,
        "groups": er.memo_stats["groups"],
        "exprs": er.memo_stats["exprs"],
        "cost": ctx.key(mq.plan.cost_vec),
    }


def traditional_time(q, stats) -> float:
    t0 = time.perf_counter()
    er = explore(q, 1, SCH, R.IM1)
    ctx = PlanContext(
        er.memo, _FinalSnapshotStats(stats), 1, "weighted", (1.0,)
    )
    extract(Selector(ctx), [(er.memo.group_of(er.root_tid, snap(1)), 1)])
    return time.perf_counter() - t0


def e8_overall(stats, k: int = 3) -> list[dict]:
    """Fig. 8(a): end-to-end IQP planning time vs traditional planning."""
    rows = []
    for name in TABLE2:
        q = table2_query(name)
        trad = traditional_time(q, stats)
        iqp = iqp_times(q, stats, k)
        rows.append({
            "query": name,
            "trad_s": trad,
            "iqp_s": iqp["total_s"],
            "ratio": iqp["total_s"] / trad if trad else float("nan"),
            "pse_s": iqp["pse_s"],
            "smo_s": iqp["smo_s"],
        })
    return rows


def e9_complexity(stats, k: int = 3) -> list[dict]:
    """Fig. 8(b) + Table 2: per-query phase times and structure stats."""
    rows = []
    for name, (p_joins, p_aggs, p_subq) in TABLE2.items():
        q = table2_query(name)
        st = plan_stats(q)
        t = iqp_times(q, stats, k)
        rows.append({
            "query": name,
            "joins": st["joins"], "paper_joins": p_joins,
            "aggs": st["aggregates"], "paper_aggs": p_aggs,
            "subqs": st["subqueries"], "paper_subqs": p_subq,
            "pse_s": t["pse_s"], "smo_s": t["smo_s"],
            "groups": t["groups"], "exprs": t["exprs"],
        })
    return rows


def e10_iqp_size(stats_by_k, qnames=("Q22", "Q67", "Q85")) -> list[dict]:
    """Fig. 8(c)(d): PSE/SMO time as |T| grows 3..9."""
    rows = []
    for name in qnames:
        q = table2_query(name)
        for k, stats in stats_by_k.items():
            t = iqp_times(q, stats, k)
            rows.append({
                "query": name, "k": k, "pse_s": t["pse_s"], "smo_s": t["smo_s"]
            })
    return rows


METHOD_STEPS = (
    ("IM1",),
    ("IM1", "IM2"),
    ("IM1", "IM2", "HOV"),
    ("IM1", "IM2", "HOV", "OJV"),
)


def e11_methods(stats, k: int = 3, qnames=("Q22", "Q67", "Q85")) -> list[dict]:
    """Fig. 8(e)(f): phase times as incremental methods are added."""
    rows = []
    for name in qnames:
        q = table2_query(name)
        for step in METHOD_STEPS:
            t = iqp_times(q, stats, k, cfg=R.combo(step))
            rows.append({
                "query": name, "methods": "+".join(step),
                "pse_s": t["pse_s"], "smo_s": t["smo_s"],
                "groups": t["groups"], "exprs": t["exprs"],
            })
    return rows


SPEEDUP_CONFIGS = (
    ("Baseline", ()),
    ("Baseline+TS", ("TS",)),
    ("Baseline+PNA", ("PNA",)),
    ("Baseline+GE", ("GE",)),
    ("Tempura", ("TS", "PNA", "GE")),
)


def e12_speedups(stats, k: int = 4, qnames=("Q22", "Q67", "Q85")) -> list[dict]:
    """Fig. 8(g): exploration time under each speed-up combination."""
    rows = []
    for name in qnames:
        q = table2_query(name)
        for label, sp in SPEEDUP_CONFIGS:
            t0 = time.perf_counter()
            er = explore(q, k, SCH, R.ALL, sp)
            rows.append({
                "query": name, "config": label,
                "pse_s": time.perf_counter() - t0,
                "exprs": er.memo_stats["exprs"],
                "attempts": er.attempts,
            })
    return rows

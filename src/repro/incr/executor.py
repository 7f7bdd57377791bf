"""Execute an extracted incremental plan on Spark, per time point.

Each :class:`~repro.core.dp.Task` is interpreted against the physical
operators in :mod:`repro.incr.ops`; states live in an in-memory store
(cached DataFrames) standing in for the materialized-state storage of a
progressive data warehouse. Metrics mirror the planner's cost model —
per-time work = ``IN_W·rows_in + OUT_W·rows_out`` summed over operators
executed at that time, plus Save/Load charges for states crossing a
time boundary — so estimated and real costs are directly comparable
(the paper's Fig. 6 vs Fig. 7).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession

from repro.core.cost import IN_W, LOAD_F, OUT_W, SAVE_F
from repro.core.dp import ExtractedPlan, Task
from repro.incr import ops
from repro.incr.mult import consolidate, diff_mult, merge_mult


@dataclass
class ExecReport:
    work_vec: list[float]  # per-time rows-work incl. save/load
    wall_vec: list[float]  # per-time wall-clock seconds
    rows_vec: list[int]  # per-time raw rows produced
    state_rows: int  # total rows of states saved across time boundaries
    state_count: int
    outputs: dict[int, DataFrame] = field(default_factory=dict)

    def weighted(self, weights) -> float:
        return sum(w * c for w, c in zip(weights, self.work_vec))

    @property
    def total_work(self) -> float:
        return sum(self.work_vec)


def run_plan(
    spark: SparkSession, scenario, plan: ExtractedPlan, k: int
) -> ExecReport:
    store: dict[str, DataFrame] = {}
    rows: dict[str, int] = {}
    work = [0.0] * k
    wall = [0.0] * k
    outrows = [0] * k
    cached: list[DataFrame] = []

    def compute(task: Task) -> DataFrame:
        e = task.expr
        kind, p = e.kind, e.payload
        ins = [store[f"g{g}@t{t}"] for g, t in task.inputs]
        if kind == "scan_snap":
            return scenario.snapshot(p[0], p[1])
        if kind == "scan_delta":
            return scenario.delta(p[0], p[2])
        if kind == "filter":
            return ops.b_filter(ins[0], p[0])
        if kind == "project":
            return ops.b_project(ins[0], p[0])
        if kind == "union":
            return ops.b_union(ins)
        if kind == "join":
            how, lk, rk, rcols = p
            l, r = ins
            if how == "inner":
                return ops.b_join_inner(l, r, lk, rk)
            if how == "left_outer":
                return ops.b_join_louter(l, r, lk, rk)
            if how == "left_semi":
                return ops.b_join_semi(l, r, lk, rk)
            if how == "left_anti":
                return ops.b_join_anti(l, r, lk, rk)
            if how == "left_anti_pad":
                return ops.b_join_anti(l, r, lk, rk, pad_cols=rcols, pad_template=r)
            raise ValueError(how)
        if kind == "d_join_inner":
            lk, rk = p
            return ops.d_join_inner(*ins, lk, rk)
        if kind == "d_join_louter":
            lk, rk, rcols = p
            return ops.d_join_louter(*ins, lk, rk, rcols)
        if kind == "d_join_semi":
            lk, rk = p
            return ops.d_join_semi(*ins, lk, rk)
        if kind == "ojv_delta":
            lk, rk, rcols = p
            return ops.ojv_delta_louter(*ins, lk, rk, rcols)
        if kind in ("agg_state", "d_agg_state"):
            return ops.b_agg_state(ins[0], p[0], p[1])
        if kind == "final":
            return ops.b_final(ins[0], p[0], p[1])
        if kind == "s2m_delta":
            return ops.state_to_mult_delta(ins[0], ins[1], p[0], p[1])
        if kind == "merge_mult":
            return merge_mult(ins[0], ins[1])
        if kind == "merge_state":
            return ops.merge_state(ins[0], ins[1], p[0])
        if kind == "diff_mult":
            return diff_mult(ins[0], ins[1])
        if kind == "diff_state":
            return ops.diff_state(ins[0], ins[1], p[0])
        raise ValueError(f"unknown task kind {kind}")

    for i in range(1, k + 1):
        t0 = time.perf_counter()
        for task in plan.tasks_at(i):
            df = compute(task)
            if not task.expr.kind.startswith("scan_"):
                df = df.persist()  # scans are already scenario-cached
                cached.append(df)
            n = df.count()
            name = task.state
            store[name] = df
            rows[name] = n
            rows_in = sum(rows[f"g{g}@t{t}"] for g, t in task.inputs)
            if task.expr.kind.startswith("scan_"):
                work[i - 1] += n  # plain read (mirrors cost.expr_work)
            else:
                work[i - 1] += IN_W * rows_in + OUT_W * n
            outrows[i - 1] += n
        wall[i - 1] = time.perf_counter() - t0

    # save/load charges for cross-time states
    loads = set()
    state_rows = 0
    for task in plan.tasks:
        for g, tc in task.inputs:
            if tc < task.time:
                loads.add((g, tc, task.time))
    for g, tc in plan.saved_states:
        state_rows += rows[f"g{g}@t{tc}"]
        work[tc - 1] += SAVE_F * rows[f"g{g}@t{tc}"]
    for g, tc, tu in loads:
        work[tu - 1] += LOAD_F * rows[f"g{g}@t{tc}"]

    outputs = {t: store[f"g{g}@t{t}"] for g, t in plan.roots}
    report = ExecReport(
        work, wall, outrows, state_rows, len(plan.saved_states), outputs
    )
    report._cached = cached  # release() support without re-tracking
    return report


def release(report: ExecReport) -> None:
    for df in getattr(report, "_cached", []):
        df.unpersist()


def result_rows(df: DataFrame):
    """Normalized plain-bag rows of a snapshot result (for assertions)."""
    from repro.incr.mult import to_bag

    return to_bag(consolidate(df))

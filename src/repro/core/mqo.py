"""Deciding states to materialize (§6.3): greedy MQO, Algorithm 1.

Shareable candidates are (sub-plan group, execution time) pairs; by
Theorem 7 (cost weights non-decreasing over time / reverse-lexical
priority), only the *earliest* valid execution time per group needs to
be considered, which this implementation applies.

``bestPlan(S)`` is evaluated as the actual cost of the deduplicated
extracted task graph under S, so a candidate is accepted exactly when
materializing it lowers the real plan cost.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from repro.core.dp import ExtractedPlan, PlanContext, Selector, extract


@dataclass
class MqoResult:
    plan: ExtractedPlan
    shared: dict[int, int]  # gid -> materialization time
    seconds: float
    iterations: int
    candidates_considered: int


def optimize_materialization(
    ctx: PlanContext,
    roots: list[tuple[int, int]],
    max_iters: int = 8,
    max_candidates: int = 48,
) -> MqoResult:
    t0 = time.perf_counter()
    shared: dict[int, int] = {}
    base = extract(Selector(ctx, shared), roots)
    best_plan, best_key = base, ctx.key(base.cost_vec)

    # Structural sharing potential across the whole explored space: how
    # many distinct memo expressions consume each group. Without this,
    # candidates drawn only from the current best plan can never pull
    # the search out of a batch-shaped local minimum — the DP costs
    # shared sub-plans once per consumer, so multi-consumer incremental
    # plans look too expensive until their states are offered as
    # materialization candidates (the paper's §6.3 considers all
    # shareable nodes, not just the incumbent plan's).
    memo_refs: dict[int, int] = {}
    for g in ctx.memo.all_groups():
        for e in g.exprs:
            for c in set(e.children):
                cg = ctx.memo.find(c)
                memo_refs[cg] = memo_refs.get(cg, 0) + 1

    def candidates(plan: ExtractedPlan) -> list[tuple[int, int]]:
        consumers: dict[int, int] = {}
        cross: set[int] = set()
        for t in plan.tasks:
            for c, tc in t.inputs:
                consumers[c] = consumers.get(c, 0) + 1
                if tc < t.time:
                    cross.add(c)
        out = set()
        for t in plan.tasks:
            if t.expr.kind in ("scan_snap", "scan_delta", "empty"):
                continue
            g = ctx.memo.find(t.gid)
            if g in shared:
                continue
            if consumers.get(g, 0) >= 2 or g in cross:
                out.add((g, ctx.avail.get(g, ctx.k + 1)))
        # plus space-wide multi-consumer groups (Theorem-7 times)
        for g, refs in memo_refs.items():
            if refs >= 2 and g not in shared:
                av = ctx.avail.get(g, ctx.k + 1)
                if av <= ctx.k and not any(
                    e.kind in ("scan_snap", "scan_delta", "empty")
                    for e in ctx.memo.exprs_of(g)
                ):
                    out.add((g, av))
        ranked = sorted(out)
        ranked.sort(
            key=lambda gt: -(
                max(consumers.get(gt[0], 0), memo_refs.get(gt[0], 0))
                * max(1.0, ctx.card(gt[0]))
            )
        )
        return ranked[:max_candidates]

    iters = 0
    considered = 0
    while iters < max_iters:
        iters += 1
        cands = candidates(best_plan)
        best_cand, cand_plan, cand_key = None, None, best_key
        for g, tm in cands:
            if tm > ctx.k:
                continue
            considered += 1
            trial = dict(shared)
            trial[g] = tm
            try:
                p = extract(Selector(ctx, trial), roots)
            except AssertionError:
                continue  # cyclic extraction under this sharing: skip
            k = ctx.key(p.cost_vec)
            if k < cand_key:
                best_cand, cand_plan, cand_key = (g, tm), p, k
        if best_cand is None:
            break
        shared[best_cand[0]] = best_cand[1]
        best_plan, best_key = cand_plan, cand_key
    return MqoResult(
        best_plan, shared, time.perf_counter() - t0, iters, considered
    )

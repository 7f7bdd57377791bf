"""Tempura facade: define an IQP problem, explore, select, extract.

`Tempura.optimize` runs the full pipeline of the paper:

1. Plan-space exploration (PSE, §5) — saturate the memo with TVR
   rewrite rules for the configured incremental method(s).
2. Plan selection (§6.1/6.2) — temporal DP over (group, time) under
   ``c̃_w`` or ``c̃_v``.
3. State-materialization optimization (SMO, §6.3) — greedy MQO.

Scenario presets:

* ``ivm_problem`` — IVM-PD (§2.1): outputs at every time point, vector
  cost compared reverse-lexically (minimize the update-time cost first).
* ``pdw_problem`` — PDW-PD: output only at the last run, weighted cost
  with cheap early runs.

Dynamic re-optimization (§7) is supported by passing
``initial_states`` — groups already materialized by earlier runs, which
the DP then treats as load-only.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.core import logical as L
from repro.core import rules as R
from repro.core.cost import weighted_total
from repro.core.dp import ExtractedPlan, PlanContext, Selector, extract
from repro.core.explore import ExploreResult, explore
from repro.core.memo import snap
from repro.core.mqo import optimize_materialization
from repro.core.stats import StatsProvider
from repro.synth_data import TPCDS_SCHEMAS


@dataclass
class IQPProblem:
    """The paper's (T, D, Q, c̃) quadruple."""

    query: L.Plan
    stats: StatsProvider
    k: int
    output_times: tuple[int, ...]
    cost_mode: str  # 'weighted' | 'vector'
    weights: tuple[float, ...]
    schemas: dict[str, tuple[str, ...]] = field(
        default_factory=lambda: dict(TPCDS_SCHEMAS)
    )


def ivm_problem(query: L.Plan, stats: StatsProvider, k: int = 2) -> IQPProblem:
    return IQPProblem(
        query, stats, k, tuple(range(1, k + 1)), "vector", (1.0,) * k
    )


def pdw_problem(
    query: L.Plan, stats: StatsProvider, k: int = 2, w_early: float = 0.3
) -> IQPProblem:
    w = tuple([w_early] * (k - 1) + [1.0])
    return IQPProblem(query, stats, k, (k,), "weighted", w)


@dataclass
class PlanResult:
    plan: ExtractedPlan
    problem: IQPProblem
    explore_result: ExploreResult
    shared: dict[int, int]
    pse_seconds: float
    smo_seconds: float
    mqo_iterations: int

    @property
    def cost_vec(self) -> tuple[float, ...]:
        return self.plan.cost_vec

    @property
    def cost_weighted(self) -> float:
        return weighted_total(self.plan.cost_vec, self.problem.weights)

    @property
    def memo_stats(self) -> dict:
        return self.explore_result.memo_stats


class Tempura:
    def __init__(
        self,
        method: str | R.MethodConfig = "ALL",
        speedups=("TS", "PNA", "GE"),
        run_mqo: bool = True,
    ):
        self.cfg = R.METHODS[method] if isinstance(method, str) else method
        self.speedups = tuple(speedups)
        self.run_mqo = run_mqo

    def optimize(
        self, problem: IQPProblem, initial_states: dict[int, int] | None = None
    ) -> PlanResult:
        er = explore(
            problem.query, problem.k, problem.schemas, self.cfg, self.speedups
        )
        ctx = PlanContext(
            er.memo, problem.stats, problem.k, problem.cost_mode, problem.weights
        )
        roots = []
        for i in problem.output_times:
            g = er.memo.group_of(er.root_tid, snap(i))
            assert g is not None, f"no root snapshot at t{i}"
            roots.append((g, i))
        if self.run_mqo:
            mq = optimize_materialization(ctx, roots)
            shared = dict(initial_states or {})
            shared.update(mq.shared)
            if initial_states:
                plan = extract(Selector(ctx, shared), roots)
            else:
                plan = mq.plan
            smo_s, iters = mq.seconds, mq.iterations
        else:
            shared = dict(initial_states or {})
            plan = extract(Selector(ctx, shared), roots)
            smo_s, iters = 0.0, 0
        return PlanResult(plan, problem, er, shared, er.seconds, smo_s, iters)

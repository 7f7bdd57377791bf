"""Temporal DP and MQO: valid temporal assignments, Save/Load pricing,
extraction topology, greedy materialization (Algorithm 1 / Theorem 7)."""
import pytest

from repro.core import cost as C
from repro.core.dp import PlanContext, Selector, extract
from repro.core.explore import explore
from repro.core.memo import snap
from repro.core.mqo import optimize_materialization
from repro.core.rules import ALL, IM1
from repro.core.stats import StatsProvider
from repro.synth_data import TPCDS_SCHEMAS, tpcds_lite
from repro.workloads.arrival import ArrivalScenario
from repro.workloads.queries import q40, qex

SCH = dict(TPCDS_SCHEMAS)


@pytest.fixture(scope="module")
def stats():
    db = tpcds_lite(sf=0.005, seed=7)
    return StatsProvider(ArrivalScenario(None, db, k=2, first_fraction=0.5))


@pytest.fixture(scope="module")
def stats3():
    db = tpcds_lite(sf=0.005, seed=7)
    return StatsProvider(ArrivalScenario(None, db, k=3, first_fraction=0.4))


def _ctx(stats, q, k, mode="weighted", weights=None, cfg=ALL):
    er = explore(q, k, SCH, cfg)
    w = weights or tuple([0.3] * (k - 1) + [1.0])
    return er, PlanContext(er.memo, stats, k, mode, w)


def test_avail_of_scans(stats):
    er, ctx = _ctx(stats, qex(), 2)
    for t in er.memo.tvrs:
        if getattr(t.node, "table", None) == "ex_sales":
            assert ctx.avail[er.memo.group_of(t.tid, snap(1))] == 1
            assert ctx.avail[er.memo.group_of(t.tid, snap(2))] == 2


def test_best_infeasible_before_avail(stats):
    er, ctx = _ctx(stats, qex(), 2)
    root2 = er.memo.group_of(er.root_tid, snap(2))
    sel = Selector(ctx)
    vec, choice, _ = sel.best(root2, 1)
    assert vec is None  # snapshot at t2 cannot execute at t1


def test_best_returns_plan_at_final(stats):
    er, ctx = _ctx(stats, qex(), 2)
    root2 = er.memo.group_of(er.root_tid, snap(2))
    vec, choice, clean = Selector(ctx).best(root2, 2)
    assert vec is not None and choice is not None
    assert sum(vec) > 0


def test_extraction_children_before_parents(stats):
    er, ctx = _ctx(stats, qex(), 2)
    roots = [(er.memo.group_of(er.root_tid, snap(i)), i) for i in (1, 2)]
    plan = extract(Selector(ctx), roots)
    seen = set()
    for t in plan.tasks:
        for c in t.inputs:
            assert c in seen, f"input {c} used before produced"
        seen.add((t.gid, t.time))


def test_extraction_valid_temporal_assignment(stats):
    """Definition 5: every input's execution time <= consumer's."""
    er, ctx = _ctx(stats, q40(), 2)
    roots = [(er.memo.group_of(er.root_tid, snap(2)), 2)]
    plan = extract(Selector(ctx), roots)
    for t in plan.tasks:
        for _, tc in t.inputs:
            assert tc <= t.time


def test_extraction_dedups_shared_states(stats):
    er, ctx = _ctx(stats, qex(), 2)
    roots = [(er.memo.group_of(er.root_tid, snap(i)), i) for i in (1, 2)]
    plan = extract(Selector(ctx), roots)
    keys = [(t.gid, t.time) for t in plan.tasks]
    assert len(keys) == len(set(keys))


def test_saved_states_cross_boundaries(stats):
    er, ctx = _ctx(stats, qex(), 2)
    roots = [(er.memo.group_of(er.root_tid, snap(i)), i) for i in (1, 2)]
    plan = extract(Selector(ctx), roots)
    for g, tc in plan.saved_states:
        consumers = [
            t.time for t in plan.tasks for (c, ct) in t.inputs
            if c == g and ct == tc
        ]
        assert any(u > tc for u in consumers)


def test_cost_vector_entries_nonnegative(stats):
    er, ctx = _ctx(stats, qex(), 2)
    roots = [(er.memo.group_of(er.root_tid, snap(2)), 2)]
    plan = extract(Selector(ctx), roots)
    assert all(v >= 0 for v in plan.cost_vec)


def test_higher_early_weight_moves_work_later(stats):
    """§6.2 example: raising w1 makes early computation less attractive."""
    er1, ctx_cheap = _ctx(stats, qex(), 2, weights=(0.1, 1.0))
    _, ctx_dear = _ctx(stats, qex(), 2, weights=(0.9, 1.0))
    roots = [(er1.memo.group_of(er1.root_tid, snap(2)), 2)]
    p_cheap = extract(Selector(ctx_cheap), roots)
    p_dear = extract(Selector(ctx_dear), roots)
    assert p_cheap.cost_vec[0] >= p_dear.cost_vec[0]


def test_vector_mode_minimizes_last_entry_first(stats):
    er, ctxv = _ctx(stats, qex(), 2, mode="vector", weights=(1.0, 1.0))
    roots = [(er.memo.group_of(er.root_tid, snap(2)), 2)]
    pv = extract(Selector(ctxv), roots)
    # batch-at-t2 is always feasible; the vector optimum must not have a
    # larger t2 entry than batch
    batch_like = ctxv.key(pv.cost_vec)
    assert batch_like is not None


def test_mqo_terminates_and_never_worsens(stats):
    er, ctx = _ctx(stats, q40(), 2)
    roots = [(er.memo.group_of(er.root_tid, snap(i)), i) for i in (1, 2)]
    base = extract(Selector(ctx), roots)
    res = optimize_materialization(ctx, roots)
    assert ctx.key(res.plan.cost_vec) <= ctx.key(base.cost_vec)
    assert res.iterations >= 1


def test_mqo_candidates_at_earliest_time(stats):
    """Theorem 7: accepted materializations sit at the group's earliest
    valid execution time."""
    er, ctx = _ctx(stats, q40(), 2)
    roots = [(er.memo.group_of(er.root_tid, snap(i)), i) for i in (1, 2)]
    res = optimize_materialization(ctx, roots)
    for g, tm in res.shared.items():
        assert tm == ctx.avail[g]


def test_k3_plan_spans_three_times(stats3):
    er, ctx = _ctx(stats3, qex(), 3)
    roots = [(er.memo.group_of(er.root_tid, snap(3)), 3)]
    plan = extract(Selector(ctx), roots)
    assert set(t.time for t in plan.tasks) <= {1, 2, 3}
    assert all(v >= 0 for v in plan.cost_vec)


def test_im1_vs_all_weighted_order(stats):
    """The combined rule set can never lose to a single method under the
    same cost comparison (its plan space is a superset)."""
    w = (0.3, 1.0)
    er_a, ctx_a = _ctx(stats, qex(), 2, weights=w, cfg=ALL)
    er_1, ctx_1 = _ctx(stats, qex(), 2, weights=w, cfg=IM1)
    ra = [(er_a.memo.group_of(er_a.root_tid, snap(2)), 2)]
    r1 = [(er_1.memo.group_of(er_1.root_tid, snap(2)), 2)]
    pa = optimize_materialization(ctx_a, ra).plan
    p1 = optimize_materialization(ctx_1, r1).plan
    assert C.weighted_total(pa.cost_vec, w) <= C.weighted_total(p1.cost_vec, w) * 1.02

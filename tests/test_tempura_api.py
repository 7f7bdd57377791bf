"""Tempura facade: problem presets, optimize results, re-optimization."""
import pytest

from repro.core.rules import combo
from repro.core.stats import StatsProvider
from repro.core.tempura import Tempura, ivm_problem, pdw_problem
from repro.synth_data import tpcds_lite
from repro.workloads.arrival import ArrivalScenario
from repro.workloads.queries import qex, q40


@pytest.fixture(scope="module")
def stats():
    db = tpcds_lite(sf=0.005, seed=7)
    return StatsProvider(ArrivalScenario(None, db, k=2, first_fraction=0.5))


def test_ivm_problem_outputs_every_time(stats):
    p = ivm_problem(qex(), stats)
    assert p.output_times == (1, 2) and p.cost_mode == "vector"


def test_pdw_problem_outputs_final_only(stats):
    p = pdw_problem(qex(), stats, w_early=0.25)
    assert p.output_times == (2,) and p.weights == (0.25, 1.0)


def test_optimize_returns_full_result(stats):
    res = Tempura("ALL").optimize(ivm_problem(qex(), stats))
    assert len(res.plan.tasks) > 0
    assert len(res.cost_vec) == 2
    assert res.pse_seconds > 0 and res.smo_seconds >= 0
    assert res.memo_stats["groups"] > 0


def test_ivm_roots_at_both_times(stats):
    res = Tempura("ALL").optimize(ivm_problem(qex(), stats))
    assert sorted(t for _, t in res.plan.roots) == [1, 2]


def test_pdw_root_final_only(stats):
    res = Tempura("ALL").optimize(pdw_problem(qex(), stats))
    assert [t for _, t in res.plan.roots] == [2]


def test_cost_weighted_property(stats):
    res = Tempura("IM1").optimize(pdw_problem(qex(), stats, w_early=0.3))
    v = res.cost_vec
    assert res.cost_weighted == pytest.approx(0.3 * v[0] + v[1])


def test_method_string_and_config(stats):
    r1 = Tempura("IM1").optimize(pdw_problem(qex(), stats))
    r2 = Tempura(combo(("IM1",))).optimize(pdw_problem(qex(), stats))
    assert r1.cost_weighted == pytest.approx(r2.cost_weighted)


def test_all_never_worse_than_single_methods(stats):
    """ALL's plan space is a superset of each method's; the exact DP can
    never lose, but the greedy state-materialization step (Algorithm 1)
    may land in a slightly different local optimum with a larger
    candidate set — allow it 2% greedy slack."""
    for q in (qex, q40):
        prob = pdw_problem(q(), stats)
        best_all = Tempura("ALL").optimize(prob).cost_weighted
        for m in ("IM1", "IM2", "OJV", "HOV"):
            assert best_all <= Tempura(m).optimize(prob).cost_weighted * 1.02


def test_no_mqo_option(stats):
    res = Tempura("ALL", run_mqo=False).optimize(pdw_problem(qex(), stats))
    assert res.smo_seconds == 0.0 and res.mqo_iterations == 0


def test_reoptimization_with_initial_states(stats):
    """§7 dynamic re-optimization: previously materialized states are
    load-only and can only help."""
    prob = pdw_problem(q40(), stats)
    base = Tempura("ALL").optimize(prob)
    # pretend every state the base plan saved at t1 is already on disk
    init = {g: tc for (g, tc) in base.plan.saved_states if tc == 1}
    if not init:
        pytest.skip("plan saved no early states at this scale")
    re = Tempura("ALL").optimize(prob, initial_states=init)
    assert re.cost_vec[1] <= base.cost_vec[1] + 1e-6


def test_speedups_do_not_change_plan_cost(stats):
    prob = ivm_problem(qex(), stats)
    fast = Tempura("ALL", speedups=("TS", "PNA", "GE")).optimize(prob)
    slow = Tempura("ALL", speedups=()).optimize(prob)
    # Baseline explores a superset, so its optimum is at least as good;
    # the speed-ups must not lose more than the pruned diff/merge paths
    # are worth — in practice identical here.
    assert slow.cost_vec[-1] <= fast.cost_vec[-1] + 1e-6

"""Executor: metrics accounting, state handling, output naming."""
import pytest

from repro.core.stats import StatsProvider
from repro.core.tempura import Tempura, ivm_problem, pdw_problem
from repro.incr.executor import release, result_rows, run_plan
from repro.workloads.arrival import make_scenario
from repro.workloads.queries import qex


@pytest.fixture(scope="module")
def setup(spark):
    sc = make_scenario(spark, "delta-big", k=2, sf=0.004)
    return sc, StatsProvider(sc)


def test_report_shapes(spark, setup):
    sc, stats = setup
    res = Tempura("IM1").optimize(ivm_problem(qex(), stats))
    rep = run_plan(spark, sc, res.plan, 2)
    assert len(rep.work_vec) == len(rep.wall_vec) == len(rep.rows_vec) == 2
    assert all(w >= 0 for w in rep.work_vec)
    assert all(w >= 0 for w in rep.wall_vec)
    release(rep)


def test_outputs_keyed_by_time(spark, setup):
    sc, stats = setup
    res = Tempura("IM1").optimize(ivm_problem(qex(), stats))
    rep = run_plan(spark, sc, res.plan, 2)
    assert sorted(rep.outputs) == [1, 2]
    release(rep)


def test_weighted_report(spark, setup):
    sc, stats = setup
    res = Tempura("IM1").optimize(pdw_problem(qex(), stats))
    rep = run_plan(spark, sc, res.plan, 2)
    w = rep.weighted((0.3, 1.0))
    assert w == pytest.approx(0.3 * rep.work_vec[0] + rep.work_vec[1])
    assert rep.total_work == pytest.approx(sum(rep.work_vec))
    release(rep)


def test_state_rows_counted_for_saved_states(spark, setup):
    sc, stats = setup
    res = Tempura("ALL").optimize(ivm_problem(qex(), stats))
    rep = run_plan(spark, sc, res.plan, 2)
    if res.plan.saved_states:
        assert rep.state_rows > 0
    assert rep.state_count == len(res.plan.saved_states)
    release(rep)


def test_result_rows_strips_mult(spark, setup):
    sc, stats = setup
    res = Tempura("IM1").optimize(pdw_problem(qex(), stats))
    rep = run_plan(spark, sc, res.plan, 2)
    rows = result_rows(rep.outputs[2])
    assert "__mult__" not in rows.columns
    assert rows.count() > 0
    release(rep)


def test_unknown_kind_raises(spark, setup):
    from repro.core.dp import ExtractedPlan, Task
    from repro.core.memo import MExpr

    sc, _ = setup
    bad = ExtractedPlan(
        [Task(0, 1, MExpr("nonsense", (), ()), ())], [(0, 1)], (0.0, 0.0), set()
    )
    with pytest.raises(ValueError):
        run_plan(spark, sc, bad, 2)

"""End-to-end correctness matrix: optimize -> execute on Spark ->
DuckDB oracle, across queries × arrival patterns × incremental methods
and both IQP scenarios. Every output snapshot (at every required time
point) must equal the batch query over the data visible at that time."""
import pytest

from repro.core.stats import StatsProvider
from repro.core.tempura import Tempura, ivm_problem, pdw_problem
from repro.incr.executor import release, run_plan
from repro.verify import verify_output
from repro.workloads.arrival import make_scenario
from repro.workloads.queries import EFFECTIVENESS

SF = 0.004
_scenarios = {}


def _scenario(spark, pattern, k=2):
    key = (pattern, k)
    if key not in _scenarios:
        _scenarios[key] = make_scenario(spark, pattern, k=k, sf=SF)
    return _scenarios[key]


def _check(spark, pattern, qname, method, mode, k=2):
    sc = _scenario(spark, pattern, k)
    stats = StatsProvider(sc)
    q = EFFECTIVENESS[qname]()
    prob = (
        ivm_problem(q, stats, k) if mode == "ivm" else pdw_problem(q, stats, k)
    )
    res = Tempura(method).optimize(prob)
    rep = run_plan(spark, sc, res.plan, k)
    try:
        for t, df in rep.outputs.items():
            verify_output(spark, sc, q, df, t)
    finally:
        release(rep)
    return res, rep


@pytest.mark.parametrize("pattern", ["delta-big", "delta-small", "delta-R", "delta-RS"])
@pytest.mark.parametrize("method", ["IM1", "IM2", "OJV", "HOV", "ALL"])
def test_qex_ivm(spark, pattern, method):
    _check(spark, pattern, "qex", method, "ivm")


@pytest.mark.parametrize("pattern", ["delta-big", "delta-RS"])
@pytest.mark.parametrize("method", ["IM1", "IM2", "OJV", "HOV", "ALL"])
def test_q40_ivm(spark, pattern, method):
    _check(spark, pattern, "q40", method, "ivm")


@pytest.mark.parametrize("qname", ["q10", "q35"])
@pytest.mark.parametrize("method", ["IM1", "ALL"])
def test_nested_agg_queries_ivm(spark, qname, method):
    _check(spark, "delta-big", qname, method, "ivm")


@pytest.mark.parametrize("method", ["IM1", "IM2", "ALL"])
def test_q80_pdw(spark, method):
    _check(spark, "delta-big", "q80", method, "pdw")


@pytest.mark.parametrize("pattern", ["delta-big", "delta-small", "delta-R", "delta-RS"])
def test_qex_pdw_all_patterns(spark, pattern):
    _check(spark, pattern, "qex", "ALL", "pdw")


@pytest.mark.parametrize("method", ["IM1", "ALL"])
def test_qex_three_runs(spark, method):
    _check(spark, "delta-big", "qex", method, "ivm", k=3)


def test_q10_retractions(spark):
    _check(spark, "delta-RS", "q10", "ALL", "ivm")


def test_estimated_work_tracks_real_work(spark):
    """The planner's rows-work estimate and the executor's measured work
    use the same model; on accurate stats they should be within 2x."""
    res, rep = _check(spark, "delta-big", "qex", "ALL", "ivm")
    est, real = sum(res.cost_vec), sum(rep.work_vec)
    assert 0.5 < est / real < 2.0


def test_state_metrics_reported(spark):
    res, rep = _check(spark, "delta-big", "q40", "ALL", "ivm")
    assert rep.state_rows >= 0 and rep.state_count == len(res.plan.saved_states)
    assert len(rep.work_vec) == 2 and len(rep.wall_vec) == 2

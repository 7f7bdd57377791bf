"""Experiment harnesses: each E# produces well-formed rows with the
shapes the paper's claims require (smoke scale)."""
import pytest

from repro.core.stats import StatsProvider
from repro.experiments import perf
from repro.experiments.case_study import run_case_study
from repro.experiments.effectiveness import (
    Bench, METHODS, e1_ivm_queries, e2_ivm_patterns, e3_pdw, e5_state_sizes,
    e6_sensitivity,
)
from repro.experiments.report import fmt_table
from repro.workloads.arrival import make_scenario
from repro.workloads.queries import perf_query


@pytest.fixture(scope="module")
def bench():
    return Bench(None, sf=0.005, k=2)


@pytest.fixture(scope="module")
def stats3():
    return StatsProvider(make_scenario(None, "delta-big", k=3, sf=0.005))


def test_e1_rows_complete(bench):
    rows = e1_ivm_queries(bench, queries=("qex", "q40"))
    assert len(rows) == 2 * len(METHODS)
    assert all("est_rel_IM1" in r for r in rows)
    im1 = [r for r in rows if r["method"] == "IM1"]
    assert all(r["est_rel_IM1"] == 1.0 for r in im1)


def test_e1_all_never_worse(bench):
    rows = e1_ivm_queries(bench, queries=("qex", "q40"))
    for r in rows:
        if r["method"] == "ALL":
            assert r["est_rel_IM1"] <= 1.02  # greedy-MQO slack


def test_e2_patterns_grid(bench):
    rows = e2_ivm_patterns(bench, qname="qex")
    assert len(rows) == 4 * len(METHODS)
    pats = {r["pattern"] for r in rows}
    assert len(pats) == 4


def test_e3_pdw_includes_weight_variants(bench):
    rows = e3_pdw(bench, queries=("qex",), qname="qex")
    w1s = {r["w1"] for r in rows}
    assert w1s == {0.3, 0.7}
    for r in rows:
        if r["method"] == "ALL":
            assert r["est_rel_IM1"] <= 1.02  # greedy-MQO slack


def test_e5_state_sizes(spark):
    b = Bench(spark, sf=0.004, k=2)
    rows = e5_state_sizes(b, queries=("qex",), qname="qex")
    assert all("state_rows" in r and r["state_rows"] >= 0 for r in rows)
    b.release()


def test_e6_sensitivity(spark):
    b = Bench(spark, sf=0.004, k=2)
    rows = e6_sensitivity(b, qname="qex")
    stats_kinds = {r["stats"] for r in rows}
    assert "accurate" in stats_kinds
    assert any(s.startswith("assumed") for s in stats_kinds)
    accurate_all = [
        r["real"] for r in rows
        if r["method"] == "ALL" and r["stats"] == "accurate"
    ]
    assert all(v > 0 for v in accurate_all)
    b.release()


def test_e8_overall(stats3):
    rows = perf.e8_overall(stats3)
    assert len(rows) == 10
    for r in rows:
        assert r["iqp_s"] > 0 and r["trad_s"] > 0


def test_e9_complexity_matches_table2_joins(stats3):
    rows = perf.e9_complexity(stats3)
    for r in rows:
        assert r["joins"] == r["paper_joins"]
        assert r["pse_s"] >= 0 and r["smo_s"] >= 0


def test_e10_iqp_size_smo_grows(stats3):
    by_k = {
        k: StatsProvider(make_scenario(None, "delta-big", k=k, sf=0.005))
        for k in (3, 5)
    }
    rows = perf.e10_iqp_size(by_k, qnames=("Q22",))
    smo = {r["k"]: r["smo_s"] for r in rows}
    assert set(smo) == {3, 5}


def test_e11_methods_grow_space(stats3):
    rows = perf.e11_methods(stats3, qnames=("Q67",))
    by = {r["methods"]: r for r in rows}
    assert by["IM1"]["exprs"] <= by["IM1+IM2+HOV+OJV"]["exprs"]


def test_e12_speedups_baseline_explores_more(stats3):
    rows = perf.e12_speedups(stats3, k=3, qnames=("Q22",))
    by = {r["config"]: r for r in rows}
    assert by["Baseline"]["exprs"] >= by["Tempura"]["exprs"]
    assert by["Baseline"]["attempts"] >= by["Tempura"]["attempts"]


def test_case_study_summary(spark):
    qs = [("t-00", perf_query(2, 0)), ("t-01", perf_query(3, 1))]
    rows, summary = run_case_study(spark, "W-A", sf=0.004, queries=qs)
    assert len(rows) == 2
    assert 0 <= summary["pct_improved"] <= 100
    assert summary["tdw_total"] > 0
    for r in rows:
        assert r["ratio"] > 0


def test_fmt_table():
    s = fmt_table([{"a": 1, "b": 2.5}], "T")
    assert "== T ==" in s and "a" in s
    assert fmt_table([], "E").endswith("(no rows)")

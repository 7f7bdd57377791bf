"""E11 — Fig. 8(e)(f): PSE/SMO time as incremental methods are added
cumulatively (IM-1 → +IM-2 → +HOV → +OJV)."""
from benchmarks.config import SF_PLAN

from repro.core.stats import StatsProvider
from repro.experiments import perf
from repro.experiments.report import fmt_table
from repro.workloads.arrival import make_scenario


def test_e11_num_methods(benchmark):
    stats = StatsProvider(make_scenario(None, "delta-big", k=3, sf=SF_PLAN))
    rows = benchmark.pedantic(perf.e11_methods, args=(stats,), rounds=1, iterations=1)
    print()
    print(fmt_table(rows, "E11 (Fig 8e/f): phase times vs #methods"))
    for q in {r["query"] for r in rows}:
        sub = {r["methods"]: r for r in rows if r["query"] == q}
        assert sub["IM1"]["exprs"] <= sub["IM1+IM2+HOV+OJV"]["exprs"]

"""E8 — Fig. 8(a) / Fig. 9: end-to-end IQP planning time vs traditional
planning across the perf suite."""
from benchmarks.config import SF_PLAN

from repro.core.stats import StatsProvider
from repro.experiments import perf
from repro.experiments.report import fmt_table
from repro.workloads.arrival import make_scenario


def test_e8_overall_planning(benchmark):
    stats = StatsProvider(make_scenario(None, "delta-big", k=3, sf=SF_PLAN))
    rows = benchmark.pedantic(perf.e8_overall, args=(stats,), rounds=1, iterations=1)
    print()
    print(fmt_table(rows, "E8 (Fig 8a): IQP vs traditional planning time (s)"))
    assert all(r["iqp_s"] < 30.0 for r in rows)  # paper: < 14 s per query

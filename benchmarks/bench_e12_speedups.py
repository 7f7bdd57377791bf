"""E12 — Fig. 8(g): effectiveness of the exploration speed-ups
(translational symmetry, pruning non-promising alternatives, guided
exploration) against the unoptimized Baseline."""
from benchmarks.config import SF_PLAN

from repro.core.stats import StatsProvider
from repro.experiments import perf
from repro.experiments.report import fmt_table
from repro.workloads.arrival import make_scenario


def test_e12_speedups(benchmark):
    stats = StatsProvider(make_scenario(None, "delta-big", k=4, sf=SF_PLAN))
    rows = benchmark.pedantic(perf.e12_speedups, args=(stats,), rounds=1, iterations=1)
    print()
    print(fmt_table(rows, "E12 (Fig 8g): exploration time per speed-up config"))
    for q in {r["query"] for r in rows}:
        sub = {r["config"]: r for r in rows if r["query"] == q}
        assert sub["Tempura"]["attempts"] <= sub["Baseline"]["attempts"]

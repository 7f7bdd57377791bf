"""E9 — Fig. 8(b) + Table 2: PSE/SMO time vs query complexity, plus our
query-structure stats against the paper's Table 2."""
from benchmarks.config import SF_PLAN

from repro.core.stats import StatsProvider
from repro.experiments import perf
from repro.experiments.report import fmt_table
from repro.workloads.arrival import make_scenario


def test_e9_complexity(benchmark):
    stats = StatsProvider(make_scenario(None, "delta-big", k=3, sf=SF_PLAN))
    rows = benchmark.pedantic(
        perf.e9_complexity, args=(stats,), rounds=1, iterations=1
    )
    print()
    print(fmt_table(rows, "E9 (Fig 8b + Table 2): phase times vs complexity"))
    simple = next(r for r in rows if r["query"] == "Q22")
    complex_ = next(r for r in rows if r["query"] == "Q33")
    assert complex_["pse_s"] >= simple["pse_s"]

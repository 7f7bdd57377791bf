"""E10 — Fig. 8(c)(d): PSE/SMO time as the number of incremental runs
|T| grows from 3 to 9."""
from benchmarks.config import SF_PLAN

from repro.core.stats import StatsProvider
from repro.experiments import perf
from repro.experiments.report import fmt_table
from repro.workloads.arrival import make_scenario


def test_e10_iqp_size(benchmark):
    by_k = {
        k: StatsProvider(make_scenario(None, "delta-big", k=k, sf=SF_PLAN))
        for k in (3, 5, 7, 9)
    }
    rows = benchmark.pedantic(perf.e10_iqp_size, args=(by_k,), rounds=1, iterations=1)
    print()
    print(fmt_table(rows, "E10 (Fig 8c/d): phase times vs |T|"))
    # SMO grows (superlinearly) with |T|; PSE stays comparatively flat
    for q in {r["query"] for r in rows}:
        sub = sorted((r for r in rows if r["query"] == q), key=lambda r: r["k"])
        assert sub[-1]["smo_s"] >= sub[0]["smo_s"]

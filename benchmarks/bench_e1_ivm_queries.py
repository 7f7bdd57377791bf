"""E1 — Fig. 6(a): IVM-PD optimal estimated costs per query × method
(delta-big), relative to IM-1."""
from benchmarks.config import SF_PLAN

from repro.experiments.effectiveness import Bench, e1_ivm_queries
from repro.experiments.report import fmt_table


def test_e1_ivm_estimated(benchmark):
    bench = Bench(None, sf=SF_PLAN, k=2)
    rows = benchmark.pedantic(e1_ivm_queries, args=(bench,), rounds=1, iterations=1)
    print()
    print(fmt_table(
        [{k: r[k] for k in ("query", "method", "est", "est_rel_IM1")} for r in rows],
        "E1 (Fig 6a): IVM-PD estimated cost, delta-big (relative to IM-1)",
    ))
    for r in rows:
        if r["method"] == "ALL":
            assert r["est_rel_IM1"] <= 1.02  # ≤ each method, modulo greedy-MQO slack

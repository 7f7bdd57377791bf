"""E2 — Fig. 6(b): IVM-PD estimated costs for q10 across data-arrival
patterns × methods, relative to IM-1."""
from benchmarks.config import SF_PLAN

from repro.experiments.effectiveness import Bench, e2_ivm_patterns
from repro.experiments.report import fmt_table


def test_e2_ivm_patterns(benchmark):
    bench = Bench(None, sf=SF_PLAN, k=2)
    rows = benchmark.pedantic(
        e2_ivm_patterns, args=(bench,), kwargs={"qname": "q10"},
        rounds=1, iterations=1,
    )
    print()
    print(fmt_table(
        [{k: r[k] for k in ("pattern", "method", "est", "est_rel_IM1")} for r in rows],
        "E2 (Fig 6b): IVM-PD estimated cost, q10 across arrival patterns",
    ))
    for r in rows:
        if r["method"] == "ALL":
            assert r["est_rel_IM1"] <= 1.02  # greedy-MQO slack

"""E3 — Fig. 6(c)(d): PDW-PD estimated costs per query (w1=0.3) and for
q10 across patterns × weights, relative to IM-1."""
from benchmarks.config import SF_PLAN

from repro.experiments.effectiveness import Bench, e3_pdw
from repro.experiments.report import fmt_table


def test_e3_pdw_estimated(benchmark):
    bench = Bench(None, sf=SF_PLAN, k=2)
    rows = benchmark.pedantic(e3_pdw, args=(bench,), rounds=1, iterations=1)
    print()
    print(fmt_table(
        [
            {k: r[k] for k in ("query", "pattern", "w1", "method", "est", "est_rel_IM1")}
            for r in rows
        ],
        "E3 (Fig 6c/d): PDW-PD estimated cost (relative to IM-1)",
    ))
    for r in rows:
        if r["method"] == "ALL":
            assert r["est_rel_IM1"] <= 1.02  # greedy-MQO slack

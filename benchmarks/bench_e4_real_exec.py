"""E4 — Fig. 7(a)–(d): real execution cost (measured rows-work on
Spark) of every method's chosen plan, IVM-PD and PDW-PD."""
from benchmarks.config import SF_EXEC

from repro.experiments.effectiveness import Bench, METHODS, cell
from repro.experiments.report import fmt_table

# q80 is covered by the e2e test matrix; the executed bench grid keeps
# three structurally distinct queries to bound single-machine wall time
QUERIES = ("qex", "q40", "q10")


def _run(spark):
    bench = Bench(spark, sf=SF_EXEC, k=2)
    rows = []
    for q in QUERIES:
        for m in METHODS:
            r = cell(bench, q, "delta-big", m, "ivm", execute=True)
            r["scenario"] = "ivm"
            rows.append(r)
    for q in QUERIES:
        for m in METHODS:
            r = cell(bench, q, "delta-big", m, "pdw", execute=True)
            r["scenario"] = "pdw"
            rows.append(r)
    # pattern sweep for q10 (Fig 7(b))
    for p in ("delta-small", "delta-RS"):
        for m in METHODS:
            r = cell(bench, "q10", p, m, "ivm", execute=True)
            r["scenario"] = "ivm"
            rows.append(r)
    bench.release()
    return rows


def test_e4_real_costs(benchmark, spark):
    rows = benchmark.pedantic(_run, args=(spark,), rounds=1, iterations=1)
    base = {}
    for r in rows:
        if r["method"] == "IM1":
            base[(r["scenario"], r["query"], r["pattern"])] = r["real"]
    for r in rows:
        b = base.get((r["scenario"], r["query"], r["pattern"]))
        r["real_rel_IM1"] = round(r["real"] / b, 3) if b else None
    print()
    print(fmt_table(
        [
            {k: r[k] for k in
             ("scenario", "query", "pattern", "method", "est", "real", "real_rel_IM1")}
            for r in rows
        ],
        "E4 (Fig 7a-d): real executed rows-work (relative to IM-1)",
    ))
    for r in rows:
        assert r["real"] > 0

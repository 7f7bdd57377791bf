"""E7 — §8.3 / Fig. 6(e)(f), 7(h)(i): progressive vs traditional data
warehouse on the W-A and W-B workloads (executed on Spark)."""
from benchmarks.config import SF_EXEC

from repro.experiments.case_study import run_case_study
from repro.experiments.report import fmt_table


def _run(spark):
    out = {}
    for name in ("W-A", "W-B"):
        out[name] = run_case_study(spark, name, sf=SF_EXEC)
    return out


def test_e7_case_study(benchmark, spark):
    out = benchmark.pedantic(_run, args=(spark,), rounds=1, iterations=1)
    print()
    for name, (rows, summary) in out.items():
        print(fmt_table(rows, f"E7: {name} per-query PDW vs TDW (Fig 7i)"))
        print(fmt_table([summary], f"E7: {name} summary (Fig 6e/f, 7h)"))
        # the paper's headline shapes: most queries improve, and the
        # 24:00 (peak-hour) cost drops for a clear majority
        assert summary["pct_improved"] >= 50.0
        assert summary["pct_2400_reduced"] >= 50.0
        assert summary["total_reduction_pct"] > 0

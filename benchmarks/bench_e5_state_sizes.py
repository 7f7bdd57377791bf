"""E5 — Fig. 7(e)(f): materialized-state sizes of each method's IVM
plan (rows of states crossing a run boundary)."""
from benchmarks.config import SF_EXEC

from repro.experiments.effectiveness import Bench, e5_state_sizes
from repro.experiments.report import fmt_table


def test_e5_state_sizes(benchmark, spark):
    bench = Bench(spark, sf=SF_EXEC, k=2)
    rows = benchmark.pedantic(
        e5_state_sizes, args=(bench,),
        kwargs={"queries": ("qex", "q40")},
        rounds=1, iterations=1,
    )
    bench.release()
    print()
    print(fmt_table(rows, "E5 (Fig 7e/f): materialized state rows per method"))
    assert any(r["state_rows"] > 0 for r in rows)

"""E0 — §2.2 worked example: IM-1 vs IM-2 tuple costs and the
retraction crossover (paper: 11.8 vs 12.2, flipping to 13.8 vs 12.2)."""
from repro.experiments import running_example as ex
from repro.experiments.report import fmt_table


def test_e0_running_example(benchmark, spark):
    rows = benchmark.pedantic(ex.run, args=(spark,), rounds=1, iterations=1)
    print()
    print(fmt_table(rows, "E0: running example (weights 0.2 / 1.0)"))
    pins = ex.check_fig1_snapshot(spark)
    print(f"Fig.1 pins: gross(c1)@t1={pins['t1_c1']} (paper 280), "
          f"gross(c1)@t2={pins['t2_c1']} (paper 265)")
    by = {r["retractions"]: r for r in rows}
    assert by[0]["winner"] == "IM-1" and by[2]["winner"] == "IM-2"

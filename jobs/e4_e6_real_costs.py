"""E4–E6 — Fig. 7(a)–(g): executed plan costs, state sizes, and
sensitivity to inaccurate estimates (runs on Spark)."""
from common import get_spark

from repro.experiments.effectiveness import (
    Bench, METHODS, cell, e5_state_sizes, e6_sensitivity,
)
from repro.experiments.report import fmt_table


def main():
    spark = get_spark()
    bench = Bench(spark, sf=0.05, k=2)
    rows = [
        cell(bench, q, "delta-big", m, "ivm", execute=True)
        for q in ("qex", "q40", "q10", "q80")
        for m in METHODS
    ]
    print(fmt_table(
        [{k: r[k] for k in ("query", "method", "est", "real", "state_rows")}
         for r in rows],
        "E4 (Fig 7a): real executed cost, IVM-PD delta-big",
    ))
    print(fmt_table(e5_state_sizes(bench, queries=("qex", "q40", "q10")),
                    "E5 (Fig 7e/f)"))
    print(fmt_table(e6_sensitivity(bench), "E6 (Fig 7g)"))
    bench.release()
    spark.stop()


if __name__ == "__main__":
    main()

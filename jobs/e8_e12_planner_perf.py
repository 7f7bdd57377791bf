"""E8–E12 — Fig. 8/9: planner-performance experiments (no Spark)."""
import common  # noqa: F401

from repro.core.stats import StatsProvider
from repro.experiments import perf
from repro.experiments.report import fmt_table
from repro.workloads.arrival import make_scenario


def main():
    mk = lambda k: StatsProvider(make_scenario(None, "delta-big", k=k, sf=0.1))
    s3 = mk(3)
    print(fmt_table(perf.e8_overall(s3), "E8 (Fig 8a)"))
    print(fmt_table(perf.e9_complexity(s3), "E9 (Fig 8b + Table 2)"))
    print(fmt_table(perf.e10_iqp_size({k: mk(k) for k in (3, 5, 7, 9)}),
                    "E10 (Fig 8c/d)"))
    print(fmt_table(perf.e11_methods(s3), "E11 (Fig 8e/f)"))
    print(fmt_table(perf.e12_speedups(mk(4)), "E12 (Fig 8g)"))


if __name__ == "__main__":
    main()

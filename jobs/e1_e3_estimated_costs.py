"""E1–E3 — Fig. 6(a)–(d): estimated optimal costs per method (planner
only; no Spark execution needed)."""
import common  # noqa: F401  (sys.path bootstrap)

from repro.experiments.effectiveness import (
    Bench, e1_ivm_queries, e2_ivm_patterns, e3_pdw,
)
from repro.experiments.report import fmt_table


def main():
    bench = Bench(None, sf=0.1, k=2)
    print(fmt_table(e1_ivm_queries(bench), "E1 (Fig 6a)"))
    print(fmt_table(e2_ivm_patterns(bench), "E2 (Fig 6b)"))
    print(fmt_table(e3_pdw(bench), "E3 (Fig 6c/d)"))


if __name__ == "__main__":
    main()

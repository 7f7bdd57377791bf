"""E7 — §8.3 case study: PDW vs TDW on workloads W-A / W-B."""
from common import get_spark

from repro.experiments.case_study import run_case_study
from repro.experiments.report import fmt_table


def main():
    spark = get_spark()
    for name in ("W-A", "W-B"):
        rows, summary = run_case_study(spark, name, sf=0.05)
        print(fmt_table(rows, f"E7: {name} per query"))
        print(fmt_table([summary], f"E7: {name} summary"))
    spark.stop()


if __name__ == "__main__":
    main()

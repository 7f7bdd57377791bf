"""E0 — §2.2 worked example (IM-1 vs IM-2 cost crossover)."""
from common import get_spark

from repro.experiments import running_example as ex
from repro.experiments.report import fmt_table


def main():
    spark = get_spark()
    print(fmt_table(ex.run(spark), "E0: running example"))
    print(ex.check_fig1_snapshot(spark))
    spark.stop()


if __name__ == "__main__":
    main()

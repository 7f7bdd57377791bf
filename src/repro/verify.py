"""Plan-output verification against the DuckDB oracle.

The incremental plan's root snapshot at time ``t_i`` must equal the
batch query over the data visible at ``t_i`` — checked by expanding the
multiplicity bag to plain rows and diffing against DuckDB (see
:mod:`repro.oracle`). At the final time the visible data is the full
generator database, so this catches any wrong delta rule, merge
operator, or inter-TVR decomposition end to end.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro.core.logical import Plan, base_tables, to_sql
from repro.incr.executor import result_rows
from repro.incr.mult import MULT
from repro.oracle import assert_equivalent
from repro.synth_data import TPCDS_SCHEMAS


def verify_output(
    spark: SparkSession, scenario, query: Plan, output: DataFrame, at_time: int
) -> None:
    sql = to_sql(query, TPCDS_SCHEMAS)
    tables = {
        t: scenario.snapshot_pd(t, at_time).drop(columns=[MULT])
        for t in base_tables(query)
    }
    assert_equivalent(result_rows(output), sql, **tables)

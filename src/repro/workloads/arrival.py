"""Data-arrival scenarios (the paper's D-vector).

An :class:`ArrivalScenario` slices the TPC-DS-lite database along a
timeline ``t_1..t_k``: fact-table rows get an arrival time (per-table
fractions), dimension tables are fully available at ``t_1``.
Retraction patterns (delta-R / delta-RS) inject *extra* rows that arrive
early and are deleted (multiplicity ``-1``) in the last delta, so the
final snapshot always equals the generator's database — which is what
the DuckDB oracle sees.

Spark snapshots/deltas carry the ``__mult__`` column and are cached per
(table, instant). Exact per-instant row counts double as the planner's
"accurate" statistics; the sensitivity experiment feeds the planner the
counts of a *different* scenario instead.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

from repro.incr.mult import MULT
from repro.synth_data import FACT_TABLES, TPCDS_SCHEMAS, tpcds_lite

# Unique-key column per fact table (retraction rows need fresh keys so a
# temporary row never collides with a real one).
_UNIQUE_KEY = {
    "store_sales": "ss_ticket",
    "catalog_sales": "cs_order",
    "web_sales": "ws_order",
    "ex_sales": "o_id",
}

_SALES_TABLES = ("store_sales", "catalog_sales", "web_sales", "ex_sales")
_RETURNS_TABLES = ("store_returns", "catalog_returns", "ex_returns")

#: pattern name -> (fraction of data in run 1 for k=2, tables with retractions)
PATTERNS = {
    "delta-big": (0.5, ()),
    "delta-small": (0.8, ()),
    "delta-R": (2 / 3, _SALES_TABLES),
    "delta-RS": (2 / 3, _SALES_TABLES + _RETURNS_TABLES),
}

_RETRACT_RATE = 0.10


def _spark_schema(pdf: pd.DataFrame) -> T.StructType:
    fields = []
    for c in pdf.columns:
        dt = pdf[c].dtype
        if np.issubdtype(dt, np.integer):
            t = T.LongType()
        elif np.issubdtype(dt, np.floating):
            t = T.DoubleType()
        else:
            t = T.StringType()
        fields.append(T.StructField(c, t))
    return T.StructType(fields)


class ArrivalScenario:
    """Timeline-sliced database with snapshot/delta access (pandas & Spark)."""

    def __init__(
        self,
        spark: SparkSession,
        db: dict[str, pd.DataFrame],
        *,
        k: int = 2,
        first_fraction: float = 0.5,
        retract_tables: tuple[str, ...] = (),
        retract_rate: float = _RETRACT_RATE,
        seed: int = 11,
        name: str = "scenario",
    ):
        assert k >= 2
        self.spark, self.db, self.k, self.name = spark, db, k, name
        self.timeline = list(range(1, k + 1))
        g = np.random.default_rng(seed)
        # arrival time per row; per-table (pandas of rows, arrival array,
        # retract-at array with 0 = never).
        self._parts: dict[str, tuple[pd.DataFrame, np.ndarray, np.ndarray]] = {}
        for t in TPCDS_SCHEMAS:
            pdf = db[t].reset_index(drop=True)
            n = len(pdf)
            if t not in FACT_TABLES:
                arrive = np.ones(n, dtype=int)
                retract = np.zeros(n, dtype=int)
            else:
                # run-1 gets first_fraction; the rest spread evenly over
                # the remaining k-1 runs.
                u = g.random(n)
                arrive = np.where(
                    u < first_fraction,
                    1,
                    2 + (((u - first_fraction) / (1 - first_fraction)) * (k - 1)).astype(int).clip(0, k - 2),
                )
                retract = np.zeros(n, dtype=int)
                if t in retract_tables and n >= 5:
                    extra_n = max(1, int(retract_rate * n))
                    idx = g.choice(n, extra_n, replace=True)
                    extra = pdf.iloc[idx].reset_index(drop=True)
                    if t in _UNIQUE_KEY:
                        key = _UNIQUE_KEY[t]
                        extra[key] = pdf[key].max() + 1 + np.arange(extra_n)
                    e_arr = g.integers(1, k, extra_n)  # arrive before t_k
                    e_ret = np.array(
                        [g.integers(a + 1, k + 1) for a in e_arr], dtype=int
                    )
                    pdf = pd.concat([pdf, extra], ignore_index=True)
                    arrive = np.concatenate([arrive, e_arr])
                    retract = np.concatenate([retract, e_ret])
            self._parts[t] = (pdf, arrive, retract)
        self._spark_cache: dict[tuple, DataFrame] = {}
        self._schemas = {
            t: _spark_schema(db[t]).add(MULT, T.LongType()) for t in TPCDS_SCHEMAS
        }

    # -- pandas views ------------------------------------------------------

    def full_pd(self, table: str) -> pd.DataFrame:
        """Final data (what the oracle queries): equals snapshot at t_k."""
        return self.db[table]

    def snapshot_pd(self, table: str, i: int) -> pd.DataFrame:
        pdf, arrive, retract = self._parts[table]
        mask = (arrive <= i) & ((retract == 0) | (retract > i))
        out = pdf[mask].reset_index(drop=True).copy()
        out[MULT] = np.int64(1)
        return out

    def delta_pd(self, table: str, i: int) -> pd.DataFrame:
        """Delta from t_{i-1} to t_i (for i=1: everything at t_1)."""
        pdf, arrive, retract = self._parts[table]
        ins = pdf[arrive == i].copy()
        ins[MULT] = np.int64(1)
        dels = pdf[retract == i].copy()
        dels[MULT] = np.int64(-1)
        return pd.concat([ins, dels], ignore_index=True)

    # -- Spark views (cached) ---------------------------------------------

    def _to_spark(self, pdf: pd.DataFrame, table: str) -> DataFrame:
        cols = list(TPCDS_SCHEMAS[table]) + [MULT]
        return self.spark.createDataFrame(pdf[cols], schema=self._schemas[table])

    def snapshot(self, table: str, i: int) -> DataFrame:
        key = ("snap", table, i)
        if key not in self._spark_cache:
            self._spark_cache[key] = self._to_spark(
                self.snapshot_pd(table, i), table
            ).cache()
        return self._spark_cache[key]

    def delta(self, table: str, i: int) -> DataFrame:
        key = ("delta", table, i)
        if key not in self._spark_cache:
            self._spark_cache[key] = self._to_spark(
                self.delta_pd(table, i), table
            ).cache()
        return self._spark_cache[key]

    # -- planner statistics ------------------------------------------------

    def rows(self, table: str, kind: str, i: int) -> int:
        """Exact row count of a snapshot ('snap') or delta ('delta')."""
        if kind == "snap":
            return len(self.snapshot_pd(table, i))
        return len(self.delta_pd(table, i))

    def release(self) -> None:
        for df in self._spark_cache.values():
            df.unpersist()
        self._spark_cache.clear()


def make_scenario(
    spark: SparkSession,
    pattern: str,
    *,
    k: int = 2,
    sf: float = 0.01,
    seed: int = 7,
    arrival_seed: int = 11,
) -> ArrivalScenario:
    """Build one of the paper's four data-arrival patterns at scale ``sf``."""
    first, retr = PATTERNS[pattern]
    db = tpcds_lite(sf=sf, seed=seed)
    return ArrivalScenario(
        spark, db, k=k, first_fraction=first, retract_tables=retr,
        seed=arrival_seed, name=f"{pattern}/k={k}/sf={sf}",
    )

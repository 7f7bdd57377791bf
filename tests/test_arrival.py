"""Arrival scenarios: slicing invariants that the whole reproduction
rests on — snapshots telescope through deltas, the final snapshot equals
the oracle database, retraction patterns inject genuine deletions."""
import pandas as pd
import pytest

from repro.incr.mult import MULT
from repro.synth_data import FACT_TABLES, tpcds_lite
from repro.workloads.arrival import PATTERNS, ArrivalScenario, make_scenario


@pytest.fixture(scope="module")
def scenarios():
    db = tpcds_lite(sf=0.005, seed=7)
    return {
        p: ArrivalScenario(
            None, db, k=2, first_fraction=PATTERNS[p][0],
            retract_tables=PATTERNS[p][1], name=p,
        )
        for p in PATTERNS
    }


def _bag(pdf: pd.DataFrame):
    cols = [c for c in pdf.columns if c != MULT]
    out = pdf.groupby(cols, dropna=False)[MULT].sum().reset_index()
    return out[out[MULT] != 0].sort_values(cols).reset_index(drop=True)


@pytest.mark.parametrize("pattern", sorted(PATTERNS))
@pytest.mark.parametrize("table", ["ex_sales", "ex_returns", "store_sales"])
def test_final_snapshot_equals_full(scenarios, pattern, table):
    sc = scenarios[pattern]
    snap = sc.snapshot_pd(table, sc.k).drop(columns=[MULT])
    full = sc.full_pd(table)
    a = snap.sort_values(list(snap.columns)).reset_index(drop=True)
    b = full.sort_values(list(full.columns)).reset_index(drop=True)
    pd.testing.assert_frame_equal(a, b)


@pytest.mark.parametrize("pattern", sorted(PATTERNS))
def test_snapshot_plus_delta_telescopes(scenarios, pattern):
    sc = scenarios[pattern]
    for table in ("ex_sales", "catalog_sales"):
        s1 = sc.snapshot_pd(table, 1)
        d = sc.delta_pd(table, 2)
        merged = _bag(pd.concat([s1, d], ignore_index=True))
        s2 = _bag(sc.snapshot_pd(table, 2))
        pd.testing.assert_frame_equal(
            merged.reset_index(drop=True), s2, check_dtype=False
        )


def test_dims_fully_available_at_t1(scenarios):
    sc = scenarios["delta-big"]
    for t in ("item", "date_dim", "customer", "warehouse"):
        assert len(sc.snapshot_pd(t, 1)) == len(sc.full_pd(t))
        assert len(sc.delta_pd(t, 2)) == 0


def test_delta_big_split_roughly_half(scenarios):
    sc = scenarios["delta-big"]
    n1 = len(sc.snapshot_pd("store_sales", 1))
    n = len(sc.full_pd("store_sales"))
    assert 0.4 < n1 / n < 0.6


def test_delta_small_split(scenarios):
    sc = scenarios["delta-small"]
    n1 = len(sc.snapshot_pd("store_sales", 1))
    n = len(sc.full_pd("store_sales"))
    assert 0.72 < n1 / n < 0.88


def test_delta_r_has_retractions_in_sales_only(scenarios):
    sc = scenarios["delta-R"]
    assert (sc.delta_pd("ex_sales", 2)[MULT] == -1).any()
    assert not (sc.delta_pd("ex_returns", 2)[MULT] == -1).any()


def test_delta_rs_has_retractions_in_both(scenarios):
    sc = scenarios["delta-RS"]
    assert (sc.delta_pd("ex_sales", 2)[MULT] == -1).any()
    assert (sc.delta_pd("ex_returns", 2)[MULT] == -1).any()


def test_delta_big_has_no_retractions(scenarios):
    sc = scenarios["delta-big"]
    for t in FACT_TABLES:
        assert (sc.delta_pd(t, 2)[MULT] >= 1).all(), t


def test_retracted_rows_never_in_final(scenarios):
    sc = scenarios["delta-R"]
    dels = sc.delta_pd("ex_sales", 2)
    gone = set(dels.loc[dels[MULT] == -1, "o_id"])
    assert gone
    assert not (set(sc.full_pd("ex_sales")["o_id"]) & gone)


def test_k3_splits_all_runs(spark=None):
    db = tpcds_lite(sf=0.005, seed=7)
    sc = ArrivalScenario(None, db, k=3, first_fraction=0.5)
    ns = [len(sc.delta_pd("store_sales", i)) for i in (1, 2, 3)]
    assert all(n > 0 for n in ns)
    assert sum(ns) == len(db["store_sales"])


def test_rows_counts_match_pandas(scenarios):
    sc = scenarios["delta-big"]
    assert sc.rows("ex_sales", "snap", 1) == len(sc.snapshot_pd("ex_sales", 1))
    assert sc.rows("ex_sales", "delta", 2) == len(sc.delta_pd("ex_sales", 2))


def test_spark_frames_cached_and_typed(spark):
    sc = make_scenario(spark, "delta-R", k=2, sf=0.004)
    df = sc.snapshot("ex_sales", 1)
    assert df.count() == len(sc.snapshot_pd("ex_sales", 1))
    d2 = sc.delta("ex_sales", 2)
    assert dict(d2.dtypes)[MULT] == "bigint"
    assert sc.delta("ex_sales", 2) is d2  # cache hit
    sc.release()

"""Query suite sanity: every query renders to SQL DuckDB accepts over
the full TPC-DS-lite database, produces non-trivial results, and the
perf suite mirrors Table 2's structural statistics."""
import duckdb
import pytest

from repro.core.logical import base_tables, output_cols, plan_stats, to_sql
from repro.synth_data import TPCDS_SCHEMAS, tpcds_lite
from repro.workloads.queries import (
    EFFECTIVENESS, TABLE2, perf_query, table2_query,
)
from repro.workloads.warehouse import SCALED_SIZES, workload


@pytest.fixture(scope="module")
def db():
    return tpcds_lite(sf=0.01, seed=7)


def _run(db, plan):
    con = duckdb.connect()
    try:
        for t in base_tables(plan):
            con.register(t, db[t])
        return con.execute(to_sql(plan, TPCDS_SCHEMAS)).fetchdf()
    finally:
        con.close()


@pytest.mark.parametrize("qname", sorted(EFFECTIVENESS))
def test_effectiveness_query_runs(db, qname):
    plan = EFFECTIVENESS[qname]()
    out = _run(db, plan)
    assert len(out) > 0
    assert tuple(out.columns) == output_cols(plan, TPCDS_SCHEMAS)


def test_qex_gross_mixes_signs(db):
    out = _run(db, EFFECTIVENESS["qex"]())
    assert len(out) == 6  # six categories


def test_q80_has_three_channels(db):
    out = _run(db, EFFECTIVENESS["q80"]())
    assert sorted(out["channel"]) == ["catalog", "store", "web"]


@pytest.mark.parametrize("name", sorted(TABLE2))
def test_table2_query_runs(db, name):
    plan = table2_query(name)
    out = _run(db, plan)
    assert len(out) > 0


@pytest.mark.parametrize("name", sorted(TABLE2))
def test_table2_join_counts_match_paper(name):
    st = plan_stats(table2_query(name))
    paper_joins = TABLE2[name][0]
    assert st["joins"] == paper_joins


def test_perf_query_subquery_counts():
    st = plan_stats(perf_query(5, 2))
    assert st["joins"] == 5 and st["subqueries"] == 2
    # one top-level aggregate plus one per subquery
    assert st["aggregates"] == 3


def test_perf_query_bounds():
    with pytest.raises(AssertionError):
        perf_query(0, 0)


@pytest.mark.parametrize("wname", sorted(SCALED_SIZES))
def test_warehouse_workload(db, wname):
    w = workload(wname)
    assert len(w) == SCALED_SIZES[wname]
    assert len({qid for qid, _ in w}) == len(w)
    # deterministic
    w2 = workload(wname)
    assert [q for q, _ in w] == [q for q, _ in w2]
    # a couple of them actually run
    for _, plan in w[:2]:
        assert len(_run(db, plan)) > 0


def test_workloads_structurally_diverse():
    joins = {plan_stats(p)["joins"] for _, p in workload("W-B")}
    assert len(joins) >= 3

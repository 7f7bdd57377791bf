"""Stats provider and cost model: cardinality estimates, work formulas,
cost-vector comparators."""
import pytest

from repro.core import cost as C
from repro.core.explore import explore
from repro.core.memo import snap
from repro.core.rules import ALL
from repro.core.stats import StatsProvider
from repro.synth_data import TPCDS_SCHEMAS, tpcds_lite
from repro.workloads.arrival import ArrivalScenario
from repro.workloads.queries import qex


@pytest.fixture(scope="module")
def scenario():
    db = tpcds_lite(sf=0.005, seed=7)
    return ArrivalScenario(None, db, k=2, first_fraction=0.5)


@pytest.fixture(scope="module")
def stats(scenario):
    return StatsProvider(scenario)


def test_rows_match_scenario(stats, scenario):
    assert stats.rows("ex_sales", "snap", 2) == len(scenario.full_pd("ex_sales"))
    assert stats.rows("ex_sales", "delta", 2) == len(
        scenario.delta_pd("ex_sales", 2)
    )


def test_rows_cached(stats):
    a = stats.rows("ex_sales", "snap", 1)
    assert stats.rows("ex_sales", "snap", 1) == a


def test_ndv_of_unique_key(stats, scenario):
    assert stats.ndv("o_id") == len(scenario.full_pd("ex_sales"))


def test_ndv_unknown_column(stats):
    assert stats.ndv("no_such_col") is None


def test_inaccurate_source():
    db = tpcds_lite(sf=0.005, seed=7)
    real = ArrivalScenario(None, db, k=2, first_fraction=0.5)
    wrong = ArrivalScenario(None, db, k=2, first_fraction=0.8)
    sp = StatsProvider(real, source=wrong)
    assert sp.rows("ex_sales", "snap", 1) == wrong.rows("ex_sales", "snap", 1)
    assert sp.rows("ex_sales", "snap", 1) != real.rows("ex_sales", "snap", 1)


@pytest.fixture(scope="module")
def memo_and_cards(stats):
    er = explore(qex(), 2, dict(TPCDS_SCHEMAS), ALL)
    return er, C.estimate_cards(er.memo, stats)


def test_scan_card_exact(memo_and_cards, stats):
    er, cards = memo_and_cards
    tid = next(
        t.tid for t in er.memo.tvrs
        if getattr(t.node, "table", None) == "ex_sales"
    )
    g = er.memo.group_of(tid, snap(2))
    assert cards[g] == stats.rows("ex_sales", "snap", 2)


def test_all_reachable_groups_have_cards(memo_and_cards):
    er, cards = memo_and_cards
    root = er.memo.group_of(er.root_tid, snap(2))
    assert cards[root] < C.INF


def test_delta_cards_smaller_than_snapshots(memo_and_cards):
    er, cards = memo_and_cards
    from repro.core.memo import delta

    tid = next(
        t.tid for t in er.memo.tvrs
        if getattr(t.node, "table", None) == "ex_sales"
    )
    gd = er.memo.group_of(tid, delta(1, 2))
    gs = er.memo.group_of(tid, snap(2))
    assert cards[gd] < cards[gs]


def test_expr_work_positive_and_scan_unweighted(memo_and_cards, stats):
    er, cards = memo_and_cards
    for g in er.memo.all_groups():
        for e in g.exprs:
            w = C.expr_work(e, cards, er.memo, stats)
            assert w >= 0
            if e.kind.startswith("scan_"):
                assert w == cards[er.memo.find(g.gid)]


def test_vec_helpers():
    v = C.zeros(3)
    v = C.add_at(v, 2, 5.0)
    assert v == (0.0, 5.0, 0.0)
    assert C.vec_add(v, (1.0, 1.0, 1.0)) == (1.0, 6.0, 1.0)


def test_weighted_key():
    assert C.scalar_key((10.0, 100.0), "weighted", (0.3, 1.0)) == 103.0


def test_vector_key_reverse_lexical():
    # minimize the LAST entry first (the paper's c̃_v order)
    better = C.scalar_key((100.0, 1.0), "vector", None)
    worse = C.scalar_key((1.0, 2.0), "vector", None)
    assert better < worse


def test_weighted_total():
    assert C.weighted_total((10.0, 20.0), (0.5, 1.0)) == 25.0

"""Exploration invariants: memo saturation produces the structures each
method's rule set promises — and only those."""
import pytest

from repro.core.explore import explore
from repro.core.memo import delta, snap
from repro.core import rules as R
from repro.synth_data import TPCDS_SCHEMAS
from repro.workloads.queries import EFFECTIVENESS, qex, q10, q40

SCH = dict(TPCDS_SCHEMAS)


def _kinds(memo):
    return {e.kind for g in memo.all_groups() for e in g.exprs}


@pytest.mark.parametrize("qname", sorted(EFFECTIVENESS))
def test_root_snapshots_exist_at_all_times(qname):
    er = explore(EFFECTIVENESS[qname](), 2, SCH, R.ALL)
    for i in (1, 2):
        assert er.memo.group_of(er.root_tid, snap(i)) is not None


@pytest.mark.parametrize("qname", sorted(EFFECTIVENESS))
def test_root_delta_derivable(qname):
    er = explore(EFFECTIVENESS[qname](), 2, SCH, R.ALL)
    assert er.memo.group_of(er.root_tid, delta(1, 2, "state")) is not None


def test_im1_has_delta_louter_no_inter_rules():
    er = explore(qex(), 2, SCH, R.IM1)
    ks = _kinds(er.memo)
    assert "d_join_louter" in ks
    assert "ojv_delta" not in ks
    # no Q^P/Q^N links beyond the trivial base-table ones
    for t in er.memo.tvrs:
        if not isinstance(t.node, type(qex())):
            continue


def test_im2_decomposes_louter():
    er = explore(qex(), 2, SCH, R.IM2)
    ks = _kinds(er.memo)
    assert "d_join_louter" not in ks  # IM-2 holds back instead
    louter_tid = next(
        t.tid for t in er.memo.tvrs if getattr(t.node, "how", None) == "left_outer"
    )
    links = er.memo.tvrs[louter_tid].links
    assert links["qp"] not in (None, louter_tid)
    assert links["qn"] != R.EMPTY
    # Q^N is an anti-pad join, computed batch only
    assert any(
        e.kind == "join" and e.payload[0] == "left_anti_pad"
        for g in er.memo.all_groups()
        for e in g.exprs
    )


def test_ojv_registers_ojv_delta():
    er = explore(qex(), 2, SCH, R.OJV)
    assert "ojv_delta" in _kinds(er.memo)
    assert "d_join_louter" not in _kinds(er.memo)


def test_hov_creates_preagg_chain():
    er = explore(qex(), 2, SCH, R.HOV)
    # complement view M = γ_{r_o_id}(ex_returns) exists as its own TVR
    m_tvrs = [
        t for t in er.memo.tvrs
        if type(t.node).__name__ == "Aggregate"
        and getattr(t.node, "keys", None) == ("r_o_id",)
    ]
    assert m_tvrs


def test_hov_exclusive_drops_direct_agg_delta():
    er_hov = explore(qex(), 2, SCH, R.HOV)
    er_im1 = explore(qex(), 2, SCH, R.IM1)
    # the original aggregate's state delta over the louter delta exists
    # under IM-1 but is withheld under exclusive HOV
    def has_direct(er):
        g = er.memo.group_of(er.root_tid, delta(1, 2, "state"))
        if g is None:
            return False
        louter_delta = None
        for t in er.memo.tvrs:
            # the *original* louter join (right side scans ex_returns),
            # not the HOV chain's L ⟕ M join
            if (
                getattr(t.node, "how", None) == "left_outer"
                and getattr(getattr(t.node, "right", None), "table", None)
                == "ex_returns"
            ):
                louter_delta = er.memo.group_of(t.tid, delta(1, 2))
        return any(
            e.kind == "d_agg_state"
            and louter_delta is not None
            and er.memo.find(e.children[0]) == er.memo.find(louter_delta)
            for e in er.memo.exprs_of(g)
        )

    assert has_direct(er_im1)
    assert not has_direct(er_hov)


def test_all_is_superset_of_methods():
    base = explore(qex(), 2, SCH, R.ALL)
    all_kinds = _kinds(base.memo)
    for m in (R.IM1, R.IM2, R.OJV):
        assert _kinds(explore(qex(), 2, SCH, m).memo) <= all_kinds


def test_combo_configs():
    c = R.combo(("IM1", "IM2"))
    assert c.dgen_louter and c.im2 and not c.ojv and not c.hov
    c2 = R.combo(("IM1", "IM2", "HOV", "OJV"))
    assert c2.ojv and c2.hov and not c2.hov_exclusive


def test_speedup_toggles_preserve_core_space():
    """Baseline (no speed-ups) must contain every structure the guided
    exploration finds (it explores a superset)."""
    fast = explore(qex(), 3, SCH, R.ALL, speedups=("TS", "PNA", "GE"))
    slow = explore(qex(), 3, SCH, R.ALL, speedups=())
    fk, sk = _kinds(fast.memo), _kinds(slow.memo)
    assert fk <= sk | {"merge_mult", "merge_state"}
    assert slow.memo.stats()["exprs"] >= fast.memo.stats()["exprs"]


def test_pna_off_registers_diffs():
    on = explore(qex(), 2, SCH, R.ALL, speedups=("PNA",))
    off = explore(qex(), 2, SCH, R.ALL, speedups=())
    def n_diffs(er):
        return sum(
            1 for g in er.memo.all_groups() for e in g.exprs
            if e.kind.startswith("diff_")
        )
    assert n_diffs(off) >= n_diffs(on)


def test_ge_off_creates_delta_spans():
    off = explore(qex(), 4, SCH, R.IM1, speedups=("TS", "PNA"))
    spans = [
        inst for t in off.memo.tvrs for inst in t.instants
        if inst[0] == "delta" and inst[2] - inst[1] > 1
    ]
    assert spans  # unguided merges chain deltas into longer spans


def test_k3_structures(q=qex):
    er = explore(qex(), 3, SCH, R.ALL)
    for i in (1, 2, 3):
        assert er.memo.group_of(er.root_tid, snap(i)) is not None


def test_q10_semi_join_delta_exists():
    er = explore(q10(), 2, SCH, R.IM1)
    assert "d_join_semi" in _kinds(er.memo)


def test_q40_multikey_join_explored():
    er = explore(q40(), 2, SCH, R.ALL)
    assert er.memo.group_of(er.root_tid, snap(2)) is not None
    assert er.memo.stats()["groups"] > 30


def test_explore_reports_instrumentation():
    er = explore(qex(), 2, SCH, R.ALL)
    assert er.passes >= 2 and er.attempts > 0 and er.seconds >= 0
    assert er.memo_stats["groups"] > 0

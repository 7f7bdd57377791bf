"""Memo: hash-consing, group union, TVR instants and inter-TVR links."""
from repro.core.logical import Scan
from repro.core.memo import Memo, MExpr, delta, snap


def test_register_creates_group():
    m = Memo()
    t = m.tvr_for_node(Scan("t"))
    g = m.register(t, snap(1), MExpr("scan_snap", ("t", 1), ()))
    assert m.group_of(t, snap(1)) == g


def test_register_is_idempotent():
    m = Memo()
    t = m.tvr_for_node(Scan("t"))
    e = MExpr("scan_snap", ("t", 1), ())
    g1 = m.register(t, snap(1), e)
    v = m.version
    g2 = m.register(t, snap(1), e)
    assert g1 == g2 and m.version == v


def test_same_expr_merges_groups():
    m = Memo()
    t1 = m.tvr_for_node(Scan("a"))
    t2 = m.new_tvr("other")
    e = MExpr("scan_snap", ("a", 1), ())
    g1 = m.register(t1, snap(1), e)
    g2 = m.register(t2, snap(1), e)
    assert m.find(g1) == m.find(g2)


def test_union_merges_alternatives():
    m = Memo()
    t1 = m.tvr_for_node(Scan("a"))
    t2 = m.new_tvr("x")
    g1 = m.register(t1, snap(1), MExpr("scan_snap", ("a", 1), ()))
    m.register(t2, snap(1), MExpr("filter", ("p", 0.5), (g1,)))
    # same filter expr registered for t1's snapshot merges both groups
    g3 = m.register(t1, snap(2), MExpr("filter", ("p", 0.5), (g1,)))
    assert m.find(g3) == m.find(m.group_of(t2, snap(1)))
    assert len(m.exprs_of(g3)) == 1


def test_tvr_for_node_dedups_equal_nodes():
    m = Memo()
    assert m.tvr_for_node(Scan("t")) == m.tvr_for_node(Scan("t"))


def test_links():
    m = Memo()
    a, b = m.new_tvr("a"), m.new_tvr("b")
    m.link(a, "qp", b)
    assert m.tvrs[a].links["qp"] == b


def test_version_bumps_on_change():
    m = Memo()
    v0 = m.version
    t = m.tvr_for_node(Scan("t"))
    m.register(t, snap(1), MExpr("scan_snap", ("t", 1), ()))
    assert m.version > v0


def test_distinct_instants_distinct_groups():
    m = Memo()
    t = m.tvr_for_node(Scan("t"))
    g1 = m.register(t, snap(1), MExpr("scan_snap", ("t", 1), ()))
    g2 = m.register(t, snap(2), MExpr("scan_snap", ("t", 2), ()))
    g3 = m.register(t, delta(1, 2), MExpr("scan_delta", ("t", 1, 2), ()))
    assert len({m.find(g) for g in (g1, g2, g3)}) == 3


def test_children_canonicalized_through_union():
    m = Memo()
    t = m.tvr_for_node(Scan("t"))
    u = m.new_tvr("u")
    g1 = m.register(t, snap(1), MExpr("scan_snap", ("t", 1), ()))
    g2 = m.register(u, snap(1), MExpr("scan_snap", ("t", 1), ()))  # merges
    v = m.new_tvr("v")
    ga = m.register(v, snap(1), MExpr("filter", ("p", 0.5), (g1,)))
    gb = m.register(v, snap(1), MExpr("filter", ("p", 0.5), (g2,)))
    assert m.find(ga) == m.find(gb)
    assert len(m.exprs_of(ga)) == 1


def test_stats_counts():
    m = Memo()
    t = m.tvr_for_node(Scan("t"))
    m.register(t, snap(1), MExpr("scan_snap", ("t", 1), ()))
    s = m.stats()
    assert s["groups"] == 1 and s["tvrs"] == 1 and s["exprs"] == 1

"""Property-based tests (hypothesis) for the pure-Python core: cost
vectors, comparator laws, and memo hash-consing under random
registration orders."""
from hypothesis import given, settings, strategies as st

from repro.core import cost as C
from repro.core.logical import Scan
from repro.core.memo import Memo, MExpr, snap

vecs = st.lists(
    st.floats(min_value=0, max_value=1e9, allow_nan=False), min_size=2, max_size=5
)


@given(vecs)
def test_vec_add_identity(v):
    v = tuple(v)
    assert C.vec_add(v, C.zeros(len(v))) == v


@given(vecs, vecs.filter(lambda x: True))
def test_vec_add_commutes(a, b):
    n = min(len(a), len(b))
    a, b = tuple(a[:n]), tuple(b[:n])
    assert C.vec_add(a, b) == C.vec_add(b, a)


@given(vecs, st.integers(min_value=1, max_value=2), st.floats(0, 1e6))
def test_add_at_only_touches_one_entry(v, tau, amt):
    v = tuple(v)
    tau = min(tau, len(v))
    out = C.add_at(v, tau, amt)
    for i, (x, y) in enumerate(zip(v, out)):
        if i == tau - 1:
            assert y == x + amt
        else:
            assert y == x


small_vecs = st.lists(
    st.floats(min_value=0, max_value=1e6, allow_nan=False), min_size=2, max_size=5
)


@given(small_vecs, small_vecs)
def test_weighted_key_monotone_in_each_entry(a, w):
    n = min(len(a), len(w))
    a, w = tuple(a[:n]), tuple(abs(x) + 0.1 for x in w[:n])
    bumped = C.add_at(a, 1, 1000.0)
    assert C.scalar_key(bumped, "weighted", w) > C.scalar_key(a, "weighted", w)


@given(vecs)
def test_vector_key_last_entry_dominates(v):
    v = tuple(v)
    bumped = C.add_at(v, len(v), 1.0)
    assert C.scalar_key(bumped, "vector", None) > C.scalar_key(v, "vector", None)


@settings(max_examples=25)
@given(st.lists(st.integers(min_value=1, max_value=4), min_size=1, max_size=12))
def test_memo_registration_order_independent_group_count(tables):
    """Registering the same expressions in any order yields the same
    number of canonical groups (hash-consing is confluent)."""
    def build(order):
        m = Memo()
        for t in order:
            tid = m.tvr_for_node(Scan(f"t{t}"))
            m.register(tid, snap(1), MExpr("scan_snap", (f"t{t}", 1), ()))
        return m.stats()["groups"]

    assert build(tables) == build(list(reversed(tables)))


@settings(max_examples=25)
@given(st.lists(st.tuples(st.integers(0, 3), st.integers(0, 3)), min_size=1, max_size=10))
def test_memo_find_is_idempotent(pairs):
    m = Memo()
    gids = []
    for i in range(4):
        tid = m.tvr_for_node(Scan(f"t{i}"))
        gids.append(m.register(tid, snap(1), MExpr("scan_snap", (f"t{i}", 1), ())))
    for a, b in pairs:
        # merging via duplicate filter exprs on top of two groups
        t = m.new_tvr(("x", a, b))
        m.register(t, snap(1), MExpr("filter", ("p", 0.5), (gids[a],)))
        m.register(t, snap(1), MExpr("filter", ("p", 0.5), (gids[b],)))
    for g in range(len(m.groups)):
        assert m.find(m.find(g)) == m.find(g)

"""Delta-rule correctness: for every operator Q and random +/- deltas,
``Q(old) +# ∂Q = Q(new)`` (multiplicity perspective) and the state
algebra satisfies ``γstate(old) +γ ∂γstate = γstate(new)``.

These identities are the paper's Eq. 1 — the contract every
TVR-generating rule must satisfy.
"""
import numpy as np
import pandas as pd
import pytest

from repro.core.logical import AggSpec
from repro.incr import ops
from repro.incr.mult import MULT, consolidate, merge_mult

SEEDS = [0, 1, 2]


def _mkdf(spark, pdf):
    return spark.createDataFrame(pdf)


def _rand_rel(g, n, keyspace, prefix):
    return pd.DataFrame({
        f"{prefix}k": g.integers(1, keyspace + 1, n),
        f"{prefix}v": (g.random(n) * 10).round(1),
        MULT: np.int64(1),
    })


def _rand_delta(g, base: pd.DataFrame, n_ins, keyspace, prefix):
    """Delta with inserts of new rows and deletes of existing ones."""
    ins = pd.DataFrame({
        f"{prefix}k": g.integers(1, keyspace + 1, n_ins),
        f"{prefix}v": (g.random(n_ins) * 10).round(1),
        MULT: np.int64(1),
    })
    n_del = max(1, len(base) // 5)
    dels = base.sample(n=n_del, random_state=int(g.integers(0, 2**31))).copy()
    dels[MULT] = np.int64(-1)
    return pd.concat([ins, dels], ignore_index=True)


def _rows(df):
    def norm(v):
        if pd.isna(v):
            return None
        if isinstance(v, float):
            return round(v, 6)
        return v

    return sorted(
        tuple(norm(v) for v in r) for r in df.toPandas().itertuples(index=False)
    )


def assert_same_bag(a, b):
    assert _rows(consolidate(a)) == _rows(consolidate(b))


@pytest.fixture(scope="module")
def rels(spark):
    """Per-seed (l_old, dl, l_new, r_old, dr, r_new) Spark relations."""
    out = {}
    for seed in SEEDS:
        g = np.random.default_rng(seed)
        l_old = _rand_rel(g, 30, 12, "l")
        r_old = _rand_rel(g, 20, 12, "r")
        dl = _rand_delta(g, l_old, 8, 12, "l")
        dr = _rand_delta(g, r_old, 6, 12, "r")
        l_new = pd.concat([l_old, dl], ignore_index=True)
        r_new = pd.concat([r_old, dr], ignore_index=True)
        out[seed] = tuple(
            _mkdf(spark, x) for x in (l_old, dl, l_new, r_old, dr, r_new)
        )
    return out


@pytest.mark.parametrize("seed", SEEDS)
def test_delta_inner_join(spark, rels, seed):
    l_old, dl, l_new, r_old, dr, r_new = rels[seed]
    l_oldc, r_newc = consolidate(l_old), consolidate(r_new)
    got = merge_mult(
        ops.b_join_inner(consolidate(l_old), consolidate(r_old), ["lk"], ["rk"]),
        ops.d_join_inner(dl, r_newc, l_oldc, dr, ["lk"], ["rk"]),
    )
    want = ops.b_join_inner(consolidate(l_new), r_newc, ["lk"], ["rk"])
    assert_same_bag(got, want)


@pytest.mark.parametrize("seed", SEEDS)
def test_delta_left_outer_join(spark, rels, seed):
    l_old, dl, l_new, r_old, dr, r_new = rels[seed]
    lo, ro = consolidate(l_old), consolidate(r_old)
    ln, rn = consolidate(l_new), consolidate(r_new)
    got = merge_mult(
        ops.b_join_louter(lo, ro, ["lk"], ["rk"]),
        ops.d_join_louter(dl, dr, lo, ro, rn, ["lk"], ["rk"], ["rk", "rv"]),
    )
    want = ops.b_join_louter(ln, rn, ["lk"], ["rk"])
    assert_same_bag(got, want)


@pytest.mark.parametrize("seed", SEEDS)
def test_delta_semi_join(spark, rels, seed):
    l_old, dl, l_new, r_old, dr, r_new = rels[seed]
    lo, ro = consolidate(l_old), consolidate(r_old)
    got = merge_mult(
        ops.b_join_semi(lo, ro, ["lk"], ["rk"]),
        ops.d_join_semi(dl, dr, lo, ro, ["lk"], ["rk"]),
    )
    want = ops.b_join_semi(consolidate(l_new), consolidate(r_new), ["lk"], ["rk"])
    assert_same_bag(got, want)


@pytest.mark.parametrize("seed", SEEDS)
def test_ojv_delta_equals_louter_delta(spark, rels, seed):
    l_old, dl, l_new, r_old, dr, r_new = rels[seed]
    lo, ro = consolidate(l_old), consolidate(r_old)
    ln, rn = consolidate(l_new), consolidate(r_new)
    q_prev = ops.b_join_louter(lo, ro, ["lk"], ["rk"])
    got = merge_mult(
        q_prev,
        ops.ojv_delta_louter(
            dl, dr, lo, ro, rn, q_prev, ["lk"], ["rk"], ["rk", "rv"]
        ),
    )
    want = ops.b_join_louter(ln, rn, ["lk"], ["rk"])
    assert_same_bag(got, want)


AGGS = (
    AggSpec("sum", "lv", "sv"),
    AggSpec("count", "", "cnt"),
    AggSpec("avg", "lv", "av"),
)


@pytest.mark.parametrize("seed", SEEDS)
def test_agg_state_merge_and_final(spark, rels, seed):
    l_old, dl, l_new, *_ = rels[seed]
    st_old = ops.b_agg_state(l_old, ["lk"], AGGS)
    st_delta = ops.d_agg_state(dl, ["lk"], AGGS)
    merged = ops.merge_state(st_old, st_delta, ["lk"])
    want = ops.b_agg_state(l_new, ["lk"], AGGS)
    assert_same_bag(
        ops.b_final(merged, ["lk"], AGGS), ops.b_final(want, ["lk"], AGGS)
    )


@pytest.mark.parametrize("seed", SEEDS)
def test_diff_state_inverts_merge(spark, rels, seed):
    l_old, dl, l_new, *_ = rels[seed]
    st_old = ops.b_agg_state(l_old, ["lk"], AGGS)
    st_new = ops.b_agg_state(l_new, ["lk"], AGGS)
    d = ops.diff_state(st_new, st_old, ["lk"])
    merged = ops.merge_state(st_old, d, ["lk"])
    assert_same_bag(
        ops.b_final(merged, ["lk"], AGGS), ops.b_final(st_new, ["lk"], AGGS)
    )


@pytest.mark.parametrize("seed", SEEDS)
def test_state_to_mult_delta(spark, rels, seed):
    l_old, dl, l_new, *_ = rels[seed]
    st_old = ops.b_agg_state(l_old, ["lk"], AGGS)
    st_delta = ops.d_agg_state(dl, ["lk"], AGGS)
    mdelta = ops.state_to_mult_delta(st_old, st_delta, ["lk"], AGGS)
    got = merge_mult(ops.b_final(st_old, ["lk"], AGGS), mdelta)
    want = ops.b_final(ops.b_agg_state(l_new, ["lk"], AGGS), ["lk"], AGGS)
    assert_same_bag(got, want)


def test_final_drops_empty_groups(spark):
    base = _mkdf(
        spark, pd.DataFrame({"lk": [1, 2], "lv": [1.0, 2.0], MULT: [1, 1]})
    )
    delta = _mkdf(
        spark, pd.DataFrame({"lk": [1], "lv": [1.0], MULT: [-1]})
    )
    st = ops.merge_state(
        ops.b_agg_state(base, ["lk"], AGGS), ops.d_agg_state(delta, ["lk"], AGGS), ["lk"]
    )
    out = ops.b_final(st, ["lk"], AGGS).toPandas()
    assert out["lk"].tolist() == [2]


def test_anti_pad_schema_matches_louter(spark):
    l = _mkdf(spark, pd.DataFrame({"lk": [1, 2], "lv": [1.0, 2.0], MULT: [1, 1]}))
    r = _mkdf(spark, pd.DataFrame({"rk": [1], "rv": [9.0], MULT: [1]}))
    lo = ops.b_join_louter(l, r, ["lk"], ["rk"])
    ap = ops.b_join_anti(l, r, ["lk"], ["rk"], pad_cols=["rk", "rv"], pad_template=r)
    assert set(ap.columns) == set(lo.columns)
    assert [r_.lk for r_ in ap.collect()] == [2]


def test_im2_decomposition_identity(spark, rels):
    """Q = Q^P +# Q^N (Eq. 3): inner join plus padded anti join."""
    l_old, dl, l_new, r_old, dr, r_new = rels[0]
    ln, rn = consolidate(l_new), consolidate(r_new)
    qp = ops.b_join_inner(ln, rn, ["lk"], ["rk"])
    qn = ops.b_join_anti(ln, rn, ["lk"], ["rk"], pad_cols=["rk", "rv"], pad_template=rn)
    assert_same_bag(
        merge_mult(qp, qn.select(*qp.columns)),
        ops.b_join_louter(ln, rn, ["lk"], ["rk"]),
    )

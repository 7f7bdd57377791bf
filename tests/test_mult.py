"""Unit tests for the multiplicity-bag algebra (TIP §3.2, +# / -#)."""
import pandas as pd
import pytest

from repro.incr import mult as M


def _df(spark, rows, cols=("k", "v")):
    return spark.createDataFrame(pd.DataFrame(rows, columns=[*cols, M.MULT]))


def test_with_mult_adds_column(spark):
    df = spark.createDataFrame(pd.DataFrame({"k": [1, 2]}))
    out = M.with_mult(df)
    assert M.MULT in out.columns
    assert [r[M.MULT] for r in out.collect()] == [1, 1]


def test_data_cols_excludes_mult(spark):
    df = _df(spark, [(1, 1.0, 1)])
    assert M.data_cols(df) == ["k", "v"]


def test_consolidate_sums_and_drops_zeros(spark):
    df = _df(spark, [(1, 1.0, 2), (1, 1.0, 3), (2, 2.0, 1), (2, 2.0, -1)])
    rows = {(r.k, r[M.MULT]) for r in M.consolidate(df).collect()}
    assert rows == {(1, 5)}


def test_merge_mult_is_additive_union(spark):
    a = _df(spark, [(1, 1.0, 1), (2, 2.0, 1)])
    b = _df(spark, [(1, 1.0, 1), (3, 3.0, -1)])
    rows = {(r.k, r[M.MULT]) for r in M.merge_mult(a, b).collect()}
    assert rows == {(1, 2), (2, 1), (3, -1)}


def test_diff_mult_inverts_merge(spark):
    a = _df(spark, [(1, 1.0, 3), (2, 2.0, 1)])
    b = _df(spark, [(1, 1.0, 1)])
    d = M.diff_mult(a, b)
    restored = M.merge_mult(b, d)
    assert {(r.k, r[M.MULT]) for r in restored.collect()} == {
        (r.k, r[M.MULT]) for r in M.consolidate(a).collect()
    }


def test_negate_flips_sign(spark):
    df = _df(spark, [(1, 1.0, 2), (2, 2.0, -1)])
    assert {r[M.MULT] for r in M.negate(df).collect()} == {-2, 1}


def test_to_bag_expands_multiplicities(spark):
    df = _df(spark, [(1, 1.0, 3), (2, 2.0, 1)])
    out = M.to_bag(df).collect()
    ks = sorted(r.k for r in out)
    assert ks == [1, 1, 1, 2]


def test_to_bag_rejects_negative(spark):
    df = _df(spark, [(1, 1.0, -1)])
    with pytest.raises(Exception):
        M.to_bag(df).collect()


def test_snapshot_ok(spark):
    good = _df(spark, [(1, 1.0, 1)])
    bad = _df(spark, [(1, 1.0, -2)])
    assert M.snapshot_ok(good)
    assert not M.snapshot_ok(bad)


def test_consolidate_groups_nulls_together(spark):
    pdf = pd.DataFrame({"k": [None, None], "v": [1.0, 1.0], M.MULT: [1, 1]})
    df = spark.createDataFrame(pdf)
    out = M.consolidate(df).collect()
    assert len(out) == 1 and out[0][M.MULT] == 2

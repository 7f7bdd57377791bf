"""Logical algebra: schema inference, SQL rendering (validated by
actually running the rendered SQL in DuckDB), and plan statistics."""
import duckdb
import pandas as pd
import pytest

from repro.core.logical import (
    AggSpec, Aggregate, Filter, Join, Project, Scan, Union,
    base_tables, output_cols, plan_stats, to_sql,
)

SCHEMAS = {"t": ("a", "b"), "u": ("c", "d"), "v": ("a", "b")}


def _run(sql):
    con = duckdb.connect()
    try:
        con.register("t", pd.DataFrame({"a": [1, 2, 3], "b": [1.0, 2.0, 3.0]}))
        con.register("u", pd.DataFrame({"c": [1, 2], "d": [10.0, 20.0]}))
        con.register("v", pd.DataFrame({"a": [9], "b": [9.0]}))
        return con.execute(sql).fetchdf()
    finally:
        con.close()


def test_scan_schema():
    assert output_cols(Scan("t"), SCHEMAS) == ("a", "b")


def test_filter_keeps_schema():
    assert output_cols(Filter(Scan("t"), "a > 1"), SCHEMAS) == ("a", "b")


def test_project_schema():
    p = Project(Scan("t"), (("x", "a + 1"), ("y", "b")))
    assert output_cols(p, SCHEMAS) == ("x", "y")


def test_join_schema_concats():
    j = Join(Scan("t"), Scan("u"), "inner", ("a",), ("c",))
    assert output_cols(j, SCHEMAS) == ("a", "b", "c", "d")


def test_semi_join_schema_left_only():
    j = Join(Scan("t"), Scan("u"), "left_semi", ("a",), ("c",))
    assert output_cols(j, SCHEMAS) == ("a", "b")


def test_anti_pad_schema_concats():
    j = Join(Scan("t"), Scan("u"), "left_anti_pad", ("a",), ("c",))
    assert output_cols(j, SCHEMAS) == ("a", "b", "c", "d")


def test_join_rejects_overlapping_columns():
    j = Join(Scan("t"), Scan("v"), "inner", ("a",), ("a",))
    with pytest.raises(AssertionError):
        output_cols(j, SCHEMAS)


def test_join_rejects_bad_kind():
    with pytest.raises(AssertionError):
        Join(Scan("t"), Scan("u"), "full_outer", ("a",), ("c",))


def test_aggregate_schema():
    a = Aggregate(Scan("t"), ("a",), (AggSpec("sum", "b", "s"),))
    assert output_cols(a, SCHEMAS) == ("a", "s")


def test_aggspec_rejects_bad_func():
    with pytest.raises(AssertionError):
        AggSpec("median", "b", "m")


def test_union_schema_must_match():
    u = Union((Scan("t"), Scan("u")))
    with pytest.raises(AssertionError):
        output_cols(u, SCHEMAS)


def test_base_tables():
    j = Join(Filter(Scan("t"), "a>0"), Scan("u"), "inner", ("a",), ("c",))
    assert base_tables(j) == {"t", "u"}


def test_sql_scan_filter():
    df = _run(to_sql(Filter(Scan("t"), "a > 1"), SCHEMAS))
    assert sorted(df["a"]) == [2, 3]


def test_sql_project():
    df = _run(to_sql(Project(Scan("t"), (("x", "a * 2"),)), SCHEMAS))
    assert sorted(df["x"]) == [2, 4, 6]


def test_sql_inner_join():
    df = _run(to_sql(Join(Scan("t"), Scan("u"), "inner", ("a",), ("c",)), SCHEMAS))
    assert sorted(df["a"]) == [1, 2]


def test_sql_left_outer_join_pads_nulls():
    df = _run(
        to_sql(Join(Scan("t"), Scan("u"), "left_outer", ("a",), ("c",)), SCHEMAS)
    )
    assert len(df) == 3 and df["d"].isna().sum() == 1


def test_sql_semi_and_anti():
    semi = _run(
        to_sql(Join(Scan("t"), Scan("u"), "left_semi", ("a",), ("c",)), SCHEMAS)
    )
    anti = _run(
        to_sql(Join(Scan("t"), Scan("u"), "left_anti", ("a",), ("c",)), SCHEMAS)
    )
    assert sorted(semi["a"]) == [1, 2] and sorted(anti["a"]) == [3]


def test_sql_aggregate_sum_count_avg():
    a = Aggregate(
        Scan("t"),
        (),
        (
            AggSpec("sum", "b", "s"),
            AggSpec("count", "", "c"),
            AggSpec("avg", "b", "m"),
        ),
    )
    # no group keys: rendered as plain aggregate
    df = _run(to_sql(Aggregate(Scan("t"), ("a",), a.aggs), SCHEMAS))
    assert set(df.columns) == {"a", "s", "c", "m"}


def test_sql_union_all():
    u = Union((Scan("t"), Scan("v")))
    df = _run(to_sql(u, SCHEMAS))
    assert len(df) == 4


def test_plan_stats_counts():
    sub = Aggregate(Scan("u"), ("c",), (AggSpec("sum", "d", "sd"),))
    j = Join(Scan("t"), sub, "left_outer", ("a",), ("c",))
    top = Aggregate(j, ("a",), (AggSpec("count", "", "n"),))
    st = plan_stats(top)
    assert st == {"joins": 1, "aggregates": 2, "subqueries": 1}


def test_plan_stats_no_subquery_when_agg_on_top():
    top = Aggregate(Scan("t"), ("a",), (AggSpec("count", "", "n"),))
    assert plan_stats(top)["subqueries"] == 0

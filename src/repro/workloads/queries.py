"""Query workloads.

Effectiveness suite (§8.2): five structural analogues of the paper's
representative TPC-DS queries over the TPC-DS-lite schema —

* ``qex``  — the paper's running example (Example 1): gross revenue per
  category over ``sales ⟕ returns``.
* ``q40``  — catalog channel: (catalog_sales ⟕ catalog_returns) joined
  with warehouse / item / date_dim, aggregated per state & brand.
* ``q10``  — customer profile: semi join on store activity, two
  left-outer joins against pre-aggregated web/catalog subqueries.
* ``q35``  — like q10 with AVG aggregates (not HOV-splittable —
  exercises method diversity).
* ``q80``  — three channel sub-plans unioned then aggregated.

Perf suite (§8.4, Table 2): `perf_query(n_joins, n_subqueries)` builds a
star-join chain over store_sales with optional pre-aggregated derived
tables; `TABLE2` mirrors the paper's selected queries.
"""
from __future__ import annotations

from repro.core.logical import AggSpec, Aggregate, Filter, Join, Plan, Project, Scan, Union

# ---------------------------------------------------------------------------
# effectiveness suite


def qex() -> Plan:
    j = Join(
        Scan("ex_sales"), Scan("ex_returns"), "left_outer", ("o_id",), ("r_o_id",)
    )
    gross = AggSpec(
        "sum",
        "CASE WHEN r_cost IS NULL THEN price ELSE -r_cost END",
        "gross",
        hov_split=(
            "r_cost",
            "CASE WHEN __mc__ IS NULL THEN price ELSE -__m__ END",
        ),
    )
    return Aggregate(j, ("cat",), (gross,))


def q40() -> Plan:
    j1 = Join(
        Scan("catalog_sales"),
        Scan("catalog_returns"),
        "left_outer",
        ("cs_order", "cs_item_sk"),
        ("cr_order", "cr_item_sk"),
    )
    j2 = Join(j1, Scan("warehouse"), "inner", ("cs_warehouse_sk",), ("w_warehouse_sk",))
    j3 = Join(
        j2,
        Filter(Scan("item"), "i_current_price > 40", 0.6),
        "inner",
        ("cs_item_sk",),
        ("i_item_sk",),
    )
    j4 = Join(
        j3,
        Filter(Scan("date_dim"), "d_year = 1999", 0.25),
        "inner",
        ("cs_sold_date_sk",),
        ("d_date_sk",),
    )
    net = AggSpec(
        "sum",
        "CASE WHEN cr_return_amount IS NULL THEN cs_sales_price "
        "ELSE cs_sales_price - cr_return_amount END",
        "sales_net",
    )
    return Aggregate(j4, ("w_state", "i_brand"), (net,))


def _customer_chain() -> Plan:
    ca = Filter(
        Scan("customer_address"), "ca_state IN ('CA','NY','TX')", 0.25
    )
    c1 = Join(
        Scan("customer"), ca, "inner", ("c_current_addr_sk",), ("ca_address_sk",)
    )
    ss = Join(
        c1, Scan("store_sales"), "left_semi", ("c_customer_sk",), ("ss_customer_sk",)
    )
    wsq = Aggregate(
        Scan("web_sales"),
        ("ws_customer_sk",),
        (
            AggSpec("sum", "ws_net_profit", "ws_profit"),
            AggSpec("count", "", "ws_cnt"),
        ),
    )
    j5 = Join(ss, wsq, "left_outer", ("c_customer_sk",), ("ws_customer_sk",))
    csq = Aggregate(
        Scan("catalog_sales"),
        ("cs_customer_sk",),
        (
            AggSpec("sum", "cs_net_profit", "cs_profit"),
            AggSpec("count", "", "cs_cnt"),
        ),
    )
    return Join(j5, csq, "left_outer", ("c_customer_sk",), ("cs_customer_sk",))


def q10() -> Plan:
    profit = AggSpec(
        "sum",
        "COALESCE(ws_profit, 0) + COALESCE(cs_profit, 0)",
        "profit",
        hov_split=(
            "COALESCE(cs_profit, 0)",
            "COALESCE(ws_profit, 0) * COALESCE(__mc__, 1) + COALESCE(__m__, 0)",
        ),
    )
    return Aggregate(
        _customer_chain(), ("ca_state",), (AggSpec("count", "", "cnt"), profit)
    )


def q35() -> Plan:
    return Aggregate(
        _customer_chain(),
        ("ca_state", "c_birth_year"),
        (
            AggSpec("count", "", "cnt"),
            AggSpec("avg", "COALESCE(ws_profit, 0)", "avg_ws"),
            AggSpec("sum", "COALESCE(cs_profit, 0)", "sum_cs"),
        ),
    )


def _q80_channel(
    name: str, fact: str, pre: str, ret_tbl: str | None, keys, rkeys, cols
) -> Plan:
    base: Plan = Scan(fact)
    if ret_tbl:
        base = Join(base, Scan(ret_tbl), "left_outer", keys, rkeys)
    d = Join(
        base,
        Filter(Scan("date_dim"), "d_year = 1999", 0.25),
        "inner",
        (f"{pre}_sold_date_sk",),
        ("d_date_sk",),
    )
    i = Join(
        d,
        Filter(Scan("item"), "i_current_price > 20", 0.8),
        "inner",
        (f"{pre}_item_sk",),
        ("i_item_sk",),
    )
    return Project(
        i,
        (
            ("channel", f"'{name}'"),
            ("sales", cols[0]),
            ("returns_amt", cols[1]),
            ("profit", cols[2]),
        ),
    )


def q80() -> Plan:
    ch_store = _q80_channel(
        "store", "store_sales", "ss", "store_returns",
        ("ss_ticket", "ss_item_sk"), ("sr_ticket", "sr_item_sk"),
        ("ss_sales_price", "COALESCE(sr_return_amt, 0)", "ss_net_profit"),
    )
    ch_cat = _q80_channel(
        "catalog", "catalog_sales", "cs", "catalog_returns",
        ("cs_order", "cs_item_sk"), ("cr_order", "cr_item_sk"),
        ("cs_sales_price", "COALESCE(cr_return_amount, 0)", "cs_net_profit"),
    )
    ch_web = _q80_channel(
        "web", "web_sales", "ws", None, (), (),
        ("ws_sales_price", "CAST(0.0 AS DOUBLE)", "ws_net_profit"),
    )
    u = Union((ch_store, ch_cat, ch_web))
    return Aggregate(
        u,
        ("channel",),
        (
            AggSpec("sum", "sales", "sum_sales"),
            AggSpec("sum", "returns_amt", "sum_returns"),
            AggSpec("sum", "profit", "sum_profit"),
        ),
    )


EFFECTIVENESS = {"qex": qex, "q40": q40, "q10": q10, "q35": q35, "q80": q80}


# ---------------------------------------------------------------------------
# perf suite (Table 2 analogues)

# (dim scan, fact key, dim key, filter) join targets for store_sales
_DIM_JOINS = [
    ("item", "ss_item_sk", "i_item_sk", None),
    ("date_dim", "ss_sold_date_sk", "d_date_sk", ("d_year = 1999", 0.25)),
    ("store", "ss_store_sk", "s_store_sk", None),
    ("customer", "ss_customer_sk", "c_customer_sk", None),
]

# pre-aggregated derived-table joins ("subqueries")
_SUBQ_JOINS = [
    (
        "web_sales", ("ws_customer_sk",),
        (AggSpec("sum", "ws_net_profit", "wsub_profit"), AggSpec("count", "", "wsub_cnt")),
        ("ss_customer_sk",),
    ),
    (
        "catalog_sales", ("cs_item_sk",),
        (AggSpec("sum", "cs_net_profit", "csub_profit"), AggSpec("count", "", "csub_cnt")),
        ("ss_item_sk",),
    ),
    (
        "store_returns", ("sr_item_sk",),
        (AggSpec("sum", "sr_return_amt", "rsub_amt"), AggSpec("count", "", "rsub_cnt")),
        ("ss_item_sk",),
    ),
    (
        "web_sales", ("ws_item_sk",),
        (AggSpec("sum", "ws_sales_price", "wisub_sales"), AggSpec("count", "", "wisub_cnt")),
        ("ss_item_sk",),
    ),
    (
        "catalog_sales", ("cs_customer_sk",),
        (AggSpec("sum", "cs_sales_price", "ccsub_sales"), AggSpec("count", "", "ccsub_cnt")),
        ("ss_customer_sk",),
    ),
    (
        "customer_address", ("ca_address_sk",),
        (AggSpec("count", "", "casub_cnt"),),
        ("ss_store_sk",),
    ),
    (
        "date_dim", ("d_date_sk",),
        (AggSpec("count", "", "dsub_cnt"),),
        ("ss_sold_date_sk",),
    ),
]


def perf_query(n_joins: int, n_subqueries: int) -> Plan:
    """Star-join chain over store_sales with ``n_joins`` joins, of which
    the last ``n_subqueries`` are pre-aggregated derived tables."""
    assert 1 <= n_joins <= len(_DIM_JOINS) + len(_SUBQ_JOINS)
    assert n_subqueries <= min(n_joins, len(_SUBQ_JOINS))
    plan: Plan = Scan("store_sales")
    n_dims = min(n_joins - n_subqueries, len(_DIM_JOINS))
    n_subqueries = n_joins - n_dims
    for tbl, fk, dk, filt in _DIM_JOINS[:n_dims]:
        dim: Plan = Scan(tbl)
        if filt:
            dim = Filter(dim, filt[0], filt[1])
        plan = Join(plan, dim, "inner", (fk,), (dk,))
    for tbl, gkeys, aggs, fks in _SUBQ_JOINS[:n_subqueries]:
        sub = Aggregate(Scan(tbl), gkeys, aggs)
        plan = Join(plan, sub, "left_outer", fks, gkeys)
    return Aggregate(
        plan,
        ("ss_store_sk",),
        (
            AggSpec("sum", "ss_net_profit", "total_profit"),
            AggSpec("count", "", "total_cnt"),
        ),
    )


# name -> (paper's #joins, #aggs, #subqueries) from Table 2; our analogue
# uses the same join/subquery counts.
TABLE2 = {
    "Q22": (2, 1, 0),
    "Q20": (2, 1, 0),
    "Q43": (2, 1, 0),
    "Q67": (3, 1, 2),
    "Q27": (4, 1, 0),
    "Q99": (4, 1, 0),
    "Q85": (6, 1, 0),
    "Q91": (6, 1, 0),
    "Q5": (7, 4, 7),
    "Q33": (9, 4, 7),
}


def table2_query(name: str) -> Plan:
    n_joins, _, n_subq = TABLE2[name]
    return perf_query(n_joins, min(n_subq, n_joins, len(_SUBQ_JOINS)))

"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


# ---------------------------------------------------------------------------
# TPC-DS-lite (Tempura reproduction)
#
# A synthetic star-schema subset of TPC-DS sized ~10x below the real
# benchmark per SF, plus the paper's running-example tables
# (ex_sales / ex_returns). Generators return *pandas* frames keyed by
# table name: the arrival scenarios (repro.workloads.arrival) slice them
# into per-time snapshots/deltas before creating Spark DataFrames, and
# the DuckDB oracle consumes them directly. Deterministic in ``seed``.

TPCDS_SCHEMAS: dict[str, tuple[str, ...]] = {
    "store_sales": (
        "ss_ticket", "ss_item_sk", "ss_customer_sk", "ss_store_sk",
        "ss_sold_date_sk", "ss_quantity", "ss_sales_price", "ss_net_profit",
    ),
    "store_returns": (
        "sr_ticket", "sr_item_sk", "sr_return_amt", "sr_fee",
        "sr_returned_date_sk",
    ),
    "catalog_sales": (
        "cs_order", "cs_item_sk", "cs_customer_sk", "cs_warehouse_sk",
        "cs_sold_date_sk", "cs_quantity", "cs_sales_price", "cs_net_profit",
    ),
    "catalog_returns": (
        "cr_order", "cr_item_sk", "cr_return_amount", "cr_returned_date_sk",
    ),
    "web_sales": (
        "ws_order", "ws_item_sk", "ws_customer_sk", "ws_sold_date_sk",
        "ws_sales_price", "ws_net_profit",
    ),
    "customer": ("c_customer_sk", "c_current_addr_sk", "c_birth_year"),
    "customer_address": ("ca_address_sk", "ca_state", "ca_county"),
    "item": ("i_item_sk", "i_category", "i_brand", "i_current_price"),
    "date_dim": ("d_date_sk", "d_year", "d_moy", "d_qoy"),
    "warehouse": ("w_warehouse_sk", "w_state"),
    "store": ("s_store_sk", "s_state", "s_county"),
    "ex_sales": ("o_id", "cat", "price"),
    "ex_returns": ("r_o_id", "r_cost"),
}

# Fact tables gradually ingested in arrival scenarios; dimensions are
# fully available at the first time point.
FACT_TABLES = (
    "store_sales", "store_returns", "catalog_sales", "catalog_returns",
    "web_sales", "ex_sales", "ex_returns",
)

_STATES = ["CA", "NY", "TX", "WA", "IL", "OH", "GA", "NC", "MI", "NJ", "VA", "AZ"]
_CATS = ["Books", "Home", "Sports", "Music", "Shoes", "Women", "Men", "Electronics"]


def tpcds_lite(*, sf: float = 0.01, seed: int = 7) -> dict[str, pd.DataFrame]:
    """Generate the full TPC-DS-lite database at scale factor ``sf``."""
    g = _rng(seed)
    n_ss = max(60, int(300_000 * sf))
    n_cs = max(40, int(150_000 * sf))
    n_ws = max(30, int(75_000 * sf))
    n_cust = max(50, int(20_000 * sf))
    n_addr = max(30, int(10_000 * sf))
    n_item = max(40, int(4_000 * sf))
    n_date = 1461
    n_wh, n_store = 15, 30
    n_ex = max(40, int(60_000 * sf))

    db: dict[str, pd.DataFrame] = {}
    db["store_sales"] = pd.DataFrame({
        "ss_ticket": np.arange(1, n_ss + 1),
        "ss_item_sk": g.integers(1, n_item + 1, n_ss),
        "ss_customer_sk": g.integers(1, n_cust + 1, n_ss),
        "ss_store_sk": g.integers(1, n_store + 1, n_ss),
        "ss_sold_date_sk": g.integers(1, n_date + 1, n_ss),
        "ss_quantity": g.integers(1, 100, n_ss),
        "ss_sales_price": (g.random(n_ss) * 200).round(2),
        "ss_net_profit": (g.random(n_ss) * 100 - 20).round(2),
    })
    n_sr = max(10, int(0.12 * n_ss))
    sr_idx = g.choice(n_ss, n_sr, replace=False)
    db["store_returns"] = pd.DataFrame({
        "sr_ticket": db["store_sales"]["ss_ticket"].to_numpy()[sr_idx],
        "sr_item_sk": db["store_sales"]["ss_item_sk"].to_numpy()[sr_idx],
        "sr_return_amt": (g.random(n_sr) * 150).round(2),
        "sr_fee": (g.random(n_sr) * 10).round(2),
        "sr_returned_date_sk": g.integers(1, n_date + 1, n_sr),
    })
    db["catalog_sales"] = pd.DataFrame({
        "cs_order": np.arange(1, n_cs + 1),
        "cs_item_sk": g.integers(1, n_item + 1, n_cs),
        "cs_customer_sk": g.integers(1, n_cust + 1, n_cs),
        "cs_warehouse_sk": g.integers(1, n_wh + 1, n_cs),
        "cs_sold_date_sk": g.integers(1, n_date + 1, n_cs),
        "cs_quantity": g.integers(1, 100, n_cs),
        "cs_sales_price": (g.random(n_cs) * 300).round(2),
        "cs_net_profit": (g.random(n_cs) * 120 - 30).round(2),
    })
    n_cr = max(8, int(0.12 * n_cs))
    cr_idx = g.choice(n_cs, n_cr, replace=False)
    db["catalog_returns"] = pd.DataFrame({
        "cr_order": db["catalog_sales"]["cs_order"].to_numpy()[cr_idx],
        "cr_item_sk": db["catalog_sales"]["cs_item_sk"].to_numpy()[cr_idx],
        "cr_return_amount": (g.random(n_cr) * 200).round(2),
        "cr_returned_date_sk": g.integers(1, n_date + 1, n_cr),
    })
    db["web_sales"] = pd.DataFrame({
        "ws_order": np.arange(1, n_ws + 1),
        "ws_item_sk": g.integers(1, n_item + 1, n_ws),
        "ws_customer_sk": g.integers(1, n_cust + 1, n_ws),
        "ws_sold_date_sk": g.integers(1, n_date + 1, n_ws),
        "ws_sales_price": (g.random(n_ws) * 250).round(2),
        "ws_net_profit": (g.random(n_ws) * 90 - 15).round(2),
    })
    db["customer"] = pd.DataFrame({
        "c_customer_sk": np.arange(1, n_cust + 1),
        "c_current_addr_sk": g.integers(1, n_addr + 1, n_cust),
        "c_birth_year": g.integers(1940, 2001, n_cust),
    })
    db["customer_address"] = pd.DataFrame({
        "ca_address_sk": np.arange(1, n_addr + 1),
        "ca_state": g.choice(_STATES, n_addr),
        "ca_county": g.integers(1, 60, n_addr),
    })
    db["item"] = pd.DataFrame({
        "i_item_sk": np.arange(1, n_item + 1),
        "i_category": g.choice(_CATS, n_item),
        "i_brand": g.choice([f"Brand#{i}" for i in range(1, 31)], n_item),
        "i_current_price": (g.random(n_item) * 100 + 1).round(2),
    })
    db["date_dim"] = pd.DataFrame({
        "d_date_sk": np.arange(1, n_date + 1),
        "d_year": 1998 + (np.arange(n_date) // 365),
        "d_moy": 1 + (np.arange(n_date) // 30) % 12,
        "d_qoy": 1 + (np.arange(n_date) // 91) % 4,
    })
    db["warehouse"] = pd.DataFrame({
        "w_warehouse_sk": np.arange(1, n_wh + 1),
        "w_state": g.choice(_STATES, n_wh),
    })
    db["store"] = pd.DataFrame({
        "s_store_sk": np.arange(1, n_store + 1),
        "s_state": g.choice(_STATES, n_store),
        "s_county": g.integers(1, 40, n_store),
    })
    db["ex_sales"] = pd.DataFrame({
        "o_id": np.arange(1, n_ex + 1),
        "cat": g.choice([f"c{i}" for i in range(1, 7)], n_ex),
        "price": (g.random(n_ex) * 400 + 20).round(2),
    })
    n_er = max(6, int(0.18 * n_ex))
    db["ex_returns"] = pd.DataFrame({
        "r_o_id": g.choice(db["ex_sales"]["o_id"].to_numpy(), n_er, replace=True),
        "r_cost": (g.random(n_er) * 50 + 1).round(2),
    })
    for name, cols in TPCDS_SCHEMAS.items():
        assert tuple(db[name].columns) == cols, name
    return db


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )

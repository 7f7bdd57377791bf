"""TPC-DS-lite generator: schema conformance, determinism, referential
integrity, scaling."""
import numpy as np
import pytest

from repro.synth_data import FACT_TABLES, TPCDS_SCHEMAS, tpcds_lite


@pytest.fixture(scope="module")
def db():
    return tpcds_lite(sf=0.01, seed=7)


@pytest.mark.parametrize("table", sorted(TPCDS_SCHEMAS))
def test_schema_columns(db, table):
    assert tuple(db[table].columns) == TPCDS_SCHEMAS[table]


def test_deterministic_in_seed():
    a = tpcds_lite(sf=0.005, seed=3)
    b = tpcds_lite(sf=0.005, seed=3)
    for t in TPCDS_SCHEMAS:
        assert a[t].equals(b[t]), t


def test_different_seed_differs():
    a = tpcds_lite(sf=0.005, seed=3)
    b = tpcds_lite(sf=0.005, seed=4)
    assert not a["store_sales"].equals(b["store_sales"])


def test_scaling(db):
    big = tpcds_lite(sf=0.02, seed=7)
    assert len(big["store_sales"]) > len(db["store_sales"]) * 1.5


def test_returns_reference_sales(db):
    tickets = set(db["store_sales"]["ss_ticket"])
    assert set(db["store_returns"]["sr_ticket"]) <= tickets
    orders = set(db["catalog_sales"]["cs_order"])
    assert set(db["catalog_returns"]["cr_order"]) <= orders
    oids = set(db["ex_sales"]["o_id"])
    assert set(db["ex_returns"]["r_o_id"]) <= oids


def test_returns_pairs_join_sales(db):
    """(order,item) of returns must hit (order,item) of sales so the
    q40-style two-key outer join actually matches."""
    cs = db["catalog_sales"].set_index(["cs_order", "cs_item_sk"]).index
    cr = db["catalog_returns"].set_index(["cr_order", "cr_item_sk"]).index
    assert cr.isin(cs).all()


def test_unique_fact_keys(db):
    for t, key in (
        ("store_sales", "ss_ticket"),
        ("catalog_sales", "cs_order"),
        ("web_sales", "ws_order"),
        ("ex_sales", "o_id"),
    ):
        assert db[t][key].is_unique, t


def test_dim_keys_cover_fact_fks(db):
    assert set(db["store_sales"]["ss_item_sk"]) <= set(db["item"]["i_item_sk"])
    assert set(db["store_sales"]["ss_customer_sk"]) <= set(
        db["customer"]["c_customer_sk"]
    )
    assert set(db["customer"]["c_current_addr_sk"]) <= set(
        db["customer_address"]["ca_address_sk"]
    )
    assert set(db["catalog_sales"]["cs_warehouse_sk"]) <= set(
        db["warehouse"]["w_warehouse_sk"]
    )


def test_fact_tables_listed(db):
    for t in FACT_TABLES:
        assert t in TPCDS_SCHEMAS


def test_return_rate_plausible(db):
    r = len(db["store_returns"]) / len(db["store_sales"])
    assert 0.05 < r < 0.25


def test_no_nulls(db):
    for t in TPCDS_SCHEMAS:
        assert not db[t].isna().any().any(), t


def test_numeric_dtypes(db):
    assert np.issubdtype(db["store_sales"]["ss_ticket"].dtype, np.integer)
    assert np.issubdtype(db["store_sales"]["ss_sales_price"].dtype, np.floating)

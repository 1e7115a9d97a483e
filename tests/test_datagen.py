"""TPC-H data generator: domains, FK consistency, predicate coverage."""
import numpy as np
import pandas as pd
import pytest

from repro.tpch import datagen

T = datagen.tpch_tables(0.01)


def test_all_eight_tables_present():
    assert set(T) == {
        "lineitem", "orders", "customer", "part", "supplier",
        "partsupp", "nation", "region",
    }


def test_nation_region_domains():
    assert len(T["nation"]) == 25
    assert len(T["region"]) == 5
    for name in ("FRANCE", "GERMANY", "BRAZIL", "SAUDI ARABIA", "CANADA"):
        assert name in set(T["nation"]["n_name"])
    assert set(T["nation"]["n_regionkey"]) <= set(T["region"]["r_regionkey"])


def test_lineitem_orders_fk():
    assert T["lineitem"]["l_orderkey"].isin(T["orders"]["o_orderkey"]).all()


def test_lineitem_partsupp_fk():
    ps = set(zip(T["partsupp"]["ps_partkey"], T["partsupp"]["ps_suppkey"]))
    li = set(zip(T["lineitem"]["l_partkey"], T["lineitem"]["l_suppkey"]))
    assert li <= ps


def test_orders_customer_fk_skips_multiples_of_three():
    assert T["orders"]["o_custkey"].isin(T["customer"]["c_custkey"]).all()
    assert not (T["orders"]["o_custkey"] % 3 == 0).any()
    # so Q13/Q22 have customers without orders
    no_orders = set(T["customer"]["c_custkey"]) - set(T["orders"]["o_custkey"])
    assert no_orders


def test_date_consistency():
    li, o = T["lineitem"], T["orders"]
    odate = o.set_index("o_orderkey")["o_orderdate"]
    base = odate.loc[li["l_orderkey"]].to_numpy()
    assert (li["l_shipdate"].to_numpy() > base).all()
    assert (li["l_receiptdate"] > li["l_shipdate"]).all()


def test_phone_country_codes():
    cc = T["customer"]["c_phone"].str[:2].astype(int)
    assert ((cc >= 10) & (cc <= 34)).all()
    assert (cc - 10).equals(T["customer"]["c_nationkey"].astype(int))


@pytest.mark.parametrize(
    "pred",
    [
        lambda: T["part"]["p_type"].str.endswith("BRASS").any(),
        lambda: T["part"]["p_type"].str.startswith("PROMO").any(),
        lambda: (T["part"]["p_type"] == "ECONOMY ANODIZED STEEL").any(),
        lambda: T["part"]["p_name"].str.contains("green").any(),
        lambda: T["part"]["p_name"].str.startswith("forest").any(),
        lambda: (T["part"]["p_brand"] == "Brand#23").any(),
        lambda: (T["part"]["p_container"] == "MED BOX").any(),
        lambda: T["orders"]["o_comment"].str.contains("special").any(),
        lambda: T["supplier"]["s_comment"].str.contains("Customer").any(),
        lambda: T["lineitem"]["l_shipmode"].isin(["MAIL", "SHIP"]).any(),
        lambda: (T["lineitem"]["l_shipinstruct"] == "DELIVER IN PERSON").any(),
        lambda: (T["lineitem"]["l_returnflag"] == "R").any(),
        lambda: (T["orders"]["o_orderstatus"] == "F").any(),
        lambda: (T["customer"]["c_mktsegment"] == "BUILDING").any(),
    ],
)
def test_query_predicates_select_rows(pred):
    assert pred()


def test_hot_orders_exist_for_q18():
    counts = T["lineitem"].groupby("l_orderkey").size()
    assert counts.max() >= 10  # multi-line orders at tiny SF


def test_determinism():
    datagen.tpch_tables.cache_clear()
    a = datagen.tpch_tables(0.01)
    datagen.tpch_tables.cache_clear()
    b = datagen.tpch_tables(0.01)
    for name in a:
        pd.testing.assert_frame_equal(a[name], b[name])


def test_scaling():
    small = datagen.tpch_tables(0.01)
    big = datagen.tpch_tables(0.02)
    assert len(big["lineitem"]) == 2 * len(small["lineitem"])


def test_discount_domain_for_q6():
    d = T["lineitem"]["l_discount"]
    assert ((d >= 0) & (d <= 0.1)).all()
    assert ((d >= 0.05) & (d <= 0.07)).any()

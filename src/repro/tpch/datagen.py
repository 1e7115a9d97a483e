"""Synthetic TPC-H at a configurable scale factor (all 8 tables).

Mirrors dbgen's value domains closely enough that every validation-
parameter predicate of the 22 queries selects rows: the 25 standard
nations and 5 regions, the 150 ``p_type`` combinations, ``Brand#MN``,
container/shipmode/priority domains, phone numbers whose first two
characters encode ``10 + nationkey``, and comment text with occasional
``special ... requests`` / ``Customer ... Complaints`` markers.

Foreign keys are consistent: ``l_orderkey``→orders (with a hot-order
mixture so Q18/Q21-style multi-line orders exist at small SFs),
``(l_partkey, l_suppkey)``→partsupp (dbgen's 4-suppliers-per-part
formula), ``o_custkey``→customer (skipping custkeys divisible by 3, so
one third of customers have no orders — Q13/Q22 need them).

Deterministic in ``(sf, seed)``; generation is cached per process so
the DuckDB oracle, Spark, and TQP all see identical inputs.
"""
from __future__ import annotations

from functools import lru_cache

import numpy as np
import pandas as pd

_N = {
    "lineitem": 6_000_000,
    "orders": 1_500_000,
    "customer": 150_000,
    "part": 200_000,
    "supplier": 10_000,
}

NATIONS = [
    ("ALGERIA", 0), ("ARGENTINA", 1), ("BRAZIL", 1), ("CANADA", 1),
    ("EGYPT", 4), ("ETHIOPIA", 0), ("FRANCE", 3), ("GERMANY", 3),
    ("INDIA", 2), ("INDONESIA", 2), ("IRAN", 4), ("IRAQ", 4),
    ("JAPAN", 2), ("JORDAN", 4), ("KENYA", 0), ("MOROCCO", 0),
    ("MOZAMBIQUE", 0), ("PERU", 1), ("CHINA", 2), ("ROMANIA", 3),
    ("SAUDI ARABIA", 4), ("VIETNAM", 2), ("RUSSIA", 3),
    ("UNITED KINGDOM", 3), ("UNITED STATES", 1),
]
REGIONS = ["AFRICA", "AMERICA", "ASIA", "EUROPE", "MIDDLE EAST"]

_TYPE1 = ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"]
_TYPE2 = ["ANODIZED", "BURNISHED", "PLATED", "POLISHED", "BRUSHED"]
_TYPE3 = ["TIN", "NICKEL", "BRASS", "STEEL", "COPPER"]
_CONTAINER1 = ["SM", "MED", "LG", "JUMBO", "WRAP"]
_CONTAINER2 = ["CASE", "BOX", "BAG", "JAR", "PKG", "PACK", "CAN", "DRUM"]
_SEGMENTS = ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"]
_PRIORITIES = ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT SPECIFIED", "5-LOW"]
_SHIPMODES = ["REG AIR", "AIR", "RAIL", "SHIP", "TRUCK", "MAIL", "FOB"]
_INSTRUCT = ["DELIVER IN PERSON", "COLLECT COD", "NONE", "TAKE BACK RETURN"]
_COLORS = [
    "green", "forest", "blue", "red", "almond", "antique", "aquamarine",
    "azure", "beige", "bisque", "black", "blanched", "blush", "brown",
    "burlywood", "chartreuse", "chiffon", "chocolate", "coral", "cornflower",
]
_WORDS = (
    "the quickly final carefully furiously slyly ironic regular express "
    "deposits accounts packages requests instructions pinto beans foxes "
    "theodolites pending bold daring even silent"
).split()


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _comments(g: np.random.Generator, n: int, inject: str | None = None,
              rate: float = 0.0) -> np.ndarray:
    """Random comment text; optionally inject a two-word LIKE marker."""
    words = g.choice(_WORDS, size=(n, 5))
    out = np.array([" ".join(row) for row in words], dtype=object)
    if inject is not None and n:
        a, b = inject.split()
        hit = g.random(n) < rate
        idx = np.flatnonzero(hit)
        for i in idx:
            out[i] = f"{out[i][:12]} {a} {out[i][12:20]} {b}"
    return out


def _phones(nationkeys: np.ndarray, g: np.random.Generator) -> np.ndarray:
    d = g.integers(100, 1000, (len(nationkeys), 2))
    d4 = g.integers(1000, 10000, len(nationkeys))
    return np.array(
        [
            f"{10 + nk}-{a}-{b}-{c}"
            for nk, (a, b), c in zip(nationkeys, d, d4)
        ],
        dtype=object,
    )


@lru_cache(maxsize=4)
def tpch_tables(sf: float = 0.01, seed: int = 42) -> dict[str, pd.DataFrame]:
    """Generate all 8 TPC-H tables as pandas DataFrames (cached)."""
    n_li = max(100, int(_N["lineitem"] * sf))
    n_ord = max(40, int(_N["orders"] * sf))
    n_cust = max(20, int(_N["customer"] * sf))
    n_part = max(20, int(_N["part"] * sf))
    n_supp = max(10, int(_N["supplier"] * sf))
    g = _rng(seed)

    # -- nation / region ----------------------------------------------
    nation = pd.DataFrame(
        {
            "n_nationkey": np.arange(len(NATIONS)),
            "n_name": [n for n, _ in NATIONS],
            "n_regionkey": [r for _, r in NATIONS],
        }
    )
    region = pd.DataFrame(
        {"r_regionkey": np.arange(len(REGIONS)), "r_name": REGIONS}
    )

    # -- part ----------------------------------------------------------
    pk = np.arange(1, n_part + 1)
    name_words = g.choice(_COLORS, size=(n_part, 2))
    part = pd.DataFrame(
        {
            "p_partkey": pk,
            "p_name": [" ".join(w) for w in name_words],
            "p_mfgr": [f"Manufacturer#{i}" for i in g.integers(1, 6, n_part)],
            "p_brand": [
                f"Brand#{i}{j}"
                for i, j in zip(g.integers(1, 6, n_part), g.integers(1, 6, n_part))
            ],
            "p_type": [
                f"{a} {b} {c}"
                for a, b, c in zip(
                    g.choice(_TYPE1, n_part),
                    g.choice(_TYPE2, n_part),
                    g.choice(_TYPE3, n_part),
                )
            ],
            "p_size": g.integers(1, 51, n_part),
            "p_container": [
                f"{a} {b}"
                for a, b in zip(
                    g.choice(_CONTAINER1, n_part), g.choice(_CONTAINER2, n_part)
                )
            ],
            "p_retailprice": (900 + (pk % 1000) / 10.0 + g.random(n_part) * 100).round(2),
        }
    )

    # -- supplier ------------------------------------------------------
    sk = np.arange(1, n_supp + 1)
    s_nk = g.integers(0, 25, n_supp)
    supplier = pd.DataFrame(
        {
            "s_suppkey": sk,
            "s_name": [f"Supplier#{i:09d}" for i in sk],
            "s_address": _comments(g, n_supp),
            "s_nationkey": s_nk,
            "s_phone": _phones(s_nk, g),
            "s_acctbal": (g.random(n_supp) * 11000 - 1000).round(2),
            "s_comment": _comments(g, n_supp, "Customer Complaints", 0.01),
        }
    )

    # -- partsupp: dbgen's 4 suppliers per part ------------------------
    step = n_supp // 4 + 1
    ps_pk = np.repeat(pk, 4)
    ps_sk = ((ps_pk - 1 + np.tile(np.arange(4), n_part) * step) % n_supp) + 1
    partsupp = pd.DataFrame(
        {
            "ps_partkey": ps_pk,
            "ps_suppkey": ps_sk,
            "ps_availqty": g.integers(1, 10000, len(ps_pk)),
            "ps_supplycost": (g.random(len(ps_pk)) * 999 + 1).round(2),
        }
    ).drop_duplicates(["ps_partkey", "ps_suppkey"], ignore_index=True)

    # -- customer ------------------------------------------------------
    ck = np.arange(1, n_cust + 1)
    c_nk = g.integers(0, 25, n_cust)
    customer = pd.DataFrame(
        {
            "c_custkey": ck,
            "c_name": [f"Customer#{i:09d}" for i in ck],
            "c_address": _comments(g, n_cust),
            "c_nationkey": c_nk,
            "c_phone": _phones(c_nk, g),
            "c_acctbal": (g.random(n_cust) * 11000 - 1000).round(2),
            "c_mktsegment": g.choice(_SEGMENTS, n_cust),
            "c_comment": _comments(g, n_cust),
        }
    )

    # -- orders: custkeys not divisible by 3 ever get orders -----------
    ok = np.arange(1, n_ord + 1)
    eligible = ck[ck % 3 != 0]
    o_ck = g.choice(eligible, n_ord)
    o_date_off = g.integers(0, 2406, n_ord)
    o_date = np.datetime64("1992-01-01") + o_date_off.astype("timedelta64[D]")
    status = np.where(
        o_date < np.datetime64("1995-06-17"),
        "F",
        np.where(o_date > np.datetime64("1996-06-17"), "O", "P"),
    )
    orders = pd.DataFrame(
        {
            "o_orderkey": ok,
            "o_custkey": o_ck,
            "o_orderstatus": status,
            "o_totalprice": (g.random(n_ord) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime(o_date).astype("datetime64[us]"),
            "o_orderpriority": g.choice(_PRIORITIES, n_ord),
            "o_clerk": [f"Clerk#{i:09d}" for i in g.integers(1, max(n_ord // 1000, 2), n_ord)],
            "o_shippriority": np.zeros(n_ord, dtype=np.int64),
            "o_comment": _comments(g, n_ord, "special requests", 0.05),
        }
    )

    # -- lineitem: hot-order mixture for multi-line orders -------------
    n_hot_pool = max(n_ord // 100, 1)
    hot_pool = g.choice(ok, n_hot_pool, replace=False)
    n_hot = n_li // 10
    l_ok = np.concatenate(
        [g.choice(ok, n_li - n_hot), g.choice(hot_pool, n_hot)]
    )
    g.shuffle(l_ok)
    l_pk = g.integers(1, n_part + 1, n_li)
    l_sk = ((l_pk - 1 + g.integers(0, 4, n_li) * step) % n_supp) + 1
    qty = g.integers(1, 51, n_li).astype(np.float64)
    o_date_by_key = o_date_off  # o_orderkey is 1..n contiguous
    base_off = o_date_by_key[l_ok - 1]
    ship = base_off + g.integers(1, 122, n_li)
    commit = base_off + g.integers(30, 91, n_li)
    receipt = ship + g.integers(1, 31, n_li)
    epoch = np.datetime64("1992-01-01")
    shipdate = epoch + ship.astype("timedelta64[D]")
    receiptdate = epoch + receipt.astype("timedelta64[D]")
    cutoff = np.datetime64("1995-06-17")
    returnflag = np.where(
        receiptdate <= cutoff, g.choice(["R", "A"], n_li), "N"
    )
    lineitem = pd.DataFrame(
        {
            "l_orderkey": l_ok,
            "l_partkey": l_pk,
            "l_suppkey": l_sk,
            "l_linenumber": g.integers(1, 8, n_li),
            "l_quantity": qty,
            "l_extendedprice": (qty * (900 + (l_pk % 1000) / 10.0 + g.random(n_li) * 100)).round(2),
            "l_discount": (g.integers(0, 11, n_li) / 100.0),
            "l_tax": (g.integers(0, 9, n_li) / 100.0),
            "l_returnflag": returnflag,
            "l_linestatus": np.where(shipdate <= cutoff, "F", "O"),
            "l_shipdate": pd.to_datetime(shipdate).astype("datetime64[us]"),
            "l_commitdate": pd.to_datetime(epoch + commit.astype("timedelta64[D]")).astype("datetime64[us]"),
            "l_receiptdate": pd.to_datetime(receiptdate).astype("datetime64[us]"),
            "l_shipinstruct": g.choice(_INSTRUCT, n_li),
            "l_shipmode": g.choice(_SHIPMODES, n_li),
        }
    )

    return {
        "lineitem": lineitem,
        "orders": orders,
        "customer": customer,
        "part": part,
        "supplier": supplier,
        "partsupp": partsupp,
        "nation": nation,
        "region": region,
    }

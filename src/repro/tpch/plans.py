"""TQP physical plans for the 22 TPC-H queries.

Each ``qN()`` builds the IR through the plan-builder frontend the way
Spark's optimizer would emit it: filters pushed below joins, subqueries
decorrelated into (scalar-broadcast / semi / anti) joins, late projection.
Tie-break ORDER BY columns on LIMIT queries mirror
:mod:`repro.tpch.sqls` exactly.
"""
from __future__ import annotations

from repro.core.expr import Agg, case, col, date, lit
from repro.frontends.builder import Plan, scan

_REV = col("l_extendedprice") * (lit(1.0) - col("l_discount"))


def q1() -> Plan:
    li = scan("lineitem").filter(col("l_shipdate") <= date("1998-09-02"))
    return (
        li.aggregate(
            ["l_returnflag", "l_linestatus"],
            {
                "sum_qty": Agg("sum", col("l_quantity")),
                "sum_base_price": Agg("sum", col("l_extendedprice")),
                "sum_disc_price": Agg("sum", _REV),
                "sum_charge": Agg("sum", _REV * (lit(1.0) + col("l_tax"))),
                "avg_qty": Agg("avg", col("l_quantity")),
                "avg_price": Agg("avg", col("l_extendedprice")),
                "avg_disc": Agg("avg", col("l_discount")),
                "count_order": Agg("count_star"),
            },
        ).sort([("l_returnflag", "asc"), ("l_linestatus", "asc")])
    )


def _europe_partsupp() -> Plan:
    region = scan("region").filter(col("r_name") == "EUROPE")
    nat = scan("nation").join(region, ["n_regionkey"], ["r_regionkey"])
    supp = scan("supplier").join(nat, ["s_nationkey"], ["n_nationkey"])
    return scan("partsupp").join(supp, ["ps_suppkey"], ["s_suppkey"])


def q2() -> Plan:
    ps = _europe_partsupp()
    minc = (
        ps.aggregate(["ps_partkey"], {"min_cost": Agg("min", col("ps_supplycost"))})
        .project(mc_partkey="ps_partkey", min_cost="min_cost")
    )
    part = scan("part").filter(
        (col("p_size") == 15) & col("p_type").like("%BRASS")
    )
    j = part.join(ps, ["p_partkey"], ["ps_partkey"]).join(
        minc,
        ["p_partkey"],
        ["mc_partkey"],
        residual=col("ps_supplycost") == col("min_cost"),
    )
    return (
        j.project(
            s_acctbal="s_acctbal", s_name="s_name", n_name="n_name",
            p_partkey="p_partkey", p_mfgr="p_mfgr", s_address="s_address",
            s_phone="s_phone", s_comment="s_comment",
        )
        .sort(
            [
                ("s_acctbal", "desc"), ("n_name", "asc"),
                ("s_name", "asc"), ("p_partkey", "asc"),
            ]
        )
        .limit(100)
    )


def q3() -> Plan:
    c = scan("customer").filter(col("c_mktsegment") == "BUILDING")
    o = scan("orders").filter(col("o_orderdate") < date("1995-03-15")).join(
        c, ["o_custkey"], ["c_custkey"]
    )
    li = scan("lineitem").filter(col("l_shipdate") > date("1995-03-15")).join(
        o, ["l_orderkey"], ["o_orderkey"]
    )
    return (
        li.aggregate(
            ["l_orderkey", "o_orderdate", "o_shippriority"],
            {"revenue": Agg("sum", _REV)},
        )
        .project(
            l_orderkey="l_orderkey", revenue="revenue",
            o_orderdate="o_orderdate", o_shippriority="o_shippriority",
        )
        .sort([("revenue", "desc"), ("o_orderdate", "asc"), ("l_orderkey", "asc")])
        .limit(10)
    )


def q4() -> Plan:
    li = scan("lineitem").filter(col("l_commitdate") < col("l_receiptdate"))
    o = scan("orders").filter(
        (col("o_orderdate") >= date("1993-07-01"))
        & (col("o_orderdate") < date("1993-10-01"))
    )
    return (
        o.join(li, ["o_orderkey"], ["l_orderkey"], how="left_semi")
        .aggregate(["o_orderpriority"], {"order_count": Agg("count_star")})
        .sort([("o_orderpriority", "asc")])
    )


def q5() -> Plan:
    region = scan("region").filter(col("r_name") == "ASIA")
    nat = scan("nation").join(region, ["n_regionkey"], ["r_regionkey"])
    c = scan("customer").join(nat, ["c_nationkey"], ["n_nationkey"])
    o = scan("orders").filter(
        (col("o_orderdate") >= date("1994-01-01"))
        & (col("o_orderdate") < date("1995-01-01"))
    ).join(c, ["o_custkey"], ["c_custkey"])
    li = scan("lineitem").join(o, ["l_orderkey"], ["o_orderkey"])
    s = scan("supplier")
    j = li.join(s, ["l_suppkey", "c_nationkey"], ["s_suppkey", "s_nationkey"])
    return (
        j.aggregate(["n_name"], {"revenue": Agg("sum", _REV)})
        .sort([("revenue", "desc"), ("n_name", "asc")])
    )


def q6() -> Plan:
    li = scan("lineitem").filter(
        (col("l_shipdate") >= date("1994-01-01"))
        & (col("l_shipdate") < date("1995-01-01"))
        & col("l_discount").between(lit(0.05), lit(0.07))
        & (col("l_quantity") < 24)
    )
    return li.aggregate(
        [], {"revenue": Agg("sum", col("l_extendedprice") * col("l_discount"))}
    )


def q7() -> Plan:
    n1 = scan("nation").filter(col("n_name").isin(["FRANCE", "GERMANY"])).project(
        n1key="n_nationkey", supp_nation="n_name"
    )
    n2 = scan("nation").filter(col("n_name").isin(["FRANCE", "GERMANY"])).project(
        n2key="n_nationkey", cust_nation="n_name"
    )
    s = scan("supplier").join(n1, ["s_nationkey"], ["n1key"])
    c = scan("customer").join(n2, ["c_nationkey"], ["n2key"])
    o = scan("orders").join(c, ["o_custkey"], ["c_custkey"])
    li = scan("lineitem").filter(
        (col("l_shipdate") >= date("1995-01-01"))
        & (col("l_shipdate") <= date("1996-12-31"))
    )
    j = li.join(o, ["l_orderkey"], ["o_orderkey"]).join(
        s, ["l_suppkey"], ["s_suppkey"]
    )
    j = j.filter(
        ((col("supp_nation") == "FRANCE") & (col("cust_nation") == "GERMANY"))
        | ((col("supp_nation") == "GERMANY") & (col("cust_nation") == "FRANCE"))
    )
    j = j.project(
        supp_nation="supp_nation", cust_nation="cust_nation",
        l_year=col("l_shipdate").year(), volume=_REV,
    )
    return (
        j.aggregate(
            ["supp_nation", "cust_nation", "l_year"],
            {"revenue": Agg("sum", col("volume"))},
        ).sort(
            [("supp_nation", "asc"), ("cust_nation", "asc"), ("l_year", "asc")]
        )
    )


def q8() -> Plan:
    region = scan("region").filter(col("r_name") == "AMERICA")
    n1 = scan("nation").join(region, ["n_regionkey"], ["r_regionkey"]).project(
        n1key="n_nationkey"
    )
    c = scan("customer").join(n1, ["c_nationkey"], ["n1key"])
    o = scan("orders").filter(
        (col("o_orderdate") >= date("1995-01-01"))
        & (col("o_orderdate") <= date("1996-12-31"))
    ).join(c, ["o_custkey"], ["c_custkey"])
    p = scan("part").filter(col("p_type") == "ECONOMY ANODIZED STEEL")
    li = scan("lineitem").join(p, ["l_partkey"], ["p_partkey"]).join(
        o, ["l_orderkey"], ["o_orderkey"]
    )
    n2 = scan("nation").project(n2key="n_nationkey", nation="n_name")
    s = scan("supplier").join(n2, ["s_nationkey"], ["n2key"])
    j = li.join(s, ["l_suppkey"], ["s_suppkey"]).project(
        o_year=col("o_orderdate").year(), volume=_REV, nation="nation"
    )
    agg = j.aggregate(
        ["o_year"],
        {
            "num": Agg("sum", case([(col("nation") == "BRAZIL", col("volume"))], 0.0)),
            "den": Agg("sum", col("volume")),
        },
    )
    return (
        agg.project(o_year="o_year", mkt_share=col("num") / col("den"))
        .sort([("o_year", "asc")])
    )


def q9() -> Plan:
    p = scan("part").filter(col("p_name").like("%green%"))
    li = scan("lineitem").join(p, ["l_partkey"], ["p_partkey"])
    li = li.join(
        scan("partsupp"),
        ["l_partkey", "l_suppkey"],
        ["ps_partkey", "ps_suppkey"],
    )
    li = li.join(scan("orders"), ["l_orderkey"], ["o_orderkey"])
    s = scan("supplier").join(scan("nation"), ["s_nationkey"], ["n_nationkey"])
    j = li.join(s, ["l_suppkey"], ["s_suppkey"]).project(
        nation="n_name",
        o_year=col("o_orderdate").year(),
        amount=_REV - col("ps_supplycost") * col("l_quantity"),
    )
    return (
        j.aggregate(["nation", "o_year"], {"sum_profit": Agg("sum", col("amount"))})
        .sort([("nation", "asc"), ("o_year", "desc")])
    )


def q10() -> Plan:
    o = scan("orders").filter(
        (col("o_orderdate") >= date("1993-10-01"))
        & (col("o_orderdate") < date("1994-01-01"))
    )
    li = scan("lineitem").filter(col("l_returnflag") == "R").join(
        o, ["l_orderkey"], ["o_orderkey"]
    )
    c = scan("customer").join(scan("nation"), ["c_nationkey"], ["n_nationkey"])
    j = li.join(c, ["o_custkey"], ["c_custkey"])
    return (
        j.aggregate(
            [
                "c_custkey", "c_name", "c_acctbal", "c_phone",
                "n_name", "c_address", "c_comment",
            ],
            {"revenue": Agg("sum", _REV)},
        )
        .project(
            c_custkey="c_custkey", c_name="c_name", revenue="revenue",
            c_acctbal="c_acctbal", n_name="n_name", c_address="c_address",
            c_phone="c_phone", c_comment="c_comment",
        )
        .sort([("revenue", "desc"), ("c_custkey", "asc")])
        .limit(20)
    )


def _german_partsupp() -> Plan:
    nat = scan("nation").filter(col("n_name") == "GERMANY")
    supp = scan("supplier").join(nat, ["s_nationkey"], ["n_nationkey"])
    return scan("partsupp").join(supp, ["ps_suppkey"], ["s_suppkey"])


def q11() -> Plan:
    ps = _german_partsupp()
    value = col("ps_supplycost") * col("ps_availqty")
    grouped = ps.aggregate(["ps_partkey"], {"val": Agg("sum", value)})
    total = ps.aggregate([], {"t": Agg("sum", value)})
    return (
        grouped.filter(col("val") > total.scalar("t") * lit(0.0001))
        .sort([("val", "desc"), ("ps_partkey", "asc")])
    )


def q12() -> Plan:
    li = scan("lineitem").filter(
        col("l_shipmode").isin(["MAIL", "SHIP"])
        & (col("l_commitdate") < col("l_receiptdate"))
        & (col("l_shipdate") < col("l_commitdate"))
        & (col("l_receiptdate") >= date("1994-01-01"))
        & (col("l_receiptdate") < date("1995-01-01"))
    )
    j = li.join(scan("orders"), ["l_orderkey"], ["o_orderkey"])
    high = (col("o_orderpriority") == "1-URGENT") | (
        col("o_orderpriority") == "2-HIGH"
    )
    return (
        j.aggregate(
            ["l_shipmode"],
            {
                "high_line_count": Agg("sum", case([(high, 1)], 0)),
                "low_line_count": Agg("sum", case([(high, 0)], 1)),
            },
        ).sort([("l_shipmode", "asc")])
    )


def q13() -> Plan:
    o = scan("orders").filter(col("o_comment").not_like("%special%requests%"))
    j = scan("customer").join(o, ["c_custkey"], ["o_custkey"], how="left_outer")
    per_cust = j.aggregate(
        ["c_custkey"], {"c_count": Agg("count", col("o_orderkey"))}
    )
    return (
        per_cust.aggregate(["c_count"], {"custdist": Agg("count_star")})
        .sort([("custdist", "desc"), ("c_count", "desc")])
    )


def q14() -> Plan:
    li = scan("lineitem").filter(
        (col("l_shipdate") >= date("1995-09-01"))
        & (col("l_shipdate") < date("1995-10-01"))
    )
    j = li.join(scan("part"), ["l_partkey"], ["p_partkey"])
    agg = j.aggregate(
        [],
        {
            "promo": Agg(
                "sum", case([(col("p_type").like("PROMO%"), _REV)], 0.0)
            ),
            "total": Agg("sum", _REV),
        },
    )
    return agg.project(
        promo_revenue=lit(100.0) * col("promo") / col("total")
    )


def q15() -> Plan:
    rev = (
        scan("lineitem")
        .filter(
            (col("l_shipdate") >= date("1996-01-01"))
            & (col("l_shipdate") < date("1996-04-01"))
        )
        .aggregate(["l_suppkey"], {"total_revenue": Agg("sum", _REV)})
    )
    maxr = rev.aggregate([], {"m": Agg("max", col("total_revenue"))})
    top = rev.filter(col("total_revenue") == maxr.scalar("m")).project(
        supplier_no="l_suppkey", total_revenue="total_revenue"
    )
    j = scan("supplier").join(top, ["s_suppkey"], ["supplier_no"])
    return (
        j.project(
            s_suppkey="s_suppkey", s_name="s_name", s_address="s_address",
            s_phone="s_phone", total_revenue="total_revenue",
        ).sort([("s_suppkey", "asc")])
    )


def q16() -> Plan:
    bad = scan("supplier").filter(
        col("s_comment").like("%Customer%Complaints%")
    )
    ps = scan("partsupp").join(
        bad, ["ps_suppkey"], ["s_suppkey"], how="left_anti"
    )
    p = scan("part").filter(
        (col("p_brand") != "Brand#45")
        & col("p_type").not_like("MEDIUM POLISHED%")
        & col("p_size").isin([49, 14, 23, 45, 19, 3, 36, 9])
    )
    j = p.join(ps, ["p_partkey"], ["ps_partkey"])
    return (
        j.aggregate(
            ["p_brand", "p_type", "p_size"],
            {"supplier_cnt": Agg("count_distinct", col("ps_suppkey"))},
        ).sort(
            [
                ("supplier_cnt", "desc"), ("p_brand", "asc"),
                ("p_type", "asc"), ("p_size", "asc"),
            ]
        )
    )


def q17() -> Plan:
    avg_q = (
        scan("lineitem")
        .aggregate(["l_partkey"], {"aq": Agg("avg", col("l_quantity"))})
        .project(ap_partkey="l_partkey", thresh=col("aq") * lit(0.2))
    )
    p = scan("part").filter(
        (col("p_brand") == "Brand#23") & (col("p_container") == "MED BOX")
    ).select("p_partkey")
    j = scan("lineitem").join(p, ["l_partkey"], ["p_partkey"]).join(
        avg_q,
        ["l_partkey"],
        ["ap_partkey"],
        residual=col("l_quantity") < col("thresh"),
    )
    agg = j.aggregate([], {"s": Agg("sum", col("l_extendedprice"))})
    return agg.project(avg_yearly=col("s") / lit(7.0))


def q18() -> Plan:
    big = (
        scan("lineitem")
        .aggregate(["l_orderkey"], {"sq": Agg("sum", col("l_quantity"))})
        .filter(col("sq") > 300)
        .project(big_orderkey="l_orderkey")
    )
    o = scan("orders").join(
        big, ["o_orderkey"], ["big_orderkey"], how="left_semi"
    )
    j = o.join(scan("customer"), ["o_custkey"], ["c_custkey"]).join(
        scan("lineitem"), ["o_orderkey"], ["l_orderkey"]
    )
    return (
        j.aggregate(
            ["c_name", "c_custkey", "o_orderkey", "o_orderdate", "o_totalprice"],
            {"sum_qty": Agg("sum", col("l_quantity"))},
        )
        .sort(
            [
                ("o_totalprice", "desc"), ("o_orderdate", "asc"),
                ("o_orderkey", "asc"),
            ]
        )
        .limit(100)
    )


def q19() -> Plan:
    j = scan("lineitem").join(scan("part"), ["l_partkey"], ["p_partkey"])
    common = col("l_shipmode").isin(["AIR", "AIR REG"]) & (
        col("l_shipinstruct") == "DELIVER IN PERSON"
    )
    b1 = (
        (col("p_brand") == "Brand#12")
        & col("p_container").isin(["SM CASE", "SM BOX", "SM PACK", "SM PKG"])
        & col("l_quantity").between(1, 11)
        & col("p_size").between(1, 5)
    )
    b2 = (
        (col("p_brand") == "Brand#23")
        & col("p_container").isin(["MED BAG", "MED BOX", "MED PKG", "MED PACK"])
        & col("l_quantity").between(10, 20)
        & col("p_size").between(1, 10)
    )
    b3 = (
        (col("p_brand") == "Brand#34")
        & col("p_container").isin(["LG CASE", "LG BOX", "LG PACK", "LG PKG"])
        & col("l_quantity").between(20, 30)
        & col("p_size").between(1, 15)
    )
    return j.filter(common & (b1 | b2 | b3)).aggregate(
        [], {"revenue": Agg("sum", _REV)}
    )


def q20() -> Plan:
    forest = scan("part").filter(col("p_name").like("forest%")).project(
        fp_partkey="p_partkey"
    )
    lsum = (
        scan("lineitem")
        .filter(
            (col("l_shipdate") >= date("1994-01-01"))
            & (col("l_shipdate") < date("1995-01-01"))
        )
        .aggregate(
            ["l_partkey", "l_suppkey"], {"sq": Agg("sum", col("l_quantity"))}
        )
        .project(
            lp_partkey="l_partkey", ls_suppkey="l_suppkey",
            half_qty=col("sq") * lit(0.5),
        )
    )
    ps = scan("partsupp").join(
        forest, ["ps_partkey"], ["fp_partkey"], how="left_semi"
    )
    ps = ps.join(
        lsum,
        ["ps_partkey", "ps_suppkey"],
        ["lp_partkey", "ls_suppkey"],
        residual=col("ps_availqty") > col("half_qty"),
    )
    s = scan("supplier").join(
        ps, ["s_suppkey"], ["ps_suppkey"], how="left_semi"
    )
    nat = scan("nation").filter(col("n_name") == "CANADA")
    j = s.join(nat, ["s_nationkey"], ["n_nationkey"])
    return j.project(s_name="s_name", s_address="s_address").sort(
        [("s_name", "asc")]
    )


def q21() -> Plan:
    nat = scan("nation").filter(col("n_name") == "SAUDI ARABIA")
    s = scan("supplier").join(nat, ["s_nationkey"], ["n_nationkey"])
    l1 = scan("lineitem").filter(col("l_receiptdate") > col("l_commitdate"))
    j = l1.join(s, ["l_suppkey"], ["s_suppkey"])
    o = scan("orders").filter(col("o_orderstatus") == "F")
    j = j.join(o, ["l_orderkey"], ["o_orderkey"])
    l2 = scan("lineitem").project(
        l2_orderkey="l_orderkey", l2_suppkey="l_suppkey"
    )
    j = j.join(
        l2,
        ["l_orderkey"],
        ["l2_orderkey"],
        how="left_semi",
        residual=col("l2_suppkey") != col("l_suppkey"),
    )
    l3 = (
        scan("lineitem")
        .filter(col("l_receiptdate") > col("l_commitdate"))
        .project(l3_orderkey="l_orderkey", l3_suppkey="l_suppkey")
    )
    j = j.join(
        l3,
        ["l_orderkey"],
        ["l3_orderkey"],
        how="left_anti",
        residual=col("l3_suppkey") != col("l_suppkey"),
    )
    return (
        j.aggregate(["s_name"], {"numwait": Agg("count_star")})
        .sort([("numwait", "desc"), ("s_name", "asc")])
        .limit(100)
    )


def q22() -> Plan:
    codes = ["13", "31", "23", "29", "30", "18", "17"]
    base = scan("customer").filter(col("c_phone").substr(1, 2).isin(codes))
    avg_bal = base.filter(col("c_acctbal") > 0.0).aggregate(
        [], {"a": Agg("avg", col("c_acctbal"))}
    )
    sel = base.filter(col("c_acctbal") > avg_bal.scalar("a"))
    noord = sel.join(
        scan("orders"), ["c_custkey"], ["o_custkey"], how="left_anti"
    )
    j = noord.project(
        cntrycode=col("c_phone").substr(1, 2), c_acctbal="c_acctbal"
    )
    return (
        j.aggregate(
            ["cntrycode"],
            {
                "numcust": Agg("count_star"),
                "totacctbal": Agg("sum", col("c_acctbal")),
            },
        ).sort([("cntrycode", "asc")])
    )


PLANS = {
    1: q1, 2: q2, 3: q3, 4: q4, 5: q5, 6: q6, 7: q7, 8: q8, 9: q9,
    10: q10, 11: q11, 12: q12, 13: q13, 14: q14, 15: q15, 16: q16,
    17: q17, 18: q18, 19: q19, 20: q20, 21: q21, 22: q22,
}

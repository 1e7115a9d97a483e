"""Per-partition tensor execution on Spark (repro.sparkexec) vs oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.core.expr import Agg, col, date, lit
from repro.frontends.builder import scan
from repro.oracle import assert_equivalent
from repro.sparkexec.aggregates import tensor_aggregate
from repro.sparkexec.joins import tensor_join
from repro.sparkexec.partitioned import run_map_plan
from repro.tpch import datagen

SF = 0.005


@pytest.fixture(scope="module")
def tpch():
    return datagen.tpch_tables(SF)


@pytest.fixture(scope="module")
def li_df(spark, tpch):
    return spark.createDataFrame(tpch["lineitem"]).repartition(8).cache()


@pytest.fixture(scope="module")
def o_df(spark, tpch):
    return spark.createDataFrame(tpch["orders"]).repartition(8).cache()


def _q6_filter_plan():
    return (
        scan("input")
        .filter(
            (col("l_shipdate") >= date("1994-01-01"))
            & (col("l_shipdate") < date("1995-01-01"))
            & col("l_discount").between(lit(0.05), lit(0.07))
            & (col("l_quantity") < 24)
        )
        .project(rev=col("l_extendedprice") * col("l_discount"))
    )


def test_partitionwise_filter_project(spark, tpch, li_df):
    out = run_map_plan(li_df, _q6_filter_plan)
    assert_equivalent(
        out,
        """select l_extendedprice * l_discount as rev from lineitem
           where l_shipdate >= date '1994-01-01' and l_shipdate < date '1995-01-01'
             and l_discount between 0.05 and 0.07 and l_quantity < 24""",
        lineitem=tpch["lineitem"],
    )


def test_partitionwise_string_expr(spark, tpch, li_df):
    def plan():
        return (
            scan("input")
            .filter(col("l_shipmode").isin(["MAIL", "SHIP"]))
            .project(m=col("l_shipmode"), ok=col("l_orderkey"))
        )

    out = run_map_plan(li_df, plan)
    assert_equivalent(
        out,
        "select l_shipmode as m, l_orderkey as ok from lineitem "
        "where l_shipmode in ('MAIL','SHIP')",
        lineitem=tpch["lineitem"],
    )


@pytest.mark.parametrize("impl", ["sort", "hash"])
def test_distributed_inner_join(spark, tpch, li_df, o_df, impl):
    out = tensor_join(
        li_df.select("l_orderkey", "l_quantity"),
        o_df.select("o_orderkey", "o_orderpriority"),
        ["l_orderkey"],
        ["o_orderkey"],
        impl=impl,
        buckets=8,
    )
    assert_equivalent(
        out,
        """select l_orderkey, l_quantity, o_orderkey, o_orderpriority
           from lineitem join orders on l_orderkey = o_orderkey""",
        lineitem=tpch["lineitem"], orders=tpch["orders"],
    )


def test_distributed_semi_join(spark, tpch, li_df, o_df):
    out = tensor_join(
        o_df.select("o_orderkey", "o_orderpriority"),
        li_df.select("l_orderkey", "l_quantity").where("l_quantity > 45"),
        ["o_orderkey"],
        ["l_orderkey"],
        how="left_semi",
        buckets=8,
    )
    assert_equivalent(
        out,
        """select o_orderkey, o_orderpriority from orders
           where o_orderkey in (select l_orderkey from lineitem where l_quantity > 45)""",
        lineitem=tpch["lineitem"], orders=tpch["orders"],
    )


def test_distributed_anti_join(spark, tpch, li_df, o_df):
    out = tensor_join(
        o_df.select("o_orderkey", "o_totalprice"),
        li_df.select("l_orderkey"),
        ["o_orderkey"],
        ["l_orderkey"],
        how="left_anti",
        buckets=8,
    )
    assert_equivalent(
        out,
        """select o_orderkey, o_totalprice from orders
           where o_orderkey not in (select l_orderkey from lineitem)""",
        lineitem=tpch["lineitem"], orders=tpch["orders"],
    )


def test_distributed_grouped_aggregate(spark, tpch, li_df):
    out = tensor_aggregate(
        li_df,
        ["l_returnflag"],
        {
            "s": Agg("sum", col("l_quantity")),
            "c": Agg("count_star"),
            "mx": Agg("max", col("l_extendedprice")),
            "av": Agg("avg", col("l_discount")),
        },
    )
    assert_equivalent(
        out,
        """select l_returnflag, sum(l_quantity) as s, count(*) as c,
                  max(l_extendedprice) as mx, avg(l_discount) as av
           from lineitem group by l_returnflag""",
        lineitem=tpch["lineitem"],
    )


def test_distributed_global_aggregate(spark, tpch, li_df):
    out = tensor_aggregate(
        li_df, [], {"s": Agg("sum", col("l_quantity")), "c": Agg("count_star")}
    )
    assert_equivalent(
        out,
        "select sum(l_quantity) as s, count(*) as c from lineitem",
        lineitem=tpch["lineitem"],
    )


def test_distributed_q6_pipeline(spark, tpch, li_df):
    """Filter/project per partition + global tensor aggregation = Q6."""
    filtered = run_map_plan(li_df, _q6_filter_plan)
    out = tensor_aggregate(filtered, [], {"revenue": Agg("sum", col("rev"))})
    from repro.tpch import sqls

    assert_equivalent(out, sqls.QUERIES[6], lineitem=tpch["lineitem"])

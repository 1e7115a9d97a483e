"""End-to-end TPC-H: every query, both execution modes, DuckDB oracle.

The oracle (`repro.oracle.assert_equivalent`) runs the reference SQL on
DuckDB over the identical pandas inputs and diffs sorted rows against
TQP's result — a wrong join/rewrite fails loudly, not silently.
"""
import pytest

from repro.oracle import assert_equivalent
from repro.core.compiler import compile_plan
from repro.tpch import datagen, plans, sqls
from tests.helpers import to_spark

SF = 0.01
ALL_QUERIES = list(range(1, 23))


@pytest.fixture(scope="module")
def tpch():
    return datagen.tpch_tables(SF)


@pytest.mark.parametrize("q", ALL_QUERIES)
@pytest.mark.parametrize("mode", ["torch", "jit"])
def test_tpch_query_matches_oracle(spark, tpch, q, mode):
    cq = compile_plan(plans.PLANS[q](), mode)
    result = cq.run(tpch)
    inputs = {name: tpch[name] for name in sqls.TABLES[q]}
    assert_equivalent(to_spark(spark, result), sqls.QUERIES[q], **inputs)


@pytest.mark.parametrize("q", [1, 3, 6, 9, 14, 18])
def test_tpch_nonempty_results(tpch, q):
    """Representative queries must actually select data at test SF."""
    out = compile_plan(plans.PLANS[q](), "torch").run(tpch)
    assert len(out) > 0


def test_sql_matches_spark_too(spark, tpch):
    """The reference SQL itself runs on Spark and agrees with DuckDB
    (sanity that Table 2's Spark baseline executes the same query)."""
    for name in sqls.TABLES[6]:
        to_spark(spark, tpch[name]).createOrReplaceTempView(name)
    spark_df = spark.sql(sqls.QUERIES[6])
    assert_equivalent(spark_df, sqls.QUERIES[6], lineitem=tpch["lineitem"])

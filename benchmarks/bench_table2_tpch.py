"""Table 2 benchmark: full TPC-H — TQP/TQPJ vs DuckDB vs Spark.

All 22 queries run under TQP (interpreted + compiled) and DuckDB
(1 thread, like the paper's single-core CPU column).  The Spark baseline
runs on the representative subset (§6.3 selection) to bound wall-clock;
the full Spark column comes from ``spark-submit jobs/table2_tpch.py``.
"""
import os

import pytest

from repro.bench.baselines import DuckDBRunner, SparkRunner
from repro.core.compiler import compile_plan
from repro.tensor.device import PROFILES
from repro.tpch import datagen, plans, sqls

SF = float(os.environ.get("REPRO_BENCH_SF", "0.1"))
ALL = list(range(1, 23))
REPRESENTATIVE = [1, 2, 6, 9, 14, 18]


@pytest.fixture(scope="module")
def tpch():
    return datagen.tpch_tables(SF)


@pytest.fixture(scope="module")
def duck(tpch):
    return DuckDBRunner(tpch, threads=1)


@pytest.fixture(scope="module")
def spark_runner(spark, tpch):
    return SparkRunner(spark, tpch)


@pytest.mark.parametrize("q", ALL)
def test_tqp_interpreted(benchmark, tpch, q):
    cq = compile_plan(plans.PLANS[q](), "torch")
    conv = cq.convert(tpch)
    out = benchmark.pedantic(
        lambda: cq.execute(conv), rounds=3, iterations=1, warmup_rounds=1
    )
    benchmark.extra_info["sim_gpu_p100_s"] = cq.simulated_time(
        conv, "gpu-p100", scale=1.0 / SF, fused=False
    )
    assert out is not None


@pytest.mark.parametrize("q", ALL)
def test_tqpj_compiled(benchmark, tpch, q):
    cq = compile_plan(plans.PLANS[q](), "jit")
    conv = cq.convert(tpch)
    out = benchmark.pedantic(
        lambda: cq.execute(conv), rounds=3, iterations=1, warmup_rounds=1
    )
    assert out is not None


@pytest.mark.parametrize("q", ALL)
def test_duckdb_single_thread(benchmark, duck, q):
    out = benchmark.pedantic(
        duck.runner(sqls.QUERIES[q]), rounds=3, iterations=1, warmup_rounds=1
    )
    assert out is not None


@pytest.mark.parametrize("q", REPRESENTATIVE)
def test_spark_baseline(benchmark, spark_runner, q):
    out = benchmark.pedantic(
        spark_runner.runner(sqls.QUERIES[q]), rounds=2, iterations=1, warmup_rounds=1
    )
    assert out is not None

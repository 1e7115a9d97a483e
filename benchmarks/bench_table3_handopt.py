"""Table 3 benchmark: hand-optimized plans (Q1/Q6/Q9/Q14) vs DuckDB."""
import os

import pytest

from repro.bench.baselines import DuckDBRunner
from repro.tensor.device import PROFILES, tracing
from repro.tpch import datagen, handopt, sqls

SF = float(os.environ.get("REPRO_BENCH_SF", "0.1"))
CASES = [
    (q, mode)
    for q in (1, 6, 9, 14)
    for mode in ("torch", "jit", "tvm")
    if handopt.HANDOPT[q][mode] is not None
]


@pytest.fixture(scope="module")
def tpch():
    return datagen.tpch_tables(SF)


@pytest.fixture(scope="module")
def duck1(tpch):
    return DuckDBRunner(tpch, threads=1)


@pytest.fixture(scope="module")
def duck_all(tpch):
    return DuckDBRunner(tpch, threads=0)


@pytest.mark.parametrize("q,mode", CASES)
def test_handopt(benchmark, tpch, q, mode):
    conv = handopt.convert_tables(tpch, q)
    fn = handopt.HANDOPT[q][mode]
    out = benchmark.pedantic(
        lambda: fn(conv), rounds=3, iterations=1, warmup_rounds=1
    )
    if mode == "torch":
        with tracing() as tr:
            fn(conv)
        benchmark.extra_info["sim_gpu_p100_sf10_s"] = tr.scaled(
            10.0 / SF
        ).time_on(PROFILES["gpu-p100"])
    assert len(out) >= 1


@pytest.mark.parametrize("q", [1, 6, 9, 14])
def test_duckdb_1thread(benchmark, duck1, q):
    assert (
        benchmark.pedantic(
            duck1.runner(sqls.QUERIES[q]), rounds=3, iterations=1, warmup_rounds=1
        )
        is not None
    )


@pytest.mark.parametrize("q", [1, 6, 9, 14])
def test_duckdb_allcores(benchmark, duck_all, q):
    assert (
        benchmark.pedantic(
            duck_all.runner(sqls.QUERIES[q]), rounds=3, iterations=1, warmup_rounds=1
        )
        is not None
    )

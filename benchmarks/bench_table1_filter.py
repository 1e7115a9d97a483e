"""Table 1 benchmark: bitmap vs Python-control-flow filter (§3.1).

Regenerate the full table with ``python jobs/table1_filter_micro.py``.
"""
import os

import numpy as np
import pytest

from repro.bench.tables import _python_loop_filter, python_loop_trace
from repro.tensor import elementwise as ew, indexing as ix
from repro.tensor.device import PROFILES, tracing
from repro.tensor.tensor import Tensor
from repro.tpch import datagen

SF = float(os.environ.get("REPRO_BENCH_SF", "0.1"))


@pytest.fixture(scope="module")
def quantity():
    return datagen.tpch_tables(SF)["lineitem"]["l_quantity"].to_numpy()


def test_bitmap_filter_torch(benchmark, quantity):
    def run():
        return ix.masked_select(quantity, ew.lt(quantity, 24))

    out = benchmark.pedantic(run, rounds=5, iterations=1, warmup_rounds=2)
    assert out.shape[0] == (quantity < 24).sum()


def test_bitmap_filter_jit(benchmark, quantity):
    out = benchmark.pedantic(
        lambda: quantity[quantity < 24], rounds=5, iterations=1, warmup_rounds=2
    )
    assert out.shape[0] == (quantity < 24).sum()


def test_python_loop_filter(benchmark, quantity):
    """Listing 2 — the anti-pattern DC1 forbids; orders of magnitude slower."""
    t = Tensor(quantity)
    out = benchmark.pedantic(
        lambda: _python_loop_filter(t), rounds=1, iterations=1, warmup_rounds=0
    )
    assert len(out) == (quantity < 24).sum()


def test_simulated_gpu_times(benchmark, quantity):
    """Record the simulated-GPU column of Table 1 as extra_info."""
    def run():
        with tracing() as tr:
            ix.masked_select(quantity, ew.lt(quantity, 24))
        return tr

    tr = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    scale = 1.0 / SF
    p = PROFILES["gpu-p100"]
    benchmark.extra_info["sim_bitmap_gpu_s"] = tr.scaled(scale).time_on(p)
    benchmark.extra_info["sim_python_gpu_s"] = python_loop_trace(
        int(quantity.shape[0] * scale)
    ).time_on(p)
    # the paper's headline: Python control flow on GPU is catastrophically slow
    assert benchmark.extra_info["sim_python_gpu_s"] > 100 * benchmark.extra_info[
        "sim_bitmap_gpu_s"
    ]

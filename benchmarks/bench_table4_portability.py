"""Table 4 benchmark: Q6 hand-opt across simulated backends.

The benchmark times the real CPU execution of the traced program; the
per-backend simulated milliseconds (the table's payload) are attached as
``extra_info`` and asserted against the paper's ordering.
"""
import os

import pytest

from repro.bench import paper
from repro.tensor.device import PROFILES, tracing
from repro.tpch import datagen, handopt

SF = float(os.environ.get("REPRO_BENCH_SF", "0.1"))


@pytest.fixture(scope="module")
def trace():
    conv = handopt.convert_tables(datagen.tpch_tables(SF), 6)
    with tracing() as tr:
        handopt.HANDOPT[6]["torch"](conv)
    return tr.scaled(1.0 / SF)  # SF1-equivalent, like the paper


@pytest.mark.parametrize("device", list(paper.TABLE4))
def test_backend_sim(benchmark, trace, device):
    conv = handopt.convert_tables(datagen.tpch_tables(SF), 6)
    fn = handopt.HANDOPT[6]["torch"]
    benchmark.pedantic(lambda: fn(conv), rounds=2, iterations=1, warmup_rounds=1)
    sim_ms = trace.time_on(PROFILES[device]) * 1000.0
    benchmark.extra_info["sim_ms"] = sim_ms
    benchmark.extra_info["paper_ms"] = paper.TABLE4[device]
    # within 3x of the paper's published number for every backend
    assert sim_ms == pytest.approx(paper.TABLE4[device], rel=2.0)


def test_backend_ordering_matches_paper(trace):
    """The relative ordering of backends is the portability claim."""
    sims = {d: trace.time_on(PROFILES[d]) for d in paper.TABLE4}
    ours = sorted(paper.TABLE4, key=lambda d: sims[d])
    papers = sorted(paper.TABLE4, key=lambda d: paper.TABLE4[d])
    assert ours == papers

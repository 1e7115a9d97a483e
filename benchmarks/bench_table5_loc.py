"""Table 5 benchmark: lines of code per relational operator.

Regenerates the LOC counts for our tensor-based operator implementations
and checks the paper's parsimony claim: an order of magnitude less code
than CPU baselines, more against GPU baselines.
"""
import pytest

from repro.bench import paper
from repro.bench.tables import table5


@pytest.fixture(scope="module")
def counts():
    headers, rows = table5()
    ours = rows[0]
    return dict(zip(headers, ours))


def test_count_loc(benchmark):
    headers, rows = benchmark.pedantic(
        table5, rounds=3, iterations=1, warmup_rounds=1
    )
    assert rows[0][0].startswith("TQP-repro")


@pytest.mark.parametrize("op", ["hash_join", "sort_join", "aggregation"])
def test_parsimony_vs_cpu_baselines(counts, op):
    ours = counts[op]
    assert ours < paper.TABLE5["Spark (CPU)"][op] / 3
    assert ours < paper.TABLE5["DuckDB (CPU)"][op] / 3


@pytest.mark.parametrize("op", ["hash_join", "aggregation"])
def test_parsimony_vs_gpu_baselines(counts, op):
    ours = counts[op]
    assert ours < paper.TABLE5["BlazingSQL (GPU)"][op] / 5
    assert ours < paper.TABLE5["OmnisciDB (GPU)"][op] / 5


def test_same_order_of_magnitude_as_paper_tqp(counts):
    for op in ("hash_join", "sort_join", "aggregation"):
        ours = counts[op]
        theirs = paper.TABLE5["TQP (Various HW)"][op]
        assert theirs / 5 <= ours <= theirs * 5

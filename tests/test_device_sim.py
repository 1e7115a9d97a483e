"""Unit tests: op tracing and the simulated-device cost model."""
import numpy as np
import pytest

from repro.tensor import elementwise as ew, indexing as ix, sorting
from repro.tensor.device import (
    PROFILES, OpRecord, OpTrace, is_tracing, record, tracing,
)


def test_tracing_captures_ops():
    a = np.arange(1000, dtype=np.float64)
    with tracing() as tr:
        m = ew.lt(a, 500.0)
        ix.masked_select(a, m)
    names = [r.name for r in tr.records]
    assert names == ["lt", "masked_select"]
    assert tr.records[0].bytes_in > 0


def test_no_trace_outside_context():
    assert not is_tracing()
    record("noop", 1, 1, 1)  # must not raise


def test_nested_tracing_restores_outer():
    with tracing() as outer:
        record("a", 1, 1, 1)
        with tracing() as inner:
            record("b", 1, 1, 1)
        record("c", 1, 1, 1)
    assert [r.name for r in outer.records] == ["a", "c"]
    assert [r.name for r in inner.records] == ["b"]


def test_time_positive_and_bandwidth_ordering():
    tr = OpTrace()
    tr.add(OpRecord("add", 10**8, 10**8, 10**7))
    t_v100 = tr.time_on(PROFILES["gpu-v100"])
    t_k80 = tr.time_on(PROFILES["gpu-k80"])
    t_wasm = tr.time_on(PROFILES["wasm-chrome"])
    assert 0 < t_v100 < t_k80 < t_wasm


def test_sort_costs_more_than_elementwise():
    tr_sort = OpTrace()
    tr_sort.add(OpRecord("sort", 10**8, 10**8, 10**7))
    tr_add = OpTrace()
    tr_add.add(OpRecord("add", 10**8, 10**8, 10**7))
    p = PROFILES["gpu-p100"]
    assert tr_sort.time_on(p) > tr_add.time_on(p)


def test_sync_penalty_applies():
    p = PROFILES["tpu"]
    t_sync = p.op_time(OpRecord("nonzero", 1000, 1000, 100))
    t_plain = p.op_time(OpRecord("add", 1000, 1000, 100))
    assert t_sync > t_plain + p.sync_s / 2


def test_fusion_reduces_launches():
    tr = OpTrace()
    for _ in range(10):
        tr.add(OpRecord("mul", 8000, 8000, 1000))
    p = PROFILES["gpu-p100"]
    assert tr.time_on(p, fused=True) < tr.time_on(p, fused=False)


def test_fusion_does_not_merge_across_barriers():
    tr = OpTrace()
    tr.add(OpRecord("mul", 8000, 8000, 1000))
    tr.add(OpRecord("sort", 8000, 8000, 1000))
    tr.add(OpRecord("mul", 8000, 8000, 1000))
    p = PROFILES["gpu-p100"]
    # 3 launches either way: sort is a fusion barrier
    assert tr.time_on(p, fused=True) >= 3 * p.launch_s


def test_scaled_trace_scales_bytes_not_launches():
    tr = OpTrace()
    tr.add(OpRecord("add", 1000, 1000, 100))
    s = tr.scaled(10)
    assert s.records[0].bytes_in == 10000
    assert len(s.records) == len(tr.records)


def test_python_item_pricing():
    p = PROFILES["gpu-p100"]
    t = p.op_time(OpRecord("python_item", 8 * 10**6, 8 * 10**6, 10**6))
    assert t == pytest.approx(p.python_item_s * 10**6)


def test_all_profiles_have_positive_params():
    for p in PROFILES.values():
        assert p.launch_s >= 0 and p.bw > 0


def test_sorting_ops_record_sort_names():
    with tracing() as tr:
        sorting.sort(np.array([3, 1, 2]))
        sorting.argsort(np.array([3, 1, 2]))
        sorting.lexsort([np.array([1, 2])])
    assert [r.name for r in tr.records] == ["sort", "argsort", "lexsort"]

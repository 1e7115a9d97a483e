"""Join operators (Algorithms 1 & 2) vs pandas merge ground truth."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.compiler import compile_plan
from repro.core.expr import col
from repro.core.operators.join_hash import hash_join_pairs
from repro.core.operators.join_sort import sort_join_pairs
from repro.frontends.builder import scan
from tests.helpers import assert_frames_match

PAIR_FNS = {"sort": sort_join_pairs, "hash": hash_join_pairs}


def _pairs_set(lk, rk, fn):
    n_keys = int(max(lk.max(initial=-1), rk.max(initial=-1))) + 1
    li, ri = fn(lk, rk, n_keys)
    return set(zip(li.tolist(), ri.tolist()))


def _expected_pairs(lk, rk):
    out = set()
    for i, a in enumerate(lk):
        for j, b in enumerate(rk):
            if a == b:
                out.add((i, j))
    return out


@pytest.mark.parametrize("impl", ["sort", "hash"])
def test_simple_join_pairs(impl):
    lk = np.array([1, 2, 2, 3], dtype=np.int64)
    rk = np.array([2, 3, 3, 5], dtype=np.int64)
    assert _pairs_set(lk, rk, PAIR_FNS[impl]) == _expected_pairs(lk, rk)


@pytest.mark.parametrize("impl", ["sort", "hash"])
def test_empty_sides(impl):
    e = np.zeros(0, dtype=np.int64)
    k = np.array([1, 2], dtype=np.int64)
    for a, b in [(e, k), (k, e), (e, e)]:
        li, ri = PAIR_FNS[impl](a, b, 3)
        assert li.size == 0 and ri.size == 0


@pytest.mark.parametrize("impl", ["sort", "hash"])
@settings(max_examples=40, deadline=None)
@given(
    st.lists(st.integers(0, 8), max_size=30),
    st.lists(st.integers(0, 8), max_size=30),
)
def test_join_pairs_property(impl, lks, rks):
    lk = np.array(lks, dtype=np.int64)
    rk = np.array(rks, dtype=np.int64)
    assert _pairs_set(lk, rk, PAIR_FNS[impl]) == _expected_pairs(lk, rk)


def test_hash_join_heavy_collisions():
    """Many duplicates per key forces the interleaved multi-pass path."""
    lk = np.repeat(np.arange(5, dtype=np.int64), 20)
    rk = np.repeat(np.arange(5, dtype=np.int64), 3)
    assert _pairs_set(lk, rk, hash_join_pairs) == _expected_pairs(lk, rk)


# ------- end-to-end join modes through the compiler ------------------
def _dfs(seed=0, n=80):
    g = np.random.default_rng(seed)
    left = pd.DataFrame(
        {
            "k": g.integers(0, 15, n),
            "k2": g.choice(["x", "y"], n),
            "lv": g.random(n).round(3),
        }
    )
    right = pd.DataFrame(
        {
            "rk": g.integers(0, 15, n // 2),
            "rk2": g.choice(["x", "y"], n // 2),
            "rv": g.random(n // 2).round(3),
        }
    )
    return left, right


def _run(plan, tables, mode="torch"):
    return compile_plan(plan, mode).run(tables)


@pytest.mark.parametrize("impl", ["sort", "hash"])
@pytest.mark.parametrize("mode", ["torch", "jit"])
def test_inner_join_matches_pandas(impl, mode):
    left, right = _dfs()
    got = _run(
        scan("l").join(scan("r"), ["k"], ["rk"], impl=impl),
        {"l": left, "r": right},
        mode,
    )
    exp = left.merge(right, left_on="k", right_on="rk")
    assert_frames_match(got, exp)


@pytest.mark.parametrize("impl", ["sort", "hash"])
def test_multi_key_join_with_strings(impl):
    left, right = _dfs(3)
    got = _run(
        scan("l").join(scan("r"), ["k", "k2"], ["rk", "rk2"], impl=impl),
        {"l": left, "r": right},
    )
    exp = left.merge(right, left_on=["k", "k2"], right_on=["rk", "rk2"])
    assert_frames_match(got, exp)


def test_left_semi_join():
    left, right = _dfs(1)
    got = _run(
        scan("l").join(scan("r"), ["k"], ["rk"], how="left_semi"),
        {"l": left, "r": right},
    )
    exp = left[left["k"].isin(right["rk"])]
    assert_frames_match(got, exp)


def test_left_anti_join():
    left, right = _dfs(2)
    got = _run(
        scan("l").join(scan("r"), ["k"], ["rk"], how="left_anti"),
        {"l": left, "r": right},
    )
    exp = left[~left["k"].isin(right["rk"])]
    assert_frames_match(got, exp)


def test_left_outer_join():
    left, right = _dfs(4)
    got = _run(
        scan("l").join(scan("r"), ["k"], ["rk"], how="left_outer"),
        {"l": left, "r": right},
    )
    exp = left.merge(right, left_on="k", right_on="rk", how="left")
    assert_frames_match(got, exp)


def test_inner_join_with_residual():
    left, right = _dfs(5)
    got = _run(
        scan("l").join(
            scan("r"), ["k"], ["rk"], residual=col("lv") > col("rv")
        ),
        {"l": left, "r": right},
    )
    exp = left.merge(right, left_on="k", right_on="rk")
    exp = exp[exp["lv"] > exp["rv"]]
    assert_frames_match(got, exp)


def test_semi_join_with_residual():
    left, right = _dfs(6)
    got = _run(
        scan("l").join(
            scan("r"), ["k"], ["rk"], how="left_semi",
            residual=col("rv") > col("lv"),
        ),
        {"l": left, "r": right},
    )
    # semi keeps each left row with >=1 match satisfying the residual
    m = left.reset_index().merge(right, left_on="k", right_on="rk")
    keep_idx = m[m["rv"] > m["lv"]]["index"].unique()
    exp_rows = left.loc[sorted(keep_idx)]
    assert_frames_match(got, exp_rows)


def test_anti_join_with_residual():
    left, right = _dfs(7)
    got = _run(
        scan("l").join(
            scan("r"), ["k"], ["rk"], how="left_anti",
            residual=col("rv") > col("lv"),
        ),
        {"l": left, "r": right},
    )
    m = left.merge(right.reset_index(), left_on="k", right_on="rk")
    # a left row survives iff NO matching right row satisfies the residual
    bad_left = set()
    for _, row in m.iterrows():
        if row["rv"] > row["lv"]:
            bad_left.add((row["k"], row["lv"]))
    exp = left[~left.apply(lambda r: (r["k"], r["lv"]) in bad_left, axis=1)]
    assert_frames_match(got, exp)


def test_negative_keys_are_handled():
    left = pd.DataFrame({"k": np.array([-5, -1, 3], dtype=np.int64), "v": [1, 2, 3]})
    right = pd.DataFrame({"rk": np.array([-1, 3, 7], dtype=np.int64), "w": [9, 8, 7]})
    got = _run(scan("l").join(scan("r"), ["k"], ["rk"]), {"l": left, "r": right})
    exp = left.merge(right, left_on="k", right_on="rk")
    assert_frames_match(got, exp)


def test_huge_sparse_keys_densify():
    g = np.random.default_rng(8)
    left = pd.DataFrame({"k": g.integers(0, 2**40, 50), "v": g.random(50)})
    left.loc[:4, "k"] = 12345678901234
    right = pd.DataFrame({"rk": np.array([12345678901234] * 3), "w": [1.0, 2.0, 3.0]})
    got = _run(scan("l").join(scan("r"), ["k"], ["rk"]), {"l": left, "r": right})
    exp = left.merge(right, left_on="k", right_on="rk")
    assert_frames_match(got, exp)


def test_float_keys_join():
    left = pd.DataFrame({"k": [0.5, 1.5, 2.5], "v": [1, 2, 3]})
    right = pd.DataFrame({"rk": [1.5, 2.5], "w": [8, 9]})
    got = _run(scan("l").join(scan("r"), ["k"], ["rk"]), {"l": left, "r": right})
    exp = left.merge(right, left_on="k", right_on="rk")
    assert_frames_match(got, exp)

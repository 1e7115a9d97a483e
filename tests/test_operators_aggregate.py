"""Aggregation (Algorithm 3) vs pandas groupby ground truth."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.compiler import compile_plan
from repro.core.expr import Agg, col, lit
from repro.frontends.builder import scan
from tests.helpers import assert_frames_match, rand_df


def _run(plan, tables, mode="torch"):
    return compile_plan(plan, mode).run(tables)


@pytest.mark.parametrize("mode", ["torch", "jit"])
def test_grouped_sum_count(mode):
    pdf = rand_df(200)
    got = _run(
        scan("t").aggregate(
            ["k"], {"s": Agg("sum", col("v")), "c": Agg("count_star")}
        ),
        {"t": pdf},
        mode,
    )
    exp = pdf.groupby("k", as_index=False).agg(s=("v", "sum"), c=("v", "size"))
    assert_frames_match(got, exp)


def test_grouped_min_max_avg():
    pdf = rand_df(150, 1)
    got = _run(
        scan("t").aggregate(
            ["k"],
            {
                "mn": Agg("min", col("v")),
                "mx": Agg("max", col("v")),
                "av": Agg("avg", col("v")),
            },
        ),
        {"t": pdf},
    )
    exp = pdf.groupby("k", as_index=False).agg(
        mn=("v", "min"), mx=("v", "max"), av=("v", "mean")
    )
    assert_frames_match(got, exp)


def test_group_by_string_key():
    pdf = rand_df(120, 2)
    got = _run(
        scan("t").aggregate(["s"], {"c": Agg("count_star")}), {"t": pdf}
    )
    exp = pdf.groupby("s", as_index=False).agg(c=("v", "size"))
    assert_frames_match(got, exp)


def test_group_by_multiple_keys_incl_date():
    pdf = rand_df(150, 3)
    got = _run(
        scan("t").aggregate(["k", "s", "d"], {"s2": Agg("sum", col("v"))}),
        {"t": pdf},
    )
    exp = pdf.groupby(["k", "s", "d"], as_index=False).agg(s2=("v", "sum"))
    assert_frames_match(got, exp)


def test_group_by_float_key():
    pdf = pd.DataFrame({"k": [0.5, 0.5, 1.5], "v": [1.0, 2.0, 3.0]})
    got = _run(scan("t").aggregate(["k"], {"s": Agg("sum", col("v"))}), {"t": pdf})
    exp = pdf.groupby("k", as_index=False).agg(s=("v", "sum"))
    assert_frames_match(got, exp)


def test_aggregate_expression_input():
    pdf = rand_df(80, 4)
    got = _run(
        scan("t").aggregate(
            ["k"], {"s": Agg("sum", col("v") * (lit(1.0) - lit(0.1)))}
        ),
        {"t": pdf},
    )
    exp = pdf.assign(vv=pdf.v * 0.9).groupby("k", as_index=False).agg(s=("vv", "sum"))
    assert_frames_match(got, exp)


def test_count_distinct():
    pdf = rand_df(200, 5)
    got = _run(
        scan("t").aggregate(["s"], {"dk": Agg("count_distinct", col("k"))}),
        {"t": pdf},
    )
    exp = pdf.groupby("s", as_index=False).agg(dk=("k", "nunique"))
    assert_frames_match(got, exp)


def test_count_distinct_strings():
    pdf = rand_df(200, 6)
    got = _run(
        scan("t").aggregate(["k"], {"ds": Agg("count_distinct", col("s"))}),
        {"t": pdf},
    )
    exp = pdf.groupby("k", as_index=False).agg(ds=("s", "nunique"))
    assert_frames_match(got, exp)


def test_global_aggregates():
    pdf = rand_df(60, 7)
    got = _run(
        scan("t").aggregate(
            [],
            {
                "s": Agg("sum", col("v")),
                "c": Agg("count_star"),
                "mn": Agg("min", col("v")),
                "mx": Agg("max", col("v")),
                "av": Agg("avg", col("v")),
                "dk": Agg("count_distinct", col("k")),
            },
        ),
        {"t": pdf},
    )
    assert len(got) == 1
    assert got["c"][0] == len(pdf)
    assert got["s"][0] == pytest.approx(pdf.v.sum())
    assert got["mn"][0] == pytest.approx(pdf.v.min())
    assert got["mx"][0] == pytest.approx(pdf.v.max())
    assert got["av"][0] == pytest.approx(pdf.v.mean())
    assert got["dk"][0] == pdf.k.nunique()


def test_global_aggregate_empty_input_sql_nulls():
    pdf = rand_df(10, 8).iloc[0:0]
    got = _run(
        scan("t").aggregate(
            [], {"s": Agg("sum", col("v")), "c": Agg("count_star")}
        ),
        {"t": pdf},
    )
    assert len(got) == 1
    assert got["c"][0] == 0
    assert np.isnan(got["s"][0])  # SQL: SUM over empty = NULL


def test_grouped_empty_input():
    pdf = rand_df(10, 9).iloc[0:0]
    got = _run(
        scan("t").aggregate(["k"], {"s": Agg("sum", col("v"))}), {"t": pdf}
    )
    assert len(got) == 0


def test_count_respects_null_mask_via_outer_join():
    left = pd.DataFrame({"k": [1, 2, 3]})
    right = pd.DataFrame({"rk": [1, 1], "w": [5.0, 6.0]})
    plan = (
        scan("l")
        .join(scan("r"), ["k"], ["rk"], how="left_outer")
        .aggregate(["k"], {"c": Agg("count", col("w"))})
    )
    got = _run(plan, {"l": left, "r": right})
    exp = pd.DataFrame({"k": [1, 2, 3], "c": [2, 0, 0]})
    assert_frames_match(got, exp)


def test_distinct_via_key_only_aggregate():
    pdf = rand_df(100, 10)
    got = _run(scan("t").aggregate(["s"], {}), {"t": pdf})
    exp = pdf[["s"]].drop_duplicates()
    assert_frames_match(got, exp)


@settings(max_examples=30, deadline=None)
@given(
    st.lists(
        st.tuples(st.integers(0, 5), st.floats(-100, 100, allow_nan=False)),
        min_size=1,
        max_size=60,
    )
)
def test_grouped_sum_property(rows):
    pdf = pd.DataFrame(rows, columns=["k", "v"])
    got = _run(scan("t").aggregate(["k"], {"s": Agg("sum", col("v"))}), {"t": pdf})
    exp = pdf.groupby("k", as_index=False).agg(s=("v", "sum"))
    assert_frames_match(got, exp)

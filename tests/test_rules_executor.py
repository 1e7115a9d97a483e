"""Canonicalization/optimization rules (§4.2.3) and executor GC (§4.2.5)."""
import numpy as np
import pandas as pd

from repro.core.compiler import CompiledQuery, compile_plan
from repro.core.expr import Agg, col
from repro.core.ir import topo_order
from repro.core.rules import merge_filters, prune_columns
from repro.frontends.builder import scan
from tests.helpers import assert_frames_match, rand_df


def test_merge_filters_collapses_stack():
    p = scan("t").filter(col("v") > 1).filter(col("v") < 5).filter(col("k") == 2)
    root = p.node
    merge_filters(root)
    aliases = [n.alias for n in topo_order(root)]
    assert aliases.count("filter") == 1


def test_merged_filter_is_correct():
    pdf = rand_df(100)
    p = scan("t").filter(col("v") > 20).filter(col("v") < 80).select("k", "v")
    got = compile_plan(p).run({"t": pdf})
    exp = pdf[(pdf.v > 20) & (pdf.v < 80)][["k", "v"]]
    assert_frames_match(got, exp)


def test_prune_columns_narrows_scan():
    p = scan("t").filter(col("v") > 1).project(out=col("k") + col("v"))
    root = p.node
    prune_columns(root)
    scan_node = [n for n in topo_order(root) if n.alias == "scan"][0]
    assert scan_node.params["columns"] == ["k", "v"]


def test_prune_keeps_join_and_residual_keys():
    p = scan("l").join(scan("r"), ["k"], ["rk"], residual=col("a") > col("b"))
    p = p.project(out=col("x"))
    prune_columns(p.node)
    scans = [n for n in topo_order(p.node) if n.alias == "scan"]
    for s in scans:
        cols = set(s.params["columns"])
        assert {"a", "b", "x"} & cols or {"k", "rk"} & cols


def test_pruned_query_still_correct():
    pdf = rand_df(120, 3)
    p = (
        scan("t")
        .filter(col("s") == "aa")
        .aggregate(["k"], {"s2": Agg("sum", col("v"))})
    )
    got = compile_plan(p).run({"t": pdf})
    exp = pdf[pdf.s == "aa"].groupby("k", as_index=False).agg(s2=("v", "sum"))
    assert_frames_match(got, exp)


def test_dag_sharing_executes_shared_node_once():
    """A node consumed by two parents (Q2/Q11 pattern) runs once."""
    pdf = rand_df(50, 5)
    base = scan("t").filter(col("v") > 10)
    total = base.aggregate([], {"s": Agg("sum", col("v"))})
    p = base.filter(col("v") > total.scalar("s") * 0.001).select("k", "v")
    cq = CompiledQuery(p.node)
    aliases = [n.alias for n in cq.executor.order]
    # shared filter node appears exactly once in the topological order
    assert aliases.count("filter") == 2  # base filter + scalar filter
    got = cq.run({"t": pdf})
    sub = pdf[pdf.v > 10]
    exp = sub[sub.v > sub.v.sum() * 0.001][["k", "v"]]
    assert_frames_match(got, exp)


def test_scalar_dep_survives_gc():
    """GC must keep scalar-subquery outputs alive until consumed."""
    pdf = rand_df(80, 6)
    avg = scan("t").aggregate([], {"a": Agg("avg", col("v"))})
    p = scan("t").filter(col("v") > avg.scalar("a")).select("v")
    got = compile_plan(p).run({"t": pdf})
    exp = pdf[pdf.v > pdf.v.mean()][["v"]]
    assert_frames_match(got, exp)


def test_executor_gc_frees_intermediates():
    pdf = rand_df(30, 7)
    p = scan("t").filter(col("v") > 0).select("k").aggregate(["k"], {})
    cq = CompiledQuery(p.node)
    tables = cq.convert({"t": pdf})
    ctx_out = cq.executor.execute(tables)
    assert ctx_out is not None  # executed to completion with GC enabled


def test_scan_column_union_across_scans():
    p1 = scan("t").project(a=col("x"))
    p2 = scan("t").project(b=col("y"))
    j = p1.join(p2, ["a"], ["b"])
    cq = CompiledQuery(j.node)
    need = cq.executor.scan_columns()
    assert set(need["t"]) == {"x", "y"}

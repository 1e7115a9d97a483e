"""Pluggable frontends producing TQP IR (DC4, §4.2.2).

The paper's prototype parses Spark SQL physical plans from JSON; this
reproduction's frontend is a relational plan *builder* that emits the
same IR directly (the hand-written TPC-H plans in
:mod:`repro.tpch.plans` mirror the physical plans Spark's optimizer
produces: join orders, decorrelated subqueries, pushed-down filters).
"""
from repro.frontends.builder import Plan, scan  # noqa: F401

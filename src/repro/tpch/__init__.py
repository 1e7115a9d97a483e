"""TPC-H workload for the TQP reproduction.

- :mod:`repro.tpch.datagen` — full 8-table synthetic TPC-H at a scale
  factor (dbgen value domains, consistent foreign keys),
- :mod:`repro.tpch.sqls` — reference SQL for all 22 queries (runs on
  both DuckDB and Spark SQL),
- :mod:`repro.tpch.plans` — hand-written TQP physical plans for all 22
  queries (mirroring Spark's optimized plans, subqueries decorrelated),
- :mod:`repro.tpch.handopt` — hand-optimized plans + fused TVM-style
  kernels for the §6.6 / Table 3 / Table 4 experiments.
"""

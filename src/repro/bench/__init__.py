"""Benchmark harness for the evaluation tables (§6).

- :mod:`repro.bench.harness` — warmup/median timing (paper protocol:
  10 runs, first 5 warm-up, median of the rest — scaled down via env),
- :mod:`repro.bench.baselines` — DuckDB and Spark SQL runners,
- :mod:`repro.bench.loc` — cloc-style LOC counting (Table 5),
- :mod:`repro.bench.paper` — the paper's published numbers,
- :mod:`repro.bench.tables` — builders that produce each table's rows.
"""

"""Baseline system runners: DuckDB (vectorized CPU) and Spark SQL.

BlazingSQL and OmnisciDB are GPU-only products that cannot run in this
container; their columns in Table 2 are the paper's published numbers
(see :mod:`repro.bench.paper`).
"""
from __future__ import annotations

import duckdb
import pandas as pd


class DuckDBRunner:
    """DuckDB over registered pandas tables with a fixed thread count."""

    def __init__(self, tables: dict[str, pd.DataFrame], threads: int = 1):
        import os

        if threads <= 0:  # 0 = all cores
            threads = os.cpu_count() or 1
        self.con = duckdb.connect()
        self.con.execute(f"SET threads TO {threads}")
        for name, pdf in tables.items():
            self.con.register(name, pdf)

    def run(self, sql: str) -> pd.DataFrame:
        return self.con.execute(sql).fetchdf()

    def runner(self, sql: str):
        return lambda: self.run(sql)


class SparkRunner:
    """Spark SQL over cached temp views of the same pandas tables."""

    def __init__(self, spark, tables: dict[str, pd.DataFrame]):
        self.spark = spark
        for name, pdf in tables.items():
            df = spark.createDataFrame(pdf)
            df.createOrReplaceTempView(name)
            spark.catalog.cacheTable(name)
            df.count()  # materialize the cache up front (paper does too)

    def run(self, sql: str):
        return self.spark.sql(sql).collect()

    def runner(self, sql: str):
        return lambda: self.run(sql)

    def close(self) -> None:
        self.spark.catalog.clearCache()

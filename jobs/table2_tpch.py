"""Reproduce Table 2: full TPC-H — Spark, DuckDB, TQP/TQPJ + simulated GPU.

Usage: spark-submit jobs/table2_tpch.py [--sf 0.1] [--no-spark] [--queries 1,6,14]
"""
import argparse

from pyspark.sql import SparkSession

from repro.bench.harness import fmt_table
from repro.bench.tables import table2


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.1)
    ap.add_argument("--no-spark", action="store_true",
                    help="skip the Spark baseline column")
    ap.add_argument("--queries", type=str, default=None,
                    help="comma-separated query numbers (default: all 22)")
    args = ap.parse_args()
    spark = None
    if not args.no_spark:
        spark = (
            SparkSession.builder.appName("tqp-table2")
            .config("spark.sql.execution.arrow.pyspark.enabled", "true")
            .config("spark.sql.autoBroadcastJoinThreshold", -1)
            .getOrCreate()
        )
    queries = (
        [int(x) for x in args.queries.split(",")] if args.queries else None
    )
    headers, rows = table2(args.sf, spark=spark, queries=queries)
    print(f"Table 2 (TPC-H SF={args.sf}; paper columns are SF1; "
          "GPU columns simulated on the gpu-p100 profile, SF1-equivalent)")
    print(fmt_table(headers, rows))
    if spark is not None:
        spark.stop()


if __name__ == "__main__":
    main()

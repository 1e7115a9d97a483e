"""Reproduce Table 1: bitmap vs Python-control-flow filter.

Usage: python jobs/table1_filter_micro.py [--sf 0.1]
(No Spark needed — this is a pure tensor-layer microbenchmark.)
"""
import argparse

from repro.bench.harness import fmt_table
from repro.bench.tables import table1


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.1)
    args = ap.parse_args()
    headers, rows = table1(args.sf)
    print(f"Table 1 (filter over lineitem.l_quantity, SF={args.sf}; "
          "paper columns are SF1/~6M rows; GPU columns simulated)")
    print(fmt_table(headers, rows))


if __name__ == "__main__":
    main()

"""Reproduce Table 3: hand-optimized tensor programs for Q1/Q6/Q9/Q14.

Usage: python jobs/table3_handopt.py [--sf 0.1]
"""
import argparse

from repro.bench.harness import fmt_table
from repro.bench.tables import table3


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.1)
    args = ap.parse_args()
    headers, rows = table3(args.sf)
    print(f"Table 3 (hand-optimized plans, SF={args.sf}; paper columns are "
          "SF10; gpu_sim = gpu-p100 profile at SF10-equivalent)")
    print(fmt_table(headers, rows))


if __name__ == "__main__":
    main()

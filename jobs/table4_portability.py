"""Reproduce Table 4: Q6 (hand-opt) across hardware/software backends.

All backends are priced by the analytic device model over the real op
trace of the executed program (no accelerator exists in this container).

Usage: python jobs/table4_portability.py [--sf 0.1]
"""
import argparse

from repro.bench.harness import fmt_table
from repro.bench.tables import table4


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.1)
    args = ap.parse_args()
    headers, rows = table4(args.sf)
    print(f"Table 4 (TPC-H Q6 hand-opt portability; simulated, "
          f"SF1-equivalent from an SF={args.sf} trace; paper is SF1, ms)")
    print(fmt_table(headers, rows))


if __name__ == "__main__":
    main()

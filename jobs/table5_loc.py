"""Reproduce Table 5: lines of code per relational operator.

Our operators are counted with the cloc-style counter; baseline systems
cannot be counted here (sources not vendored), so their rows carry the
paper's published numbers.

Usage: python jobs/table5_loc.py
"""
from repro.bench.harness import fmt_table
from repro.bench.tables import table5


def main() -> None:
    headers, rows = table5()
    print("Table 5 (lines of source code per relational operator)")
    print(fmt_table(headers, rows))


if __name__ == "__main__":
    main()

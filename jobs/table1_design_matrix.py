"""Table I — fault-tolerance design-choice matrix, derived from the
engine's mode flags.

Run: spark-submit jobs/table1_design_matrix.py
"""
import sys

sys.path.insert(0, ".")

from repro.harness.experiments import format_rows, table1_rows  # noqa: E402


def main():
    rows = table1_rows()
    print(format_rows(rows, "Table I — FT design choices per system"))
    return rows


if __name__ == "__main__":
    main()

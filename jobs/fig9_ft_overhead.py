"""Fig 9 — fault tolerance overhead ratios.

Run: spark-submit jobs/fig9_ft_overhead.py [--sf 0.1]
(The engine itself is Spark-free; Spark only hosts the session.)
"""
import sys

sys.path.insert(0, ".")

from jobs._common import make_harness, parse_args, show  # noqa: E402


def main(harness):
    rows = harness.fig9_rows(workers=[4, 16])
    show(rows, "Fig 9 — fault tolerance overhead ratios")
    return rows


if __name__ == "__main__":
    main(make_harness(parse_args(__doc__)))

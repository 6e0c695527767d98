"""Fig 10 — fault recovery at 16 workers: (a) kill one worker at 50% of
each representative query; (b) Q9 killed at varying points.

Run: spark-submit jobs/fig10_recovery.py [--sf 0.1]
"""
import sys

sys.path.insert(0, ".")

from jobs._common import make_harness, parse_args, show  # noqa: E402


def main(harness):
    a = harness.recovery_rows(16, frac=0.5)
    show(a, "Fig 10a — kill 1/16 workers at 50% (overhead ratios)")
    b = harness.fig10b_rows(16, "q9")
    show(b, "Fig 10b — Q9, kill at varying points")
    return a + b


if __name__ == "__main__":
    main(make_harness(parse_args(__doc__)))

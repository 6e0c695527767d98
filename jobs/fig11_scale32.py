"""Fig 11 — 32-worker scalability: (a) normal execution vs SparkSQL-sim
and Trino-with-FT; (b) recovery overhead with one worker killed at 50%.

Run: spark-submit jobs/fig11_scale32.py [--sf 0.1]
"""
import sys

sys.path.insert(0, ".")

from jobs._common import make_harness, parse_args, show  # noqa: E402


def main(harness):
    a = harness.fig6_rows(workers=[32])
    show(a, "Fig 11a — 32 workers, normal execution (simulated s)")
    b = harness.recovery_rows(32, frac=0.5)
    show(b, "Fig 11b — 32 workers, kill at 50% (overhead ratios)")
    return a + b


if __name__ == "__main__":
    main(make_harness(parse_args(__doc__)))

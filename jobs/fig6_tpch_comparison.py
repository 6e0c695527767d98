"""Fig 6: Quokka vs Trino-with-FT vs SparkSQL on TPC-H-lite, 4 & 16
workers (simulated time), plus measured wall times on real SparkSQL.

Run: spark-submit jobs/fig6_tpch_comparison.py [--sf 0.1]
"""
import sys

sys.path.insert(0, ".")  # allow running uninstalled from the repo root

from jobs._common import build_session, make_harness, parse_args, show  # noqa: E402
from repro.harness.sparkreal import real_sparksql_rows  # noqa: E402


def main(spark, harness):
    rows = harness.fig6_rows(workers=[4, 16])
    show(rows, "Fig 6 — normal execution (simulated seconds)")
    real = real_sparksql_rows(spark, harness)
    show(real, "Fig 6 (aux) — same SQL on the real local SparkSQL, wall s")
    return rows


if __name__ == "__main__":
    args = parse_args(__doc__)
    spark = build_session("fig6")
    main(spark, make_harness(args))
    spark.stop()

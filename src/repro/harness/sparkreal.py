"""Measured real-SparkSQL wall times for the Fig 6 exhibit.

The simulated-time comparison (Harness.fig6_rows) carries the paper's
shape; this module adds an honesty column: the same SQL, run end-to-end
on the real local SparkSession over the same data, wall-clock seconds.
Absolute values are not comparable to simulated seconds (one local JVM
vs a simulated 16-node cluster) — they demonstrate that the baseline is
real and the SQL is identical.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from ..queries.tpch import QUERIES
from ..sparkbridge.sparksql import register_views, time_query
from .experiments import Harness


def real_sparksql_rows(
    spark: SparkSession, harness: Harness, queries=None, reps: int = 2
) -> list[dict]:
    queries = queries or list(QUERIES)
    register_views(spark, harness.db)
    rows = []
    for q in queries:
        rows.append(
            {"query": q, "sparksql_real_wall_s": time_query(spark, q, reps=reps)}
        )
    return rows

"""Real SparkSQL baseline: run the shared query SQL through Catalyst.

The paper benchmarks Quokka against SparkSQL 3.3 on EMR; here the same
query texts run on the real local SparkSession over the same synthetic
tables the engine and the DuckDB oracle see, so all three systems are
provably computing the same queries. Used for (a) correctness tests and
(b) the measured-wall-time column of the Fig 6 reproduction.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..queries.tpch import QUERIES


def register_views(spark: SparkSession, db: dict[str, pd.DataFrame]) -> None:
    """Create one temp view per TPC-H-lite table from pandas frames."""
    for name, pdf in db.items():
        spark.createDataFrame(pdf).createOrReplaceTempView(name)


def run_query(spark: SparkSession, qname: str) -> DataFrame:
    """Run a registered query's SQL on SparkSQL (views must exist)."""
    return spark.sql(QUERIES[qname].sql)


def time_query(spark: SparkSession, qname: str, *, reps: int = 1) -> float:
    """Mean wall-clock seconds to fully execute (collect) the query."""
    times = []
    for _ in range(reps):
        t0 = time.perf_counter()
        spark.sql(QUERIES[qname].sql).collect()
        times.append(time.perf_counter() - t0)
    return sum(times) / len(times)

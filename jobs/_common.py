"""Shared scaffolding for the spark-submit job entrypoints.

Each job exposes ``main(spark) -> list[dict]`` and can be launched with
``spark-submit jobs/<name>.py`` (or plain ``python jobs/<name>.py``; the
engine itself is Spark-free, Spark is used for data/baseline work).
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession

from repro.harness.configs import BENCH_INPUT_BATCHES, BENCH_SF
from repro.harness.experiments import Harness, format_rows


def build_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def parse_args(desc: str) -> argparse.Namespace:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--sf", type=float, default=BENCH_SF,
                   help="scale factor (default: benchmark SF)")
    p.add_argument("--batches", type=int, default=BENCH_INPUT_BATCHES,
                   help="input row-group count per table")
    p.add_argument("--no-oracle", action="store_true",
                   help="skip DuckDB result checks (faster)")
    return p.parse_args()


def make_harness(args: argparse.Namespace) -> Harness:
    return Harness(
        sf=args.sf, input_batches=args.batches,
        check_oracle=not args.no_oracle,
    )


def show(rows: list[dict], title: str) -> None:
    print(format_rows(rows, title))

"""Shared spark-submit plumbing for the job entrypoints."""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession

from repro.eval.experiments import (
    BENCH_ROWS_SCALE,
    BENCH_SIZE_SCALE,
    ExperimentContext,
)


def make_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def base_parser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--rows-scale", type=float, default=BENCH_ROWS_SCALE)
    p.add_argument("--size-scale", type=float, default=BENCH_SIZE_SCALE)
    p.add_argument("--max-queries", type=int, default=30)
    return p


def make_context(app: str, args: argparse.Namespace) -> ExperimentContext:
    spark = make_spark(app)
    spark.sparkContext.setLogLevel("ERROR")
    return ExperimentContext(
        spark=spark, rows_scale=args.rows_scale, size_scale=args.size_scale
    )

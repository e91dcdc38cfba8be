"""Shared plumbing for the spark-submit job entrypoints.

Each job is a thin wrapper: build (or reuse) a SparkSession, synthesise
the SNCB stream for the query, run the query transform, print a result
sample. The transforms themselves live in ``repro.core.queries`` so the
same code runs under pytest and spark-submit.
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def stream_args(description: str) -> argparse.Namespace:
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--duration-s", type=float, default=3600.0,
                   help="simulated stream length in seconds")
    p.add_argument("--dt", type=float, default=1.0,
                   help="sensor sampling period in seconds")
    p.add_argument("--seed", type=int, default=0)
    p.add_argument("--show", type=int, default=20, help="rows to print")
    return p.parse_args()


def run_job(qid: str, transform_builder, events_builder, description: str) -> None:
    """Generic job body: build stream → run query → print results."""
    args = stream_args(description)
    spark = get_spark(f"nebulameos-{qid}")
    pdf = events_builder(duration_s=args.duration_s, dt=args.dt, seed=args.seed)
    df = spark.createDataFrame(pdf)
    out = transform_builder(spark)(df)
    n = out.count()
    print(f"[{qid}] input events: {len(pdf):,}  result rows: {n:,}")
    out.show(args.show, truncate=False)
    spark.stop()

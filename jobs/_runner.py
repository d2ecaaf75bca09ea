"""Shared spark-submit entrypoint plumbing for the table jobs.

Each job builds (or reuses) a SparkSession, runs one table harness, and
prints the paper-vs-measured rows. Usage:

    spark-submit jobs/table3_line_by_line.py [--scale quick|bench]
"""
from __future__ import annotations

import argparse
import sys

from pyspark.sql import SparkSession


def main(title: str, run_fn, render_fn) -> None:
    parser = argparse.ArgumentParser(description=title)
    parser.add_argument("--scale", choices=["quick", "bench"], default="bench")
    parser.add_argument("--seed", type=int, default=0)
    args = parser.parse_args()
    spark = (
        SparkSession.builder.appName(title)
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    rows = run_fn(spark, scale=args.scale, seed=args.seed)
    print(f"\n== {title} (scale={args.scale}) ==", file=sys.stdout)
    print(render_fn(rows))
    spark.stop()

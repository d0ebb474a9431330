"""Shared spark-submit plumbing for the table jobs."""
from __future__ import annotations

import argparse
import os
import sys

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def run_job(name: str, runner) -> None:
    """Parse --scale/--out, run the table, print + optionally save it."""
    p = argparse.ArgumentParser(description=f"Reproduce paper {name}")
    p.add_argument("--scale", default="bench", choices=["test", "bench"])
    p.add_argument("--out", default=None, help="write the markdown table here")
    args = p.parse_args()
    spark = get_spark(name)
    try:
        md, _ = runner(spark, scale=args.scale)
    finally:
        spark.stop()
    print(f"\n## {name} (scale={args.scale})\n\n{md}\n", file=sys.stdout)
    if args.out:
        os.makedirs(os.path.dirname(args.out) or ".", exist_ok=True)
        with open(args.out, "w") as f:
            f.write(f"## {name} (scale={args.scale})\n\n{md}\n")

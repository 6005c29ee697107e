"""Shared spark-submit scaffolding for the reproduction jobs.

Every job wraps one driver from :mod:`repro.experiments` and can be
launched standalone::

    spark-submit jobs/<name>.py [--out results.csv]

Jobs print the table they reproduce in the paper's row layout and
optionally persist it as CSV so EXPERIMENTS.md numbers are regenerable.
"""
from __future__ import annotations

import argparse
import os


def job_session(app: str):
    """SparkSession for standalone job runs (pytest uses the fixture)."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 16g "
        "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false "
        "pyspark-shell",
    )
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark


def run_cli(run_fn, app: str) -> None:
    """Parse --out, run the driver, optionally write CSV."""
    parser = argparse.ArgumentParser(description=run_fn.__module__)
    parser.add_argument("--out", default=None, help="optional CSV output path")
    args, _ = parser.parse_known_args()
    spark = job_session(app)
    try:
        df = run_fn(spark)
        if args.out:
            df.to_csv(args.out, index=False)
            print(f"wrote {args.out}")
    finally:
        spark.stop()

"""Shared helpers for the spark-submit entrypoints.

Each jobs/tableN_*.py builds a local SparkSession, runs the matching
harness from repro.eval.experiments at the requested scale, and prints
the table rows the paper reports.
"""
import argparse
import os
import sys


def get_spark(app: str):
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "16"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark


def parse_args(desc: str) -> argparse.Namespace:
    ap = argparse.ArgumentParser(description=desc)
    ap.add_argument("--scale", type=float, default=1.0, help="dataset scale factor")
    ap.add_argument("--seed", type=int, default=0)
    return ap.parse_args()


def emit(df, title: str) -> None:
    print(f"\n== {title} ==", file=sys.stderr)
    print(df.to_string(index=False))

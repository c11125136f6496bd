"""Shared spark-submit plumbing for the jobs/ entrypoints."""
from __future__ import annotations

import argparse
import os
import sys


def get_spark(app: str):
    """SparkSession for spark-submit / direct `python jobs/x.py` runs."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def scale_arg(default: float = 1.0) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser()
    p.add_argument("--scale", type=float, default=default,
                   help="dataset scale factor (1.0 = benchmark size)")
    return p

"""Shared spark-submit plumbing for the experiment jobs.

Each ``jobs/<name>.py`` wraps a function from
:mod:`repro.harness.experiments`; run them with ``spark-submit`` or plain
``python`` (a local session is created either way).
"""
from __future__ import annotations

import os
import sys

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def main_for(exp_name: str) -> None:
    """Run one experiment by name and print its markdown table."""
    from repro.harness.experiments import ALL_EXPERIMENTS
    from repro.harness.reporting import to_markdown

    spark = get_spark(exp_name)
    try:
        points = ALL_EXPERIMENTS[exp_name](spark)
        print(to_markdown(points, exp_name))
    finally:
        spark.stop()
    sys.stdout.flush()

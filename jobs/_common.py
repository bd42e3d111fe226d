"""Shared spark-submit plumbing for the job entrypoints.

Jobs create their own session (tests use the ``spark`` fixture from
conftest.py instead) with the same configuration: local[*], Arrow on,
auto-broadcast off (GBDA's query-side broadcast uses an explicit hint).
Each job writes its table to ``results/<name>.csv`` and prints it.
"""
from __future__ import annotations

import os
import sys

import pandas as pd


def get_spark(app: str):
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName(app)
        .config("spark.ui.showConsoleProgress", "false")
        # Latency-oriented: the evaluation datasets aggregate at most a
        # few hundred thousand rows, so 64 shuffle partitions would be
        # pure task-scheduling overhead in the per-query timings.
        .config("spark.sql.shuffle.partitions", "16")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def emit(name: str, df: pd.DataFrame) -> None:
    """Print the table and persist it under results/."""
    out_dir = os.path.join(os.path.dirname(os.path.dirname(os.path.abspath(__file__))), "results")
    os.makedirs(out_dir, exist_ok=True)
    path = os.path.join(out_dir, f"{name}.csv")
    df.to_csv(path, index=False)
    print(f"== {name} ==", file=sys.stderr)
    print(df.to_string(index=False))
    print(f"[saved {path}]", file=sys.stderr)

"""Shared plumbing for job entrypoints.

Jobs are spark-submit-able scripts: each wraps a harness function that
takes a SparkSession, and writes its markdown table under ``results/``.
"""
from __future__ import annotations

import os
import sys
from pathlib import Path

from pyspark.sql import SparkSession

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"


def get_spark(app: str) -> SparkSession:
    """Session with the same local-mode settings as the test fixture."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '16g')} "
        "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false pyspark-shell",
    )
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def write_result(name: str, text: str) -> Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    path = RESULTS_DIR / name
    path.write_text(text)
    print(f"\n=== {name} ===\n{text}\nwritten to {path}", file=sys.stderr)
    return path

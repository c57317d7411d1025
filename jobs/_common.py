"""Shared spark-submit plumbing for the table jobs."""
from __future__ import annotations

import json
import os
import pathlib

# Driver memory must be fixed before the JVM launches (same reasoning as
# conftest.py); harmless when running under spark-submit, essential for
# a bare `python jobs/<name>.py`.
os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
    f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
    "--conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)

from pyspark.sql import SparkSession  # noqa: E402

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "results"


def get_spark(app: str) -> SparkSession:
    """Session for standalone runs; mirrors the conftest fixture config."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def dump(name: str, rows) -> pathlib.Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    path = RESULTS_DIR / f"{name}.json"
    path.write_text(json.dumps(rows, indent=2, default=str))
    return path

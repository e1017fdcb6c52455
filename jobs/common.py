"""Shared session/bootstrap for the spark-submit entrypoints.

Jobs are standalone (no pytest), so they build their own local session with
the same settings as the ``spark`` fixture in conftest.py. Each job is a thin
wrapper around a function taking a SparkSession, per the repo convention.
"""
from __future__ import annotations

import os
import sys
from pathlib import Path

# spark.driver.memory is read at JVM launch, not from SparkConf — it must be
# in PYSPARK_SUBMIT_ARGS before pyspark is imported (same trick as conftest).
os.environ.setdefault("SPARK_DRIVER_MEM", "24g")
os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
    f"--driver-memory {os.environ['SPARK_DRIVER_MEM']} "
    "--conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false "
    "pyspark-shell",
)

from pyspark.sql import SparkSession  # noqa: E402

RESULTS_DIR = Path(os.environ.get("REPRO_RESULTS_DIR",
                                  Path(__file__).resolve().parent.parent / "results"))


def build_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions",
                os.environ.get("REPRO_SHUFFLE_PARTITIONS", "16"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.execution.arrow.maxRecordsPerBatch", "8192")
        .config("spark.sql.adaptive.enabled", "false")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def emit(name: str, text: str) -> None:
    """Print a report and persist it under results/."""
    RESULTS_DIR.mkdir(parents=True, exist_ok=True)
    path = RESULTS_DIR / f"{name}.md"
    path.write_text(text)
    print(text)
    print(f"[written] {path}", file=sys.stderr)

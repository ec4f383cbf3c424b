"""Shared plumbing for the table-reproduction jobs.

Jobs are ``spark-submit``-able scripts; each wraps functions that take a
SparkSession (so tests and benchmarks reuse them) and prints the paper
table it reproduces, writing machine-readable results to ``results/``.
"""
import json
import os
import sys
from pathlib import Path

from pyspark.sql import SparkSession

from repro.tuned import TUNED  # noqa: F401  (re-export for job scripts)

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"


def get_spark(app: str) -> SparkSession:
    """Session for standalone job runs (mirrors the conftest fixture)."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '24g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions",
                os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def save_results(name: str, payload) -> Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    path = RESULTS_DIR / f"{name}.json"
    path.write_text(json.dumps(payload, indent=2, default=str))
    print(f"[saved] {path}", file=sys.stderr)
    return path

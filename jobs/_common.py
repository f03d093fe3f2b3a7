"""Shared plumbing for spark-submit job entrypoints."""
from __future__ import annotations

import os
import sys


def get_spark(app: str):
    """SparkSession for jobs (works under spark-submit or plain python)."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.shuffle.partitions", "16")
        .getOrCreate()
    )


def emit(title: str, table: str) -> None:
    print(f"\n=== {title} ===", flush=True)
    print(table, flush=True)


def out_dir() -> str:
    d = os.environ.get("REPRO_RESULTS_DIR", os.path.join(os.path.dirname(__file__), "..", "results"))
    os.makedirs(d, exist_ok=True)
    return d


def save_csv(rows: list[dict], name: str) -> str:
    import csv

    path = os.path.join(out_dir(), name)
    if rows:
        with open(path, "w", newline="") as fh:
            writer = csv.DictWriter(fh, fieldnames=list(rows[0].keys()))
            writer.writeheader()
            writer.writerows(rows)
    print(f"[saved {path}]", file=sys.stderr)
    return path

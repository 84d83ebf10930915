"""Shared plumbing for spark-submit entrypoints.

Each job module exposes ``main(spark, **overrides) -> rows`` (pure: takes a
SparkSession, returns the table rows it printed) and a ``__main__`` block
that builds a local session, runs ``main`` and persists the rows as JSON
under ``results/`` so EXPERIMENTS.md can be regenerated from artifacts.
"""
from __future__ import annotations

import json
import os
import pathlib

from pyspark.sql import SparkSession

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "results"


def build_session(app: str) -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '24g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "32"))
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.showConsoleProgress", "false")
        .getOrCreate()
    )


def save_rows(name: str, rows: list[dict]) -> None:
    RESULTS_DIR.mkdir(exist_ok=True)
    (RESULTS_DIR / f"{name}.json").write_text(json.dumps(rows, indent=2))


def run_cli(name: str, main_fn) -> None:
    spark = build_session(name)
    spark.sparkContext.setLogLevel("ERROR")
    try:
        rows = main_fn(spark)
        save_rows(name, rows)
    finally:
        spark.stop()

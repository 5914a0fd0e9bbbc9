"""Shared plumbing for the spark-submit entrypoints.

Each ``jobs/run_*.py`` builds a session, runs one experiment from
``repro.experiments``, prints the paper-shaped markdown table, and dumps
the raw dict to ``experiments_output/<name>.json``.
"""
from __future__ import annotations

import json
import os
import pathlib

from pyspark.sql import SparkSession


def session(app: str) -> SparkSession:
    """A standalone session for spark-submit runs (tests use conftest's)."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def emit(name: str, result: dict, markdown: str) -> None:
    """Print the table and persist the raw result."""
    out_dir = pathlib.Path(__file__).resolve().parent.parent / "experiments_output"
    out_dir.mkdir(exist_ok=True)
    (out_dir / f"{name}.json").write_text(json.dumps(result, indent=2, default=str))
    print(f"\n== {name} ==")
    print(markdown)
    print(f"[saved to {out_dir / (name + '.json')}]")

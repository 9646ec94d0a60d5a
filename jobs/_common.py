"""Shared plumbing for the spark-submit table jobs."""
from __future__ import annotations

import os
import sys

import pandas as pd

sys.path.insert(0, os.path.dirname(__file__))  # allow `python jobs/x.py`

RESULTS_DIR = os.path.join(os.path.dirname(os.path.dirname(os.path.abspath(__file__))), "results")


def get_spark(app: str):
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def emit(name: str, table: pd.DataFrame) -> None:
    """Print the table and persist it under results/ as csv + markdown."""
    os.makedirs(RESULTS_DIR, exist_ok=True)
    with pd.option_context("display.width", 250, "display.max_columns", 100):
        print(f"\n=== {name} ===")
        print(table.to_string(index=False))
    table.to_csv(os.path.join(RESULTS_DIR, f"{name}.csv"), index=False)
    with open(os.path.join(RESULTS_DIR, f"{name}.md"), "w") as f:
        f.write(_to_markdown(table))


def _to_markdown(t: pd.DataFrame) -> str:
    """Minimal GitHub-markdown table (tabulate is unavailable offline)."""
    cols = [str(c) for c in t.columns]
    lines = ["| " + " | ".join(cols) + " |",
             "|" + "|".join("---" for _ in cols) + "|"]
    for _, row in t.iterrows():
        lines.append("| " + " | ".join(str(v) for v in row) + " |")
    return "\n".join(lines) + "\n"

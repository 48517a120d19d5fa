"""Shared session/bootstrapping for spark-submit entrypoints.

Each job builds its own SparkSession (jobs are standalone processes;
tests instead use the session-scoped ``spark`` fixture) and writes its
result table under ``results/``.
"""
import os
import sys
from pathlib import Path

from pyspark.sql import SparkSession

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"


def get_spark(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def emit(name: str, pdf) -> None:
    """Print the table and persist it as CSV under results/."""
    RESULTS_DIR.mkdir(exist_ok=True)
    out = RESULTS_DIR / f"{name}.csv"
    pdf.to_csv(out, index=False)
    print(pdf.to_string(index=False))
    print(f"[{name}] written to {out}", file=sys.stderr)

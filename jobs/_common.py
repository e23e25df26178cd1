"""Shared helpers for the spark-submit job entrypoints."""
from __future__ import annotations

import os
import sys

from pyspark.sql import SparkSession

# Jobs run standalone under spark-submit (or plain python); tests call
# each job's ``run(spark)`` with the session fixture instead.
sys.path.insert(0, os.path.join(os.path.dirname(__file__), ".."))


def get_spark(app: str) -> SparkSession:
    """Session for standalone job runs, mirroring conftest settings."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def fmt_table(header: list[str], rows: list[list], widths: list[int] | None = None) -> str:
    """Plain fixed-width table formatting for job output."""
    cols = len(header)
    widths = widths or [
        max(len(str(header[c])), *(len(str(r[c])) for r in rows)) if rows else len(str(header[c]))
        for c in range(cols)
    ]
    out = ["  ".join(str(header[c]).ljust(widths[c]) for c in range(cols))]
    for r in rows:
        out.append("  ".join(str(r[c]).ljust(widths[c]) for c in range(cols)))
    return "\n".join(out)

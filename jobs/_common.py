"""Shared session bootstrap for spark-submit entrypoints.

Jobs are thin wrappers over functions in ``repro.experiments`` — they
create (or reuse) a SparkSession, run one experiment, and print the
paper-style table.  Under pytest the session comes from ``conftest.py``
instead; jobs only build their own when run via spark-submit.
"""
from __future__ import annotations

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )

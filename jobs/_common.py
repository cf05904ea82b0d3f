"""Shared plumbing for the spark-submit entrypoints.

Each job exposes ``main(spark, sf=...)`` so tests can drive it with the
session fixture, plus a ``spark-submit jobs/<name>.py [sf]`` CLI.
"""
from __future__ import annotations

import sys

from pyspark.sql import SparkSession


def run_cli(main) -> None:
    """Build a session and invoke ``main(spark, sf)`` (sf = argv[1])."""
    sf = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = (
        SparkSession.builder.appName(main.__module__)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    try:
        main(spark, sf=sf)
    finally:
        spark.stop()

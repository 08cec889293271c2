"""Shared plumbing for the spark-submit table jobs.

Each ``jobs/tableN_*.py`` exposes ``build(spark, scale)`` (returns the
table DataFrame) and a ``main()`` that creates a session mirroring the
conftest fixture configuration, prints the rendered table, and exits.

Run as e.g.::

    spark-submit jobs/table3_single.py --scale bench
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def session(app: str) -> SparkSession:
    """A session matching the conftest fixture's post-launch configs."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def run_table(app: str, build, title: str) -> None:
    """CLI wrapper: parse ``--scale``, build, print, stop."""
    from repro.evalharness.tables import render

    ap = argparse.ArgumentParser(description=title)
    ap.add_argument("--scale", choices=["test", "bench"], default="bench")
    args = ap.parse_args()
    spark = session(app)
    try:
        df = build(spark, args.scale)
        print(render(df, title))
    finally:
        spark.stop()

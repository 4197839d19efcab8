"""Shared plumbing for the spark-submit job entrypoints."""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    """Session for standalone job runs (pytest uses the conftest fixture)."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", 32)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def job_main(title: str, runner, argv: list[str] | None = None) -> None:
    """Parse common flags, run ``runner(spark, datasets)``, print/save."""
    ap = argparse.ArgumentParser(description=title)
    ap.add_argument("--datasets", nargs="*", default=None,
                    help="subset of dataset names (default: the table's set)")
    ap.add_argument("--out", type=Path, default=None,
                    help="also write the table to this file")
    args = ap.parse_args(argv)
    # Reuse an already-active session (pytest) rather than owning a new one.
    owns = SparkSession.getActiveSession() is None
    spark = get_spark(title)
    try:
        from repro.core.tables import format_table

        df = runner(spark, args.datasets)
        text = format_table(df, title)
        print(text)
        if args.out:
            args.out.parent.mkdir(parents=True, exist_ok=True)
            args.out.write_text(text)
    finally:
        if owns:
            spark.stop()
    sys.stdout.flush()

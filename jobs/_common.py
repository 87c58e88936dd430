"""Shared spark-submit plumbing for the table jobs.

Each job builds (or reuses) a local SparkSession configured like the
test fixture in ``conftest.py``, runs one experiment module, and prints
the result table plus the paper claim it reproduces.
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def run_table(module, *, needs_spark: bool = False, app: str = "repro-job") -> None:
    from repro.experiments.harness import format_table

    ap = argparse.ArgumentParser(description=module.__doc__)
    ap.add_argument("--quick", action="store_true", help="small sizes for smoke runs")
    args = ap.parse_args()
    spark = get_spark(app) if needs_spark else None
    df = module.run(spark, quick=args.quick)
    print(f"PAPER CLAIM: {module.PAPER_CLAIM}\n")
    print(format_table(df, module.__name__.rsplit('.', 1)[-1]))
    if df.attrs:
        print(f"\nderived: {df.attrs}")
    if spark is not None:
        spark.stop()

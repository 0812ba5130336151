"""Shared CLI runner for the per-table spark-submit jobs.

Usage: ``spark-submit jobs/table2.py --scale bench``. Each job builds one
evaluation table at the requested scale and shows it through Spark (so the
output paths/format match a cluster run).
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def run_table(run_fn, name: str) -> None:
    ap = argparse.ArgumentParser(description=f"Reproduce {name}")
    ap.add_argument("--scale", default="bench", choices=["tiny", "quick", "bench"])
    args = ap.parse_args()

    from repro.harness import config

    spark = (
        SparkSession.builder.appName(f"ppq-trajectory-{name}")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    try:
        pdf = run_fn(config.get(args.scale))
        print(f"== {name} (scale={args.scale}) ==")
        spark.createDataFrame(pdf.astype(object).where(pdf.notna(), None)).show(
            200, truncate=False
        )
    finally:
        spark.stop()

"""Shared helpers for the spark-submit job entrypoints."""
from __future__ import annotations

import argparse
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))


def get_spark(app: str):
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.python.filterPushdown.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark


def parser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument(
        "--data-dir",
        default="/tmp/repro_data",
        help="directory holding/receiving the ingested stores",
    )
    p.add_argument(
        "--scale",
        type=float,
        default=1.0,
        help="multiplier on the bench-scale record counts",
    )
    return p


def scaled_sizes(scale: float) -> dict:
    from repro.experiments import BENCH_SIZES

    return {k: max(200, int(v * scale)) for k, v in BENCH_SIZES.items()}

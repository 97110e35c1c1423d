"""Shared helpers for spark-submit job entrypoints."""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    """Session for standalone runs; mirrors the conftest fixture settings."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def scale_arg(default: float = 1.0) -> argparse.Namespace:
    p = argparse.ArgumentParser()
    p.add_argument("--scale", type=float, default=default,
                   help="model-grid scale factor (1.0 = full reproduction size)")
    return p.parse_args()

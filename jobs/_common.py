"""Shared helpers for the spark-submit job entrypoints."""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def build_session(app: str) -> SparkSession:
    """Session for standalone spark-submit runs (tests use the fixture)."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def sf_parser(description: str, default_sf: float = 1.0) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=description)
    p.add_argument(
        "--sf",
        type=float,
        default=default_sf,
        help="corpus scale factor (1.0 = paper scale: 854 DECO / 886 FUSTE files)",
    )
    return p

"""Shared session/bootstrap for spark-submit job entrypoints.

Jobs are thin wrappers over library functions that take a SparkSession;
this module owns session construction (mirroring conftest.py's settings)
and the common CLI flags.
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    """A local session configured like the test fixture."""
    spark = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("WARN")
    return spark


def base_parser(description: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--scale", type=float, default=1.0,
                   help="corpus scale; 1.0 = the paper's 45,772 recipes")
    p.add_argument("--seed", type=int, default=11, help="corpus seed")
    return p

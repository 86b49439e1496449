"""Shared spark-submit session builder for the job entrypoints.

Mirrors the test fixture's configuration (Arrow on, broadcast joins off,
bounded shuffle partitions) so job results match test behaviour.
"""
from __future__ import annotations

import argparse
import os

from pyspark.sql import SparkSession


def build_session(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.showConsoleProgress", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def common_args(description: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--sf", type=float, default=0.25, help="scale factor vs Table II")
    p.add_argument("--seed", type=int, default=0)
    p.add_argument(
        "--domains",
        type=str,
        default="",
        help="comma-separated domain subset (default: all nine)",
    )
    return p


def parse_domains(arg: str) -> tuple[str, ...] | None:
    return tuple(d for d in arg.split(",") if d) or None

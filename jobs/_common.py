"""Shared spark-submit plumbing for the experiment jobs."""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def session(app: str) -> SparkSession:
    """Local session mirroring the test fixture's settings."""
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def repo_arg(parser: argparse.ArgumentParser) -> None:
    parser.add_argument(
        "--repo",
        choices=["synthetic", "real"],
        default="synthetic",
        help="repository preset (synthetic = clean, real = dirty)",
    )


def scale_args(parser: argparse.ArgumentParser) -> None:
    parser.add_argument("--derivations", type=int, default=None, help="derived tables per base")
    parser.add_argument("--rows", type=int, default=None, help="base-table row scale")
    parser.add_argument("--targets", type=int, default=12, help="number of query targets")


def scale_overrides(args) -> dict:
    out = {}
    if args.derivations is not None:
        out["derivations_per_base"] = args.derivations
    if args.rows is not None:
        out["rows"] = args.rows
    return out

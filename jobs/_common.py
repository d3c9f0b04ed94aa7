"""Shared plumbing for spark-submit entrypoints.

Each job builds (or reuses) a SparkSession, generates the synthetic
RecipeDB at the requested scale, runs one pipeline, and prints the table
that reproduces the corresponding paper artifact.
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def build_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def base_parser(description: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--scale", type=float, default=1.0, help="dataset scale factor")
    p.add_argument("--seed", type=int, default=0, help="generator seed")
    p.add_argument(
        "--min-support", type=float, default=0.2, help="FP-Growth support threshold"
    )
    return p

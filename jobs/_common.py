"""Shared plumbing for the spark-submit job entrypoints.

Each ``jobs/tableN_*.py`` reproduces one evaluation table (paper
Fig. 11–15). Run them with ``spark-submit jobs/tableN_*.py [args]`` or
plain ``python`` (a local session is created either way). The printed
table is the artifact recorded in EXPERIMENTS.md.
"""
from __future__ import annotations

import argparse
import os
import sys

from pyspark.sql import SparkSession


def session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions",
                os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .config("spark.ui.showConsoleProgress", "false")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )


def base_parser(description: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=description)
    p.add_argument(
        "--workdir",
        default=os.environ.get("REPRO_WORKDIR", "/tmp/repro-data"),
        help="directory where generated datasets are cached",
    )
    return p


def emit(text: str) -> None:
    print(text)
    sys.stdout.flush()

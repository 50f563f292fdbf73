"""Shared plumbing for the spark-submit job entrypoints.

Each ``jobs/tableN_*.py`` reproduces one table of the paper (DESIGN.md
§3) and prints its rows to stdout. Run as ``python jobs/tableN_*.py``
or ``spark-submit jobs/tableN_*.py``; common flags: ``--n`` (rows),
``--seed``, ``--m`` (permutations).
"""
from __future__ import annotations

import argparse
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), os.pardir, "src"))

from pyspark.sql import SparkSession  # noqa: E402


def session(app: str) -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    spark = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark


def argparser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--n", type=int, default=None, help="row-count override")
    p.add_argument("--seed", type=int, default=0)
    p.add_argument("--m", type=int, default=100, help="MIT permutations")
    return p


def banner(title: str) -> None:
    print("=" * 72)
    print(title)
    print("=" * 72)

"""Shared spark-submit plumbing for the experiment jobs.

Each ``jobs/tN_*.py`` reproduces one table of EXPERIMENTS.md: it builds
the workload, runs the paper's incremental circuit against the
non-incremental baseline, and prints a markdown table. Run with
``spark-submit jobs/tN_*.py`` or plain ``python jobs/tN_*.py``.
"""
from __future__ import annotations

import os
import sys
import time
from typing import Callable

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
    f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
    "--conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)

from pyspark.sql import SparkSession  # noqa: E402


def get_spark(app: str) -> SparkSession:
    """Session configured like the test fixture (shuffle path exercised)."""
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def timed(fn: Callable, repeats: int = 3) -> tuple[object, float]:
    """Run ``fn`` ``repeats`` times, return (last result, median seconds)."""
    times = []
    result = None
    for _ in range(repeats):
        t0 = time.perf_counter()
        result = fn()
        times.append(time.perf_counter() - t0)
    times.sort()
    return result, times[len(times) // 2]


def print_table(title: str, header: list[str], rows: list[list]) -> None:
    print(f"\n## {title}\n")
    print("| " + " | ".join(header) + " |")
    print("|" + "|".join("---" for _ in header) + "|")
    for r in rows:
        print("| " + " | ".join(str(x) for x in r) + " |")
    sys.stdout.flush()

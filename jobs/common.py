"""Shared helpers for spark-submit entrypoints.

Each job is a thin wrapper over a function that takes a SparkSession; run as
``spark-submit jobs/<name>.py`` or ``python jobs/<name>.py``. Results print
to stdout and are also appended to ``results/<name>.txt`` so EXPERIMENTS.md
can be assembled from saved runs.
"""
from __future__ import annotations

import os
import sys

from pyspark.sql import SparkSession

RESULTS_DIR = os.path.join(os.path.dirname(os.path.dirname(os.path.abspath(__file__))), "results")


def get_spark(app: str) -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false pyspark-shell",
    )
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


class Tee:
    """Print to stdout and to results/<name>.txt."""

    def __init__(self, name: str) -> None:
        os.makedirs(RESULTS_DIR, exist_ok=True)
        self.path = os.path.join(RESULTS_DIR, f"{name}.txt")
        self.fh = open(self.path, "w")

    def __call__(self, *args) -> None:
        line = " ".join(str(a) for a in args)
        print(line)
        self.fh.write(line + "\n")
        self.fh.flush()

    def close(self) -> None:
        self.fh.close()
        print(f"[saved {self.path}]", file=sys.stderr)

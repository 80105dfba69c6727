"""Shared helpers for the table/figure jobs (spark-submit entrypoints).

Each job is a function taking a SparkSession (importable from tests and
benchmarks) plus a ``main()`` that builds a local session when invoked
as a script. Results are printed and mirrored to ``results/<name>.txt``.
"""
from __future__ import annotations

import os
import sys

RESULTS_DIR = os.path.join(os.path.dirname(os.path.dirname(os.path.abspath(__file__))), "results")


def get_spark(app: str):
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 16g "
        "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark


class Tee:
    """Print to stdout and mirror into results/<name>.txt."""

    def __init__(self, name: str):
        os.makedirs(RESULTS_DIR, exist_ok=True)
        self.f = open(os.path.join(RESULTS_DIR, f"{name}.txt"), "w")

    def __call__(self, *args) -> None:
        line = " ".join(str(a) for a in args)
        print(line)
        sys.stdout.flush()
        self.f.write(line + "\n")
        self.f.flush()

    def close(self) -> None:
        self.f.close()

"""Shared spark-submit plumbing for the experiment jobs.

Each job module exposes ``run(spark) -> list`` and can be launched with
``spark-submit jobs/<name>.py`` or plain ``python jobs/<name>.py`` (the
builder falls back to a local session with the same settings as conftest).
Rows are printed and also appended to ``results/<job>.txt`` so EXPERIMENTS.md
can be assembled from the captured outputs.
"""
from __future__ import annotations

import os
import sys
from pathlib import Path

RESULTS_DIR = Path(__file__).resolve().parent.parent / "results"


def get_spark():
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false "
        "pyspark-shell",
    )
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName("repro-job")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


class Tee:
    """Mirror stdout into results/<job>.txt."""

    def __init__(self, job: str):
        RESULTS_DIR.mkdir(exist_ok=True)
        self.f = open(RESULTS_DIR / f"{job}.txt", "w")
        self.stdout = sys.stdout

    def write(self, s):
        self.stdout.write(s)
        self.f.write(s)

    def flush(self):
        self.stdout.flush()
        self.f.flush()


def main(job: str, run):
    sys.stdout = Tee(job)
    spark = get_spark()
    try:
        run(spark)
    finally:
        spark.stop()

"""Shared plumbing for the table jobs.

Each job exposes ``run(spark, seeds, length_scale) -> pd.DataFrame`` and
a ``main()`` that builds a local SparkSession for ``spark-submit``. The
pytest suites call ``run`` with the session fixture instead.
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def build_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )


def cli() -> argparse.Namespace:
    p = argparse.ArgumentParser()
    p.add_argument("--seeds", type=int, default=3, help="number of seeds")
    p.add_argument("--scale", type=float, default=1.0, help="stream length scale")
    return p.parse_args()

"""Shared spark-submit plumbing for table jobs.

Each job can run standalone (``spark-submit jobs/tableN.py --sf 0.5``)
or be driven programmatically from tests/benchmarks via the functions
in ``repro.experiments``.
"""
from __future__ import annotations

import argparse
import os

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.showConsoleProgress", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def table_args(description: str, *, sf: float, cost_scale: float) -> argparse.Namespace:
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--sf", type=float, default=float(os.environ.get("REPRO_SF", sf)),
                   help="dataset scale factor (1.0 = profile default)")
    p.add_argument("--cost-scale", type=float,
                   default=float(os.environ.get("REPRO_COST_SCALE", cost_scale)),
                   help="calibrated model-compute burn scale (0 = off)")
    return p.parse_args()

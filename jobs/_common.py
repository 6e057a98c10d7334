"""Shared spark-submit bootstrap for the jobs/ entrypoints."""
from __future__ import annotations

import json
import sys

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "8")
        .config("spark.ui.showConsoleProgress", "false")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def emit(name: str, payload: dict) -> None:
    from repro.experiments import save_results

    save_results(name, payload)
    json.dump(payload, sys.stdout, indent=2, default=str)
    print()

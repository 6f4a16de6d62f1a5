"""Shared SparkSession bootstrap for the spark-submit entrypoints."""
import os
import sys

from pyspark.sql import SparkSession


def session(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "16"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def arg_sf(default: float = 0.01) -> float:
    for a in sys.argv[1:]:
        if a.startswith("--sf="):
            return float(a.split("=", 1)[1])
    return default


def fmt_sets(sets) -> str:
    return ", ".join("{" + ",".join(sorted(s)) + "}" for s in sets) or "∅"

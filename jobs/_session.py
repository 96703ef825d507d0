"""Shared spark-submit session bootstrap for the job entrypoints.

Jobs are thin wrappers over ``repro.eval.tables``; they are also importable
(``main(spark)``) so tests and benchmarks drive the same code.
"""
import argparse
import os

from pyspark.sql import SparkSession

from repro.eval.tables import Scale


def get_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def scale_from_args(description: str) -> Scale:
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--so-sf", type=float, default=0.1)
    p.add_argument("--flights-sf", type=float, default=0.01)
    p.add_argument("--n-junk", type=int, default=16)
    p.add_argument("--k", type=int, default=5)
    p.add_argument(
        "--paper-scale",
        action="store_true",
        help="SF=1 and paper-like attribute counts (slow)",
    )
    a = p.parse_args()
    s = Scale(so_sf=a.so_sf, flights_sf=a.flights_sf, n_junk=a.n_junk, k=a.k)
    return s.paper() if a.paper_scale else s

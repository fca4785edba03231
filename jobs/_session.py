"""Shared spark-submit plumbing for the table jobs.

Each ``jobs/tableN.py`` is a thin wrapper over ``repro.eval.tables``:
build a session, build an :class:`EvalRun` at the requested scale, print
the paper-vs-measured table. Run as::

    spark-submit jobs/table5.py --scale default
    python jobs/table5.py --scale tiny
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession

from repro.eval.tables import EvalRun, Scale


def build_session(app: str) -> SparkSession:
    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s


def parse_scale() -> Scale:
    p = argparse.ArgumentParser()
    p.add_argument(
        "--scale",
        choices=["tiny", "default", "paper"],
        default="default",
        help="benchmark size: tiny (seconds), default (minutes), paper",
    )
    p.add_argument("--seed", type=int, default=0)
    args = p.parse_args()
    scale = {
        "tiny": Scale.tiny,
        "default": Scale,
        "paper": Scale.paper,
    }[args.scale]()
    return scale


def build_run(app: str) -> EvalRun:
    scale = parse_scale()
    spark = build_session(app)
    return EvalRun(spark, scale=scale).build()


def show(df) -> None:
    """Print a paper-vs-measured table; tuples are (paper, measured)."""
    print(df.to_string(index=False))

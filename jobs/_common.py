"""Shared spark-submit plumbing for the table jobs.

Each job exposes ``run(spark, scale, workdir)`` (importable from tests)
and a ``main()`` that builds a local SparkSession when invoked via
``spark-submit jobs/<name>.py [--scale bench]``.
"""
from __future__ import annotations

import argparse
import tempfile

from pyspark.sql import SparkSession


def job_session() -> SparkSession:
    return (
        SparkSession.builder.appName("agl-repro-job")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .master("local[*]")
        .getOrCreate()
    )


def job_main(run_fn, needs_workdir: bool = False) -> None:
    p = argparse.ArgumentParser()
    p.add_argument("--scale", default="bench", choices=["test", "bench"])
    p.add_argument("--workdir", default=None)
    args = p.parse_args()
    spark = job_session()
    try:
        kw = {"scale": args.scale}
        if needs_workdir:
            kw["workdir"] = args.workdir or tempfile.mkdtemp(prefix="agl_job_")
        run_fn(spark, **kw)
    finally:
        spark.stop()

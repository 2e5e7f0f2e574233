"""Shared CLI plumbing for the job entrypoints.

Each job regenerates one paper table and prints it. Jobs that exercise
live Spark build their own session when run via ``spark-submit
jobs/<name>.py`` (or plain ``python jobs/<name>.py`` — PySpark launches
the JVM itself).
"""
from __future__ import annotations

import argparse


def arg_parser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--cluster", choices=("arm", "x86"), default="arm")
    p.add_argument("--seed", type=int, default=5)
    return p


def get_spark(app: str):
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )

"""Shared plumbing for the spark-submit entrypoints.

Each job exposes ``run(spark, ...) -> pandas.DataFrame`` (pure function,
testable with the session fixture) and a ``main()`` that builds a local
session for command-line use:

    spark-submit jobs/<name>.py [args]      # or: python jobs/<name>.py
"""
from __future__ import annotations

import sys
import time
from contextlib import contextmanager

import pandas as pd
from pyspark.sql import SparkSession

ALGO_CHOICES = ("tbc", "tbc-sql", "tbc+", "tbc++")
ENUM_CHOICES = ("tbe", "tbe+")


def make_session(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .master("local[*]")
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def resolve_count_algo(name: str):
    from repro.core.baseline import tbc, tbc_sql
    from repro.core.optimized import tbc_plus, tbc_pp

    return {"tbc": tbc, "tbc-sql": tbc_sql, "tbc+": tbc_plus, "tbc++": tbc_pp}[name]


def resolve_enum_algo(name: str):
    from repro.core.baseline import tbe
    from repro.core.enumerate_ import tbe_plus

    return {"tbe": tbe, "tbe+": tbe_plus}[name]


@contextmanager
def timed(label: str):
    t0 = time.perf_counter()
    yield
    print(f"[{label}] {time.perf_counter() - t0:.2f}s", file=sys.stderr)


def print_table(df: pd.DataFrame, title: str) -> None:
    print(f"\n== {title} ==")
    print(df.to_string(index=False))

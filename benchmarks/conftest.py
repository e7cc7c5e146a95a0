"""Benchmark-suite fixtures: warm the Spark JVM, Arrow path and python
workers once, so the first measured benchmark is not charged for
session/executor startup (the paper likewise excludes loading time)."""
from __future__ import annotations

import pandas as pd
import pytest


@pytest.fixture(scope="session", autouse=True)
def _spark_warmup(spark):
    pdf = pd.DataFrame({"u": [0, 1], "v": [0, 1], "t": [1, 2]}).astype("int64")
    sdf = spark.createDataFrame(pdf)
    sdf.groupBy("u").applyInPandas(lambda p: p, schema="u long, v long, t long").count()
    yield

"""Native sketch-based approximate aggregates (Table 2 comparators).

The paper compares VerdictDB's sampling-based count-distinct / median
against Impala's ``ndv`` and Redshift's ``approx_median`` /
``percentile_disc``. Spark's built-ins play the same role here:
``approx_count_distinct`` (HyperLogLog++) and ``percentile_approx``
both require a **full scan** of the table — which is exactly why the
paper's sampling-based answers beat them on latency.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from pyspark.sql import SparkSession


@dataclass
class Timed:
    value: float
    seconds: float


def _run(spark: SparkSession, sql: str) -> Timed:
    t0 = time.perf_counter()
    v = spark.sql(sql).collect()[0][0]
    return Timed(float(v), time.perf_counter() - t0)


def native_count_distinct(spark: SparkSession, table: str, col: str) -> Timed:
    """HyperLogLog++ distinct count over the full table (Impala's ndv)."""
    return _run(spark, f"SELECT approx_count_distinct({col}) FROM {table}")


def native_median(
    spark: SparkSession, table: str, col: str, accuracy: int = 10000
) -> Timed:
    """Sketch median over the full table (Redshift's approx_median)."""
    return _run(
        spark, f"SELECT percentile_approx({col}, 0.5, {accuracy}) FROM {table}"
    )


def exact_count_distinct(spark: SparkSession, table: str, col: str) -> Timed:
    return _run(spark, f"SELECT count(DISTINCT {col}) FROM {table}")


def exact_median(spark: SparkSession, table: str, col: str) -> Timed:
    return _run(spark, f"SELECT percentile({col}, 0.5) FROM {table}")

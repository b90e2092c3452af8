"""E7 — sample preparation time vs data preparation time (Figure 11,
Appendix B.2).

The paper compares VerdictDB's offline sampling time against the data
transfer/load work a cluster must do anyway (scp to AWS, HDFS upload)
and against SnappyData's integrated sampling. The local analogues:

- "data load": writing the dataset to parquet on local disk (the
  unavoidable heavy-write ETL step);
- VerdictDB sampling: the §3 SQL builders (uniform + hashed +
  stratified);
- integrated sampling: the DataFrame-level sample of the simulated
  integrated engine (expected faster — tight integration).
"""
from __future__ import annotations

import os
import shutil
import tempfile
import time

from pyspark.sql import SparkSession

from ..core.verdict import VerdictContext
from ..integrated.snappy_sim import IntegratedAQPEngine


def run_sample_prep(
    spark: SparkSession, *, table: str = "lineitem", ratio: float = 0.01,
    seed: int = 810,
) -> list[dict]:
    rows: list[dict] = []

    out = tempfile.mkdtemp(prefix="verdict_prep_")
    try:
        t0 = time.perf_counter()
        spark.table(table).write.mode("overwrite").parquet(
            os.path.join(out, "parquet")
        )
        rows.append(
            {"task": "data load (parquet write)",
             "seconds": time.perf_counter() - t0}
        )
    finally:
        shutil.rmtree(out, ignore_errors=True)

    v = VerdictContext(spark, seed=seed)
    t0 = time.perf_counter()
    v.create_uniform_sample(table, ratio=ratio)
    rows.append(
        {"task": "verdict uniform sample", "seconds": time.perf_counter() - t0}
    )
    t0 = time.perf_counter()
    v.create_hashed_sample(table, ("l_orderkey",), ratio=ratio)
    rows.append(
        {"task": "verdict hashed sample", "seconds": time.perf_counter() - t0}
    )
    t0 = time.perf_counter()
    v.create_stratified_sample(table, ("l_returnflag",), ratio=ratio)
    rows.append(
        {"task": "verdict stratified sample",
         "seconds": time.perf_counter() - t0}
    )

    eng = IntegratedAQPEngine(spark, seed=seed)
    t0 = time.perf_counter()
    eng.create_sample(table, fraction=ratio)
    rows.append(
        {"task": "integrated engine sample",
         "seconds": time.perf_counter() - t0}
    )
    return rows

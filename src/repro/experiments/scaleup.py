"""E2 — speedup vs original data size with a fixed sample size
(Figure 5: 5 GB sample against 5-500 GB of data; here a fixed-row
sample against growing SF).

The paper's observation: AQP latency is flat in data size (it reads the
sample), while exact latency grows linearly — so the speedup grows with
the data. The SF values here stand in for the paper's 50/200/500 GB
points.
"""
from __future__ import annotations

import time

from pyspark.sql import SparkSession

from .. import synth_data
from ..core.verdict import VerdictContext

#: Figure 5 queries (tq-6 and tq-14 analogues on lineitem)
Q_TQ6 = (
    "select sum(l_extendedprice * l_discount) as revenue from lineitem_su "
    "where l_shipdate >= date '1994-01-01' and l_shipdate < date '1995-01-01' "
    "and l_discount between 0.05 and 0.07 and l_quantity < 24"
)
Q_TQ14 = (
    "select l_returnflag, sum(l_extendedprice * l_discount) as rev, "
    "count(*) as cnt from lineitem_su group by l_returnflag"
)


def run_scaleup(
    spark: SparkSession,
    *,
    sfs: tuple[float, ...] = (0.05, 0.2, 0.5),
    sample_rows: int = 6000,
    seed: int = 202,
) -> list[dict]:
    import os
    import shutil
    import tempfile

    rows: list[dict] = []
    base = tempfile.mkdtemp(prefix="scaleup_")
    for sf in sfs:
        df = synth_data.lineitem(spark, sf=sf, seed=3)
        path = os.path.join(base, f"li_{sf}")
        # file-backed, like the paper's HDFS-resident data: the exact
        # side must pay a scan that grows with sf
        df.write.mode("overwrite").option("header", True).csv(path)
        reader = (
            spark.read.schema(df.schema).option("header", True).csv(path)
        )
        reader.createOrReplaceTempView("lineitem_su")
        n = reader.count()
        v = VerdictContext(spark, budget=1.0, seed=seed)
        v.create_uniform_sample(
            "lineitem_su", ratio=min(1.0, sample_rows / n)
        )
        spark.sql(Q_TQ6).collect()  # warm the scan path (JIT, code cache)
        for name, sql in (("tq-6", Q_TQ6), ("tq-14", Q_TQ14)):
            t0 = time.perf_counter()
            spark.sql(sql).collect()
            t_exact = time.perf_counter() - t0
            v.sql(sql, seed=seed).df.collect()  # warm the AQP path
            t0 = time.perf_counter()
            res = v.sql(sql, seed=seed)
            res.df.collect()
            t_verdict = time.perf_counter() - t0
            rows.append(
                {
                    "query": name,
                    "sf": sf,
                    "data_rows": n,
                    "sample_rows": sample_rows,
                    "exact_s": t_exact,
                    "verdict_s": t_verdict,
                    "speedup": t_exact / t_verdict,
                    "approx": res.approx,
                }
            )
        spark.catalog.dropTempView("lineitem_su")
    shutil.rmtree(base, ignore_errors=True)
    return rows

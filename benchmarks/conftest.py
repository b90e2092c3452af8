"""Benchmark fixtures: SF=0.1 (~100 MB) data with the paper's 1% sample
ratio and 2% I/O budget. Override the scale with BENCH_SF=<float>."""
import os

import pytest

BENCH_SF = float(os.environ.get("BENCH_SF", "0.1"))
BENCH_RATIO = float(os.environ.get("BENCH_RATIO", "0.01"))
BENCH_BUDGET = float(os.environ.get("BENCH_BUDGET", "0.02"))


@pytest.fixture(scope="session")
def tpch_bench(spark):
    """File-backed (csv) views: exact queries pay a real scan, like the
    paper's HDFS/S3-resident data — see §6.2's format observation."""
    from repro.workloads.tpch_lite import register_tpch_files

    return register_tpch_files(spark, sf=BENCH_SF, seed=0, fmt="csv")


@pytest.fixture(scope="session")
def insta_bench(spark):
    from repro.workloads.insta import register_insta_files

    return register_insta_files(spark, sf=BENCH_SF, seed=0, fmt="csv")


@pytest.fixture(scope="session")
def verdict_bench(spark, tpch_bench):
    from repro.core.verdict import VerdictContext
    from repro.workloads.tpch_lite import prepare_tpch_samples

    v = VerdictContext(spark, budget=BENCH_BUDGET, seed=11)
    prepare_tpch_samples(v, ratio=BENCH_RATIO)
    return v


@pytest.fixture(scope="session")
def verdict_insta_bench(spark, insta_bench):
    from repro.core.verdict import VerdictContext
    from repro.workloads.insta import prepare_insta_samples

    v = VerdictContext(spark, budget=BENCH_BUDGET, seed=11)
    prepare_insta_samples(v, ratio=BENCH_RATIO)
    return v


@pytest.fixture(scope="session")
def integrated_bench(spark, tpch_bench):
    from repro.integrated.snappy_sim import IntegratedAQPEngine

    eng = IntegratedAQPEngine(spark, seed=11)
    eng.create_sample("lineitem", fraction=BENCH_RATIO)
    eng.create_sample("orders", fraction=BENCH_RATIO)
    return eng

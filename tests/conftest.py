"""Shared fixtures: TPC-H-lite / instacart-lite data registered once per
session, plus a VerdictContext with the paper's §6.1 sample set.

Tests use SF=0.01 (~10 MB) and a 10% sampling ratio / 25% I/O budget so
statistical tolerances stay tight enough to catch real estimator bugs
without thousands of rows per group.
"""
import pytest

TEST_SF = 0.01
TEST_RATIO = 0.10
TEST_BUDGET = 0.25


@pytest.fixture(scope="session")
def tpch(spark):
    from repro.workloads.tpch_lite import register_tpch

    return register_tpch(spark, sf=TEST_SF, seed=0)


@pytest.fixture(scope="session")
def insta(spark):
    from repro.workloads.insta import register_insta

    return register_insta(spark, sf=TEST_SF, seed=0)


@pytest.fixture(scope="session")
def verdict(spark, tpch):
    """VerdictContext with TPC-H samples at the test ratio."""
    from repro.core.verdict import VerdictContext
    from repro.workloads.tpch_lite import prepare_tpch_samples

    v = VerdictContext(spark, budget=TEST_BUDGET, seed=7)
    prepare_tpch_samples(v, ratio=TEST_RATIO)
    return v


@pytest.fixture(scope="session")
def verdict_insta(spark, insta):
    from repro.core.verdict import VerdictContext
    from repro.workloads.insta import prepare_insta_samples

    v = VerdictContext(spark, budget=TEST_BUDGET, seed=7)
    prepare_insta_samples(v, ratio=TEST_RATIO)
    return v

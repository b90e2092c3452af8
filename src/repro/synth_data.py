"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# ---------------------------------------------------------------------------
# VerdictDB reproduction extensions
# ---------------------------------------------------------------------------
# instacart-lite: a synthetic stand-in for the paper's 124 GB `insta`
# sales dataset (Section 6.1). Reproduces the properties the iq-* micro
# benchmarks exercise: up to 4 joined tables, zipfian product popularity,
# and low-cardinality grouping columns (dow/hour/department).

_N_IORDERS_PER_SF = 1_000_000
_N_IORDER_PRODUCTS_PER_SF = 6_000_000
_N_IPRODUCTS = 20_000
_N_IDEPARTMENTS = 21


def insta_orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 10) -> DataFrame:
    n = max(1, int(_N_IORDERS_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "order_id": np.arange(1, n + 1),
            "user_id": g.integers(1, max(2, n // 10), n),
            "order_dow": g.integers(0, 7, n),
            "order_hour": g.integers(0, 24, n),
            "days_since_prior": g.integers(0, 31, n).astype("float64"),
        }
    )
    return spark.createDataFrame(pdf)


def insta_products(spark: SparkSession, *, sf: float = 1.0, seed: int = 11) -> DataFrame:
    n = max(100, int(_N_IPRODUCTS * min(1.0, sf * 10)))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "product_id": np.arange(1, n + 1),
            "aisle_id": g.integers(1, 135, n),
            "department_id": g.integers(1, _N_IDEPARTMENTS + 1, n),
            "price": (g.random(n) * 30 + 0.5).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def insta_departments(spark: SparkSession, *, seed: int = 12) -> DataFrame:
    pdf = pd.DataFrame(
        {
            "department_id": np.arange(1, _N_IDEPARTMENTS + 1),
            "department": [f"dept_{i:02d}" for i in range(1, _N_IDEPARTMENTS + 1)],
        }
    )
    return spark.createDataFrame(pdf)


def insta_order_products(
    spark: SparkSession, *, sf: float = 0.01, seed: int = 13, alpha: float = 1.05
) -> DataFrame:
    """Fact table: one row per product in an order; product popularity is
    zipfian (the real Instacart data is heavily skewed)."""
    n = max(1, int(_N_IORDER_PRODUCTS_PER_SF * sf))
    n_orders = max(1, int(_N_IORDERS_PER_SF * sf))
    n_products = max(100, int(_N_IPRODUCTS * min(1.0, sf * 10)))
    g = _rng(seed)
    ranks = np.arange(1, n_products + 1)
    w = 1.0 / ranks**alpha
    w /= w.sum()
    pdf = pd.DataFrame(
        {
            "op_order_id": g.integers(1, n_orders + 1, n),
            "op_product_id": g.choice(ranks, size=n, p=w),
            "add_to_cart_order": g.integers(1, 20, n),
            "reordered": g.integers(0, 2, n),
            "quantity": g.integers(1, 6, n).astype("float64"),
        }
    )
    return spark.createDataFrame(pdf)


def synthetic(
    spark: SparkSession,
    *,
    n: int,
    mean: float = 10.0,
    sd: float = 10.0,
    n_groups: int = 10,
    seed: int = 20,
) -> DataFrame:
    """The Section 6.5 controlled dataset: attribute values with a known
    mean and standard deviation, a uniform [0,1) column ``u`` for
    exact-selectivity predicates, and a low-cardinality group.

    Values are gamma-distributed (exact mean/sd; exponential when
    mean == sd, which is the paper's 10.0/10.0 setting) — the skew is
    what makes too-small subsample sizes hurt in Appendix B.3."""
    g = _rng(seed)
    shape = (mean / sd) ** 2
    pdf = pd.DataFrame(
        {
            "id": np.arange(1, n + 1),
            "val": g.gamma(shape, sd * sd / mean, n),
            "u": g.random(n),
            "grp": g.integers(0, n_groups, n),
        }
    )
    return spark.createDataFrame(pdf)


def synthetic_pandas(
    *, n: int, mean: float = 10.0, sd: float = 10.0, seed: int = 20
) -> pd.DataFrame:
    """In-memory variant for the many-trial error-estimation studies
    (Sections 6.5 and B.3), where Spark round-trips would dominate."""
    g = _rng(seed)
    shape = (mean / sd) ** 2
    return pd.DataFrame(
        {"val": g.gamma(shape, sd * sd / mean, n), "u": g.random(n)}
    )

"""Instacart-lite micro-benchmark suite (the paper's iq-* workload).

Section 6.1: "various aggregate functions on up to 4 joined tables",
grouped by low-cardinality columns. The synthetic instacart-lite schema
(orders / order_products / products / departments) reproduces those
structural properties; see DESIGN.md for the dataset substitution.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from .. import synth_data
from ..core.verdict import VerdictContext
from .tpch_lite import WorkloadQuery

INSTA_QUERIES: tuple[WorkloadQuery, ...] = (
    WorkloadQuery(
        "iq-1",
        "select order_dow, count(*) as cnt from orders_i group by order_dow "
        "order by order_dow",
    ),
    WorkloadQuery(
        "iq-2",
        "select order_dow, avg(days_since_prior) as avg_gap "
        "from orders_i group by order_dow order by order_dow",
    ),
    WorkloadQuery(
        "iq-3",
        "select department, count(*) as cnt "
        "from order_products "
        "inner join products on op_product_id = product_id "
        "inner join departments on department_id = department_id2 "
        "group by department order by cnt desc",
    ),
    WorkloadQuery(
        "iq-4",
        "select order_dow, sum(quantity) as total_qty "
        "from order_products "
        "inner join orders_i on op_order_id = order_id "
        "group by order_dow order by order_dow",
        note="join of two samples (hashed pair on the order_id edge)",
    ),
    WorkloadQuery(
        "iq-5",
        "select department_id, avg(price) as avg_price "
        "from order_products "
        "inner join products on op_product_id = product_id "
        "group by department_id order by department_id",
    ),
    WorkloadQuery(
        "iq-6",
        "select order_dow, sum(price * quantity) as revenue "
        "from order_products "
        "inner join orders_i on op_order_id = order_id "
        "inner join products on op_product_id = product_id "
        "inner join departments on department_id = department_id2 "
        "group by order_dow order by order_dow",
        note="4-table join",
    ),
    WorkloadQuery(
        "iq-7",
        "select count(distinct user_id) as users from orders_i",
        note="count-distinct via hashed sample on user_id",
    ),
    WorkloadQuery(
        "iq-8",
        "select percentile(add_to_cart_order, 0.5) as med_cart "
        "from order_products",
    ),
    WorkloadQuery(
        "iq-9",
        "select order_hour, count(*) as reorders "
        "from order_products "
        "inner join orders_i on op_order_id = order_id "
        "where reordered = 1 group by order_hour order by order_hour",
    ),
    WorkloadQuery(
        "iq-10",
        "select department_id, sum(price * quantity) as revenue "
        "from order_products "
        "inner join products on op_product_id = product_id "
        "group by department_id order by revenue desc limit 5",
    ),
    WorkloadQuery(
        "iq-14",
        "select order_dow, count(*) as cnt, avg(quantity) as aq "
        "from order_products "
        "inner join orders_i on op_order_id = order_id "
        "where order_hour >= 8 and order_hour < 20 "
        "group by order_dow order by order_dow",
        note="join of two samples with filter",
    ),
    WorkloadQuery(
        "iq-15",
        "select sum(quantity) as qty, count(*) as cnt "
        "from order_products "
        "inner join orders_i on op_order_id = order_id "
        "where order_dow < 2",
        note="join of two samples, global aggregate",
    ),
)


def register_insta(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> dict:
    """Create and register instacart-lite views.

    ``departments`` gets a renamed join column (``department_id2``) so
    every column name stays globally unique (the parser/rewriter rely
    on it; real deployments would qualify columns instead).
    """
    dfs = {
        "orders_i": synth_data.insta_orders(spark, sf=sf, seed=seed + 10),
        "order_products": synth_data.insta_order_products(spark, sf=sf, seed=seed + 13),
        "products": synth_data.insta_products(spark, sf=sf, seed=seed + 11),
        "departments": synth_data.insta_departments(spark).withColumnRenamed(
            "department_id", "department_id2"
        ),
    }
    for name, df in dfs.items():
        df.cache().count()
        df.createOrReplaceTempView(name)
    return dfs


def prepare_insta_samples(v: VerdictContext, *, ratio: float = 0.01) -> None:
    """Samples for the fact tables: uniform + universe on join keys +
    a hashed sample on user_id for iq-7's count-distinct."""
    v.create_uniform_sample("order_products", ratio=ratio)
    v.create_uniform_sample("orders_i", ratio=ratio)
    v.create_hashed_sample("order_products", ("op_order_id",), ratio=ratio)
    v.create_hashed_sample("orders_i", ("order_id",), ratio=ratio)
    v.create_hashed_sample("orders_i", ("user_id",), ratio=ratio)


def register_insta_files(
    spark: SparkSession,
    *,
    sf: float = 0.1,
    seed: int = 0,
    fmt: str = "csv",
    base_dir: str | None = None,
) -> dict:
    """File-backed (uncached) instacart-lite views; see
    :func:`repro.workloads.tpch_lite.register_tpch_files`."""
    import os
    import tempfile

    base_dir = base_dir or tempfile.mkdtemp(prefix="insta_files_")
    dfs = {
        "orders_i": synth_data.insta_orders(spark, sf=sf, seed=seed + 10),
        "order_products": synth_data.insta_order_products(
            spark, sf=sf, seed=seed + 13
        ),
        "products": synth_data.insta_products(spark, sf=sf, seed=seed + 11),
        "departments": synth_data.insta_departments(spark).withColumnRenamed(
            "department_id", "department_id2"
        ),
    }
    out = {}
    for name, df in dfs.items():
        path = os.path.join(base_dir, name)
        writer = df.write.mode("overwrite")
        if fmt == "csv":
            writer.option("header", True).csv(path)
            reader = spark.read.schema(df.schema).option("header", True).csv(path)
        else:
            writer.parquet(path)
            reader = spark.read.parquet(path)
        reader.createOrReplaceTempView(name)
        out[name] = reader
    return out

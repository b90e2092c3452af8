"""TPC-H-lite query suite (the paper's tq-* workload, Section 6.1).

The paper runs 18 of the 22 TPC-H queries on a 500 GB dataset; this
suite adapts the representative subset to the TPC-H-lite schema shipped
in :mod:`repro.synth_data` (lineitem / orders / customer / part at
SF 0.01–0.1). Query numbering follows the TPC-H query each one is
modelled on; `expect_approx=False` marks queries the paper itself ran
exactly (high-cardinality grouping — tq-3 — or extreme statistics).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import SparkSession

from .. import synth_data
from ..core.verdict import VerdictContext


@dataclass(frozen=True)
class WorkloadQuery:
    name: str
    sql: str
    expect_approx: bool = True
    note: str = ""


TPCH_QUERIES: tuple[WorkloadQuery, ...] = (
    WorkloadQuery(
        "tq-1",
        "select l_returnflag, l_linestatus, "
        "sum(l_quantity) as sum_qty, sum(l_extendedprice) as sum_base_price, "
        "avg(l_quantity) as avg_qty, avg(l_extendedprice) as avg_price, "
        "avg(l_discount) as avg_disc, count(*) as count_order "
        "from lineitem where l_shipdate <= date '1998-09-02' "
        "group by l_returnflag, l_linestatus "
        "order by l_returnflag, l_linestatus",
    ),
    WorkloadQuery(
        "tq-3",
        "select o_orderkey, sum(l_extendedprice) as revenue "
        "from orders inner join lineitem on o_orderkey = l_orderkey "
        "where o_orderdate < date '1995-03-15' "
        "group by o_orderkey order by revenue desc limit 10",
        expect_approx=False,
        note="high-cardinality grouping: AQP infeasible (paper ran exact)",
    ),
    WorkloadQuery(
        "tq-4",
        "select o_orderpriority, count(*) as order_count "
        "from orders "
        "where o_orderdate >= date '1993-07-01' "
        "and o_orderdate < date '1994-07-01' "
        "group by o_orderpriority order by o_orderpriority",
    ),
    WorkloadQuery(
        "tq-5",
        "select c_nationkey, sum(l_extendedprice * (1 - l_discount)) as revenue "
        "from customer "
        "inner join orders on c_custkey = o_custkey "
        "inner join lineitem on o_orderkey = l_orderkey "
        "where o_orderdate >= date '1994-01-01' "
        "group by c_nationkey order by revenue desc",
        note="join of two samples (hashed pair on the orderkey edge)",
    ),
    WorkloadQuery(
        "tq-6",
        "select sum(l_extendedprice * l_discount) as revenue "
        "from lineitem "
        "where l_shipdate >= date '1994-01-01' "
        "and l_shipdate < date '1995-01-01' "
        "and l_discount between 0.05 and 0.07 and l_quantity < 24",
    ),
    WorkloadQuery(
        "tq-10",
        "select c_nationkey, sum(l_extendedprice * (1 - l_discount)) as revenue "
        "from customer "
        "inner join orders on c_custkey = o_custkey "
        "inner join lineitem on o_orderkey = l_orderkey "
        "where l_returnflag = 'R' "
        "group by c_nationkey order by revenue desc",
    ),
    WorkloadQuery(
        "tq-12",
        "select o_orderpriority, count(*) as line_count "
        "from orders inner join lineitem on o_orderkey = l_orderkey "
        "where l_shipdate >= date '1994-01-01' "
        "and l_shipdate < date '1995-01-01' "
        "group by o_orderpriority order by o_orderpriority",
        note="join of two samples",
    ),
    WorkloadQuery(
        "tq-14",
        "select sum(l_extendedprice * l_discount) as promo_revenue, "
        "sum(l_extendedprice) as total_revenue "
        "from lineitem inner join part on l_partkey = p_partkey "
        "where p_type = 'PROMO' and l_shipdate >= date '1995-01-01' "
        "and l_shipdate < date '1996-01-01'",
    ),
    WorkloadQuery(
        "tq-17",
        "select sum(l_extendedprice) as small_qty_revenue "
        "from lineitem inner join part on l_partkey = p_partkey "
        "where p_brand = 'Brand#23' "
        "and l_quantity < (select avg(l_quantity) from lineitem)",
        note="uncorrelated comparison subquery (flattened, Section 2.2)",
    ),
    WorkloadQuery(
        "tq-18",
        "select o_orderpriority, count(*) as big_orders "
        "from orders "
        "where o_totalprice > (select avg(o_totalprice) from orders) "
        "group by o_orderpriority order by o_orderpriority",
        note="comparison subquery over the same table",
    ),
    WorkloadQuery(
        "tq-19",
        "select sum(l_extendedprice * (1 - l_discount)) as revenue "
        "from lineitem inner join part on l_partkey = p_partkey "
        "where p_brand = 'Brand#12' and l_quantity between 1 and 11",
    ),
    WorkloadQuery(
        "tq-corr",
        "select o_orderpriority, count(*) as cnt "
        "from orders o "
        "where o_totalprice > (select avg(o_totalprice) from orders i "
        "where i.o_orderpriority = o.o_orderpriority) "
        "group by o_orderpriority order by o_orderpriority",
        note="correlated comparison subquery (the Section 2.2 example)",
    ),
    WorkloadQuery(
        "tq-minmax",
        "select max(l_extendedprice) as mx, avg(l_extendedprice) as av "
        "from lineitem",
        note="extreme + mean-like decomposition (Section 2.2)",
    ),
    WorkloadQuery(
        "tq-median",
        "select percentile(l_extendedprice, 0.5) as med from lineitem",
    ),
    WorkloadQuery(
        "tq-cd",
        "select count(distinct l_orderkey) as d_orders from lineitem",
        note="count-distinct via domain-partitioned hashed sample",
    ),
    WorkloadQuery(
        "tq-nested",
        "select avg(sales) as avg_sales from "
        "(select l_returnflag, sum(l_extendedprice) as sales "
        "from lineitem group by l_returnflag) t",
        note="aggregate-over-aggregate (Query 5 shape, Section 5.2)",
    ),
)


def register_tpch(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> dict:
    """Create and register TPC-H-lite views; returns the DataFrames."""
    dfs = {
        "lineitem": synth_data.lineitem(spark, sf=sf, seed=seed),
        "orders": synth_data.orders(spark, sf=sf, seed=seed + 1),
        "customer": synth_data.customer(spark, sf=sf, seed=seed + 2),
        "part": synth_data.part(spark, sf=sf, seed=seed + 5),
    }
    for name, df in dfs.items():
        df.cache().count()
        df.createOrReplaceTempView(name)
    return dfs


def prepare_tpch_samples(v: VerdictContext, *, ratio: float = 0.01) -> None:
    """The paper's §6.1 sample set: uniform + universe samples on the
    fact tables, a stratified sample on the low-cardinality grouping
    columns of lineitem. Dimension-sized tables stay unsampled."""
    v.create_uniform_sample("lineitem", ratio=ratio)
    v.create_uniform_sample("orders", ratio=ratio)
    v.create_hashed_sample("lineitem", ("l_orderkey",), ratio=ratio)
    v.create_hashed_sample("orders", ("o_orderkey",), ratio=ratio)
    v.create_hashed_sample("orders", ("o_custkey",), ratio=ratio)
    v.create_hashed_sample("lineitem", ("l_partkey",), ratio=ratio)
    v.create_stratified_sample(
        "lineitem", ("l_returnflag", "l_linestatus"), ratio=ratio
    )


def register_tpch_files(
    spark: SparkSession,
    *,
    sf: float = 0.1,
    seed: int = 0,
    fmt: str = "csv",
    base_dir: str | None = None,
) -> dict:
    """Register TPC-H-lite as *file-backed* (uncached) views.

    The speedup experiments need exact queries to pay a real scan cost,
    as they do in the paper's clusters (Parquet on HDFS / csv; §6.2
    reports larger speedups for csv). A cached in-memory table would
    make every query overhead-bound and hide the AQP effect entirely.
    """
    import os
    import tempfile

    base_dir = base_dir or tempfile.mkdtemp(prefix="tpch_files_")
    dfs = {
        "lineitem": synth_data.lineitem(spark, sf=sf, seed=seed),
        "orders": synth_data.orders(spark, sf=sf, seed=seed + 1),
        "customer": synth_data.customer(spark, sf=sf, seed=seed + 2),
        "part": synth_data.part(spark, sf=sf, seed=seed + 5),
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

"""Synthetic data generators: schemas, scale, determinism, and the
statistical properties the experiments rely on."""
import numpy as np
import pytest

from repro import synth_data


class TestTpchLite:
    def test_lineitem_schema(self, tpch):
        cols = set(tpch["lineitem"].columns)
        assert {"l_orderkey", "l_extendedprice", "l_shipdate"} <= cols

    def test_row_counts_scale(self, spark):
        small = synth_data.orders(spark, sf=0.001).count()
        assert small == 1500

    def test_deterministic(self, spark):
        a = synth_data.part(spark, sf=0.001, seed=9).toPandas()
        b = synth_data.part(spark, sf=0.001, seed=9).toPandas()
        assert a.equals(b)

    def test_fk_ranges(self, spark, tpch):
        """l_orderkey must land inside orders' key space (joins hit)."""
        row = spark.sql(
            "SELECT min(l_orderkey) AS lo, max(l_orderkey) AS hi FROM lineitem"
        ).collect()[0]
        n_orders = spark.sql("SELECT count(*) AS n FROM orders").collect()[0]["n"]
        assert row["lo"] >= 1 and row["hi"] <= n_orders


class TestInstaLite:
    def test_schemas(self, insta):
        assert {"order_id", "order_dow", "order_hour"} <= set(
            insta["orders_i"].columns
        )
        assert {"op_order_id", "op_product_id", "quantity"} <= set(
            insta["order_products"].columns
        )
        assert "department_id2" in insta["departments"].columns

    def test_low_cardinality_groups(self, spark, insta):
        dows = spark.sql(
            "SELECT count(DISTINCT order_dow) AS d FROM orders_i"
        ).collect()[0]["d"]
        assert dows == 7

    def test_zipfian_product_popularity(self, spark, insta):
        """Top products must dominate (skew is what the paper's insta
        micro-benchmarks exercise)."""
        rows = spark.sql(
            "SELECT op_product_id, count(*) AS c FROM order_products "
            "GROUP BY op_product_id ORDER BY c DESC"
        ).collect()
        total = sum(r["c"] for r in rows)
        top10 = sum(r["c"] for r in rows[:10])
        assert top10 / total > 0.10  # far above uniform (10/20000)

    def test_join_coverage(self, spark, insta):
        """Every order_products row must join to a product."""
        n = spark.sql("SELECT count(*) AS n FROM order_products").collect()[0]["n"]
        j = spark.sql(
            "SELECT count(*) AS n FROM order_products "
            "INNER JOIN products ON op_product_id = product_id"
        ).collect()[0]["n"]
        assert j == n


class TestSynthetic:
    def test_controlled_moments(self, spark):
        df = synth_data.synthetic(spark, n=50_000, mean=10.0, sd=10.0, seed=1)
        row = df.selectExpr(
            "avg(val) AS m", "stddev_samp(val) AS s",
            "min(u) AS lo", "max(u) AS hi",
        ).collect()[0]
        assert row["m"] == pytest.approx(10.0, abs=0.2)
        assert row["s"] == pytest.approx(10.0, abs=0.2)
        assert 0.0 <= row["lo"] and row["hi"] < 1.0

    def test_selectivity_column(self, spark):
        """P(u < s) must equal s: the §6.5 selectivity knob."""
        df = synth_data.synthetic(spark, n=50_000, seed=2)
        df.createOrReplaceTempView("synth_sel")
        for s in (0.01, 0.1, 0.5):
            c = spark.sql(
                f"SELECT count(*) AS c FROM synth_sel WHERE u < {s}"
            ).collect()[0]["c"]
            assert c / 50_000 == pytest.approx(s, abs=3 * (s * (1 - s) / 50_000) ** 0.5 + 1e-4)

    def test_pandas_variant_matches(self):
        pdf = synth_data.synthetic_pandas(n=10_000, seed=3)
        assert abs(pdf["val"].mean() - 10.0) < 0.5
        assert {"val", "u"} == set(pdf.columns)

    def test_group_count(self, spark):
        df = synth_data.synthetic(spark, n=1000, n_groups=5, seed=4)
        assert df.select("grp").distinct().count() == 5


class TestKeyGenerators:
    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=20_000, n_keys=1000, alpha=1.5, seed=5)
        top = (
            df.groupBy("k").count().orderBy("count", ascending=False).first()
        )
        assert top["count"] > 20_000 / 1000 * 10  # heavy head

    def test_uniform_balance(self, spark):
        df = synth_data.uniform_keys(spark, n=20_000, n_keys=10, seed=6)
        counts = [r["count"] for r in df.groupBy("k").count().collect()]
        assert max(counts) < 2 * min(counts)

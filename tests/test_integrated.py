"""Simulated tightly-integrated AQP engine (§6.3 comparator)."""
import pytest

from repro.integrated.snappy_sim import IntegratedAQPEngine


@pytest.fixture(scope="module")
def engine(spark, tpch):
    eng = IntegratedAQPEngine(spark, seed=17)
    eng.create_sample("lineitem", fraction=0.1)
    eng.create_sample("orders", fraction=0.1)
    return eng


class TestIntegratedEngine:
    def test_flat_approx(self, spark, engine):
        res = engine.query(
            "select l_returnflag, count(*) as c from lineitem "
            "group by l_returnflag"
        )
        assert res.approx and res.sampled_table == "lineitem"
        exact = {
            r["l_returnflag"]: r["c"]
            for r in spark.sql(
                "select l_returnflag, count(*) as c from lineitem "
                "group by l_returnflag"
            ).collect()
        }
        for r in res.df.collect():
            assert r["c"] == pytest.approx(exact[r["l_returnflag"]], rel=0.15)

    def test_join_uses_single_sample(self, spark, engine):
        """The §6.3 capability gap: both tables have samples, but a join
        may only use ONE — the other reads the base table."""
        res = engine.query(
            "select o_orderpriority, count(*) as c "
            "from orders inner join lineitem on o_orderkey = l_orderkey "
            "group by o_orderpriority"
        )
        assert res.approx
        assert res.sampled_table == "orders"  # first sampled relation only
        exact = {
            r["o_orderpriority"]: r["c"]
            for r in spark.sql(
                "select o_orderpriority, count(*) as c "
                "from orders inner join lineitem on o_orderkey = l_orderkey "
                "group by o_orderpriority"
            ).collect()
        }
        for r in res.df.collect():
            assert r["c"] == pytest.approx(exact[r["o_orderpriority"]], rel=0.2)

    def test_avg_unscaled(self, spark, engine):
        res = engine.query("select avg(l_quantity) as a from lineitem")
        exact = spark.sql(
            "select avg(l_quantity) as a from lineitem"
        ).collect()[0]["a"]
        assert res.df.collect()[0]["a"] == pytest.approx(exact, rel=0.05)

    def test_unsampled_table_exact(self, spark, engine):
        res = engine.query("select count(*) as c from part")
        assert not res.approx
        exact = spark.sql("select count(*) as c from part").collect()[0]["c"]
        assert res.df.collect()[0]["c"] == exact

    def test_unsupported_passthrough(self, spark, engine):
        res = engine.query("select l_returnflag from lineitem limit 1")
        assert not res.approx
        assert res.df.count() == 1

    def test_latency_recorded(self, engine):
        res = engine.query("select count(*) as c from lineitem")
        assert res.latency_sec is not None and res.latency_sec > 0

    def test_sum_scaled(self, spark, engine):
        res = engine.query("select sum(l_extendedprice) as s from lineitem")
        exact = spark.sql(
            "select sum(l_extendedprice) as s from lineitem"
        ).collect()[0]["s"]
        assert res.df.collect()[0]["s"] == pytest.approx(exact, rel=0.1)

"""DuckDB oracle sanity: exact Spark results must match DuckDB on the
same inputs (catches generator / registration drift, and validates the
exact-passthrough path end to end)."""
import pytest

from repro.oracle import assert_equivalent


class TestOracleOnTpch:
    def test_group_by_aggregates(self, spark, tpch):
        sql = (
            "SELECT l_returnflag, count(*) AS cnt, "
            "round(sum(l_extendedprice), 2) AS rev "
            "FROM lineitem GROUP BY l_returnflag"
        )
        assert_equivalent(spark.sql(sql), sql, lineitem=tpch["lineitem"])

    def test_join(self, spark, tpch):
        sql = (
            "SELECT o_orderpriority, count(*) AS c "
            "FROM orders INNER JOIN lineitem ON o_orderkey = l_orderkey "
            "GROUP BY o_orderpriority"
        )
        assert_equivalent(
            spark.sql(sql), sql,
            orders=tpch["orders"], lineitem=tpch["lineitem"],
        )

    def test_filter(self, spark, tpch):
        sql = (
            "SELECT count(*) AS c FROM lineitem "
            "WHERE l_quantity < 24 AND l_discount BETWEEN 0.05 AND 0.07"
        )
        assert_equivalent(spark.sql(sql), sql, lineitem=tpch["lineitem"])

    def test_mismatch_detected(self, spark, tpch):
        wrong = spark.sql("SELECT count(*) + 1 AS c FROM lineitem")
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong, "SELECT count(*) AS c FROM lineitem",
                lineitem=tpch["lineitem"],
            )

    def test_exact_passthrough_path(self, spark, verdict, tpch):
        """VerdictContext.exact must be oracle-identical."""
        sql = (
            "SELECT l_linestatus, avg(l_quantity) AS aq "
            "FROM lineitem GROUP BY l_linestatus"
        )
        assert_equivalent(verdict.exact(sql), sql, lineitem=tpch["lineitem"])

    def test_rendered_exact_sql_semantics(self, spark, tpch):
        """parse -> exact_sql must preserve semantics (oracle-checked)."""
        from repro.core.parser import parse
        from repro.core.query import exact_sql

        user_sql = (
            "select l_returnflag, count(*) as c, sum(l_quantity) as q "
            "from lineitem where l_quantity < 30 group by l_returnflag"
        )
        rendered = exact_sql(parse(user_sql))
        assert_equivalent(
            spark.sql(rendered), user_sql, lineitem=tpch["lineitem"]
        )

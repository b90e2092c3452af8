"""Logical query model rendering (exact passthrough path)."""
from repro.core.parser import parse
from repro.core.query import (
    AggCall,
    AggQuery,
    JoinEdge,
    Relation,
    TableRef,
    agg_sql,
    exact_sql,
    relation_sql,
)


class TestAggSql:
    def test_count(self):
        assert agg_sql(AggCall("count", "*", "c")) == "count(*) AS c"

    def test_count_distinct(self):
        assert agg_sql(AggCall("count_distinct", "u", "d")) == (
            "count(DISTINCT u) AS d"
        )

    def test_quantile(self):
        assert agg_sql(AggCall("quantile", "x", "m", q=0.5)) == (
            "percentile(x, 0.5) AS m"
        )

    def test_var_stddev(self):
        assert "var_samp" in agg_sql(AggCall("var", "x", "v"))
        assert "stddev_samp" in agg_sql(AggCall("stddev", "x", "s"))


class TestRelationSql:
    def test_single(self):
        assert relation_sql(Relation(TableRef("t"))) == "t"

    def test_alias(self):
        assert relation_sql(Relation(TableRef("t", "a"))) == "t a"

    def test_join(self):
        rel = Relation(
            TableRef("a"), (JoinEdge(TableRef("b"), (("x", "y"),)),)
        )
        assert relation_sql(rel) == "a INNER JOIN b ON x = y"

    def test_name_remap(self):
        rel = Relation(
            TableRef("a"), (JoinEdge(TableRef("b"), (("x", "y"),)),)
        )
        out = relation_sql(rel, {"a": "a_sample"})
        assert out.startswith("a_sample ")


class TestExactSqlRoundtrip:
    """parse -> exact_sql must stay executable and semantics-preserving
    (validated against DuckDB in test_oracle; here: shape checks)."""

    def test_flat(self):
        q = parse(
            "select city, count(*) as c from t where x > 1 "
            "group by city order by c desc limit 3"
        )
        sql = exact_sql(q)
        assert sql == (
            "SELECT city, count(*) AS c FROM t WHERE x > 1 "
            "GROUP BY city ORDER BY c desc LIMIT 3"
        )

    def test_nested(self):
        q = parse(
            "select avg(s) as a from "
            "(select city, sum(x) as s from t group by city) d"
        )
        sql = exact_sql(q)
        assert "verdict_inner" in sql
        assert sql.count("SELECT") == 2

    def test_base_tables_through_nesting(self):
        q = parse(
            "select avg(s) as a from "
            "(select city, sum(x) as s from t group by city) d"
        )
        assert [t.name for t in q.base_tables()] == ["t"]

    def test_approximable_flags(self):
        q = parse("select max(x) as m, avg(x) as a from t")
        assert not q.aggs[0].approximable
        assert q.aggs[1].approximable

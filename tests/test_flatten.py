"""Section 2.2 comparison-subquery flattening."""
import itertools

import pytest

from repro.core.flatten import flatten
from repro.core.parser import parse
from repro.core.query import Relation

_SCHEMAS = {
    "orders": ["o_id", "city", "price", "o_orderpriority", "o_totalprice"],
    "t": ["x", "price", "city"],
}


def _flatten(q):
    counter = itertools.count()
    return flatten(
        q,
        columns_of=lambda t: _SCHEMAS[t],
        fresh_view=lambda kind: f"v_{kind}_{next(counter)}",
    )


class TestNoop:
    def test_no_subqueries(self):
        q = parse("select count(*) as c from t where x > 1")
        q2, derived = _flatten(q)
        assert q2 is q and derived == []


class TestUncorrelated:
    def test_scalar_view(self):
        q = parse(
            "select count(*) as c from t "
            "where price > (select avg(price) as ap from t)"
        )
        q2, derived = _flatten(q)
        assert len(derived) == 1 and derived[0].scalar
        assert q2.subquery_filters == ()
        assert f"(SELECT ap FROM {derived[0].view})" in q2.where

    def test_keeps_existing_predicate(self):
        q = parse(
            "select count(*) as c from t "
            "where x > 1 and price > (select avg(price) as ap from t)"
        )
        q2, _ = _flatten(q)
        assert "(x > 1)" in q2.where and "ap" in q2.where


class TestCorrelated:
    def test_becomes_join(self):
        q = parse(
            "select count(*) as c from orders o "
            "where price > (select avg(price) as ap from orders i "
            "where i.city = o.city)"
        )
        q2, derived = _flatten(q)
        assert len(derived) == 1 and not derived[0].scalar
        # the derived view is grouped by the correlation column
        assert derived[0].query.groups == ("city",)
        # the outer query joins to the view on that column
        assert isinstance(q2.source, Relation)
        join = q2.source.joins[-1]
        assert join.right.name == derived[0].view
        assert join.on[0][0] == "city"
        assert join.on[0][1].startswith("verdict_corr_")
        assert "price > ap" in q2.where

    def test_unknown_correlation_column(self):
        q = parse(
            "select count(*) as c from orders o "
            "where price > (select avg(price) as ap from orders i "
            "where i.nope = o.nada)"
        )
        from repro.core.parser import UnsupportedQueryError

        with pytest.raises(UnsupportedQueryError):
            _flatten(q)


class TestMixed:
    def test_two_subqueries(self):
        q = parse(
            "select count(*) as c from orders o "
            "where price > (select avg(price) as ap from orders) "
            "and o_totalprice > (select avg(o_totalprice) as at from orders)"
        )
        q2, derived = _flatten(q)
        assert len(derived) == 2
        assert all(d.scalar for d in derived)

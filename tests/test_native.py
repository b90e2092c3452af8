"""Native sketch approximations (Table 2 comparators) and the
estimators module units."""
import pytest

from repro.native.approx_aggs import (
    exact_count_distinct,
    exact_median,
    native_count_distinct,
    native_median,
)


class TestNativeApprox:
    def test_count_distinct_close(self, spark, tpch):
        nat = native_count_distinct(spark, "lineitem", "l_orderkey")
        ex = exact_count_distinct(spark, "lineitem", "l_orderkey")
        assert nat.value == pytest.approx(ex.value, rel=0.05)
        assert nat.seconds > 0 and ex.seconds > 0

    def test_median_close(self, spark, tpch):
        nat = native_median(spark, "lineitem", "l_extendedprice")
        ex = exact_median(spark, "lineitem", "l_extendedprice")
        assert nat.value == pytest.approx(ex.value, rel=0.05)


class TestApproxResultUnits:
    """Answer Rewriter helpers on a fabricated result."""

    @pytest.fixture
    def res(self, spark):
        from repro.core.estimators import ApproxResult
        from repro.core.rewriter import AggOutput

        df = spark.createDataFrame(
            [("a", 100.0, 5.0), ("b", 50.0, 10.0)], ["g", "x", "x_err"]
        )
        return ApproxResult(
            df=df,
            outputs=(AggOutput("x", "x_err"),),
            approx=True,
            group_cols=("g",),
        )

    def test_max_relative_error(self, res):
        assert res.max_relative_error() == pytest.approx(0.2)

    def test_violates(self, res):
        assert res.violates(0.9)  # requires <=10%, worst is 20%
        assert not res.violates(0.7)
        assert not res.violates(None)

    def test_answer_df(self, res):
        assert res.answer_df().columns == ["g", "x"]

    def test_exact_never_violates(self, spark):
        from repro.core.estimators import ApproxResult

        df = spark.createDataFrame([(1.0,)], ["x"])
        r = ApproxResult(df=df, outputs=(), approx=False)
        assert not r.violates(0.999)
        assert r.max_relative_error() is None

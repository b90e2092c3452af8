"""Lemma 1 / Section 3.2: staircase sampling probabilities."""
import math

import numpy as np
import pytest

from repro.core.staircase import (
    DEFAULT_DELTA,
    Step,
    erfcinv,
    f_m,
    g,
    staircase_case_sql,
    staircase_steps,
)


class TestErfcinv:
    @pytest.mark.parametrize("x", [-3.0, -1.5, -0.5, 0.0, 0.5, 1.5, 3.0])
    def test_roundtrip(self, x):
        assert erfcinv(math.erfc(x)) == pytest.approx(x, abs=1e-9)

    @pytest.mark.parametrize("y", [0.01, 0.05, 0.5, 1.0, 1.5, 1.95, 1.99])
    def test_inverse(self, y):
        assert math.erfc(erfcinv(y)) == pytest.approx(y, rel=1e-9)

    def test_median(self):
        assert erfcinv(1.0) == pytest.approx(0.0, abs=1e-10)

    @pytest.mark.parametrize("y", [0.0, 2.0, -1.0, 2.5])
    def test_domain(self, y):
        with pytest.raises(ValueError):
            erfcinv(y)

    def test_normal_quantile(self):
        # z for 95% two-sided via erfcinv must match the textbook 1.96
        z = math.sqrt(2) * erfcinv(0.05)
        assert z == pytest.approx(1.959964, abs=1e-4)


class TestG:
    @pytest.mark.parametrize("n", [100, 1000, 10000])
    def test_monotone_in_p(self, n):
        vals = [g(p, n) for p in np.linspace(0.05, 0.95, 10)]
        assert all(b > a for a, b in zip(vals, vals[1:]))

    def test_is_lower_quantile(self):
        # g(p; n) must sit below the binomial mean (delta-quantile)
        assert g(0.5, 1000) < 500

    def test_edges(self):
        assert g(0.0, 100) == 0.0
        assert g(1.0, 100) == 100.0


class TestFm:
    @pytest.mark.parametrize(
        "m,n", [(10, 100), (10, 1000), (50, 1000), (100, 10000), (10, 100000)]
    )
    def test_guarantee_by_simulation(self, m, n):
        """Bernoulli(n, f_m(n)) must yield >= m tuples w.p. >= 1-delta."""
        p = f_m(m, n)
        rng = np.random.default_rng(0)
        draws = rng.binomial(n, p, size=20000)
        fail = np.mean(draws < m)
        # delta=0.001 plus simulation noise; 1% is a conservative bound
        assert fail <= 0.01, f"failure rate {fail} for p={p}"

    @pytest.mark.parametrize("m,n", [(10, 100), (100, 1000)])
    def test_exceeds_naive_ratio(self, m, n):
        # the naive m/n ratio fails ~half the time; f_m must exceed it
        assert f_m(m, n) > m / n

    def test_decreasing_in_n(self):
        ps = [f_m(10, n) for n in (100, 1000, 10000, 100000)]
        assert all(b < a for a, b in zip(ps, ps[1:]))

    def test_small_stratum_clamped(self):
        assert f_m(10, 5) == 1.0
        assert f_m(10, 10) == 1.0

    def test_zero(self):
        assert f_m(0, 100) == 0.0
        assert f_m(10, 0) == 0.0

    def test_inverse_consistency(self):
        p = f_m(10, 1000)
        assert g(p, 1000) == pytest.approx(10, abs=0.5)


class TestStaircase:
    def test_thresholds_decreasing_probs_increasing(self):
        steps = staircase_steps(10, 100000)
        ts = [s.threshold for s in steps]
        ps = [s.prob for s in steps]
        assert all(a > b for a, b in zip(ts, ts[1:]))
        assert all(a <= b + 1e-12 for a, b in zip(ps, ps[1:]))

    @pytest.mark.parametrize("n", [15, 47, 312, 2048, 50000, 99999])
    def test_upper_bounds_fm(self, n):
        """Every stratum size must get a prob >= its exact f_m(n)."""
        steps = staircase_steps(10, 100000)
        prob = next(s.prob for s in steps if n >= s.threshold)
        assert prob >= f_m(10, n) - 1e-9

    def test_small_max(self):
        assert staircase_steps(10, 5) == [Step(0, 1.0)]

    def test_case_sql_shape(self):
        sql = staircase_case_sql(staircase_steps(10, 10000))
        assert sql.startswith("(CASE WHEN")
        assert sql.endswith("ELSE 1.0 END)")
        assert "strata_size >=" in sql

    def test_case_sql_custom_column(self):
        sql = staircase_case_sql([Step(100, 0.5), Step(0, 1.0)], "t2.sz")
        assert "t2.sz >= 100" in sql

    def test_case_sql_evaluates(self):
        """The CASE expression must reproduce the python staircase."""
        import duckdb

        steps = staircase_steps(10, 10000)
        case = staircase_case_sql(steps)
        con = duckdb.connect()
        for n in (20, 100, 999, 5000, 10000):
            got = con.execute(
                f"SELECT {case} FROM (SELECT {n} AS strata_size)"
            ).fetchone()[0]
            want = next(s.prob for s in steps if n >= s.threshold)
            assert float(got) == pytest.approx(want, abs=1e-9)
        con.close()

    def test_delta_tightens_probability(self):
        loose = f_m(10, 1000, delta=0.1)
        tight = f_m(10, 1000, delta=DEFAULT_DELTA)
        assert tight > loose

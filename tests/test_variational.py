"""Section 4.2 / 5.1 variational-subsampling primitives."""
import math

import pytest

from repro.core.variational import (
    b_for,
    h,
    join_sid_expr,
    sid_hash_expr,
    sid_rand_expr,
)


class TestBFor:
    @pytest.mark.parametrize("n", [1, 10, 100, 1000, 10000, 123456, 10**6, 10**8])
    def test_perfect_square(self, n):
        b = b_for(n)
        s = math.isqrt(b)
        assert s * s == b
        assert b >= 4

    @pytest.mark.parametrize("n", [10**4, 10**6, 10**8])
    def test_near_sqrt_n(self, n):
        # within a factor of 2 of the paper's default b = sqrt(n)
        assert 0.5 <= b_for(n) / math.sqrt(n) <= 2.0

    def test_monotone_nondecreasing(self):
        bs = [b_for(n) for n in (100, 1000, 10000, 100000)]
        assert all(a <= b for a, b in zip(bs, bs[1:]))


class TestH:
    """Theorem 4: h(i, j) must partition I x J into b product blocks."""

    @pytest.mark.parametrize("b", [4, 9, 16, 25, 100])
    def test_partitions_evenly(self, b):
        from collections import Counter

        counts = Counter(
            h(i, j, b) for i in range(1, b + 1) for j in range(1, b + 1)
        )
        assert set(counts) == set(range(1, b + 1))
        assert all(c == b for c in counts.values())

    @pytest.mark.parametrize("b", [4, 16])
    def test_blocks_are_products(self, b):
        """Each preimage h^-1(k) must be a cartesian product I_k x J_k."""
        sq = math.isqrt(b)
        for k in range(1, b + 1):
            cell = [
                (i, j)
                for i in range(1, b + 1)
                for j in range(1, b + 1)
                if h(i, j, b) == k
            ]
            is_ = sorted({i for i, _ in cell})
            js = sorted({j for _, j in cell})
            assert len(is_) == sq and len(js) == sq
            assert sorted(cell) == [(i, j) for i in is_ for j in js]

    def test_matches_paper_formula(self):
        # h(i,j) = floor((i-1)/sqrt(b))*sqrt(b) + floor((j-1)/sqrt(b)) + 1
        assert h(1, 1, 100) == 1
        assert h(10, 10, 100) == 1  # both still in the first sqrt(b)-block
        assert h(100, 100, 100) == 100
        assert h(11, 1, 100) == 11
        assert h(1, 11, 100) == 2

    def test_requires_square(self):
        with pytest.raises(ValueError):
            h(1, 1, 10)


class TestSidExprs:
    def test_rand_expr_range(self):
        import duckdb

        expr = sid_rand_expr(16).replace("rand()", "random()")
        con = duckdb.connect()
        vals = [
            con.execute(f"SELECT {expr}").fetchone()[0] for _ in range(200)
        ]
        con.close()
        assert all(1 <= v <= 16 for v in vals)
        assert len(set(vals)) > 4  # actually random

    def test_rand_expr_seed(self):
        assert "rand(7)" in sid_rand_expr(16, seed=7)

    def test_hash_expr_mentions_cols(self):
        e = sid_hash_expr(("user_id",), 16)
        assert "hash(user_id" in e and "16" in e

    def test_join_sid_expr_matches_h(self):
        import duckdb

        b = 16
        expr = join_sid_expr("i", "j", b)
        con = duckdb.connect()
        for i in (1, 5, 16):
            for j in (1, 8, 16):
                got = con.execute(
                    f"SELECT {expr} FROM (SELECT {i} AS i, {j} AS j)"
                ).fetchone()[0]
                assert got == h(i, j, b)
        con.close()

    def test_join_sid_expr_requires_square(self):
        with pytest.raises(ValueError):
            join_sid_expr("a", "b", 10)


class TestSidOnSpark:
    def test_rand_sid_distribution(self, spark):
        """sids must be ~uniform over 1..b on real data."""
        from repro import synth_data

        synth_data.uniform_keys(spark, n=20000, n_keys=100).createOrReplaceTempView(
            "vs_keys"
        )
        b = 16
        rows = spark.sql(
            f"SELECT {sid_rand_expr(b, seed=1)} AS sid, count(*) AS c "
            "FROM vs_keys GROUP BY sid"
        ).collect()
        sids = {r["sid"] for r in rows}
        assert sids == set(range(1, b + 1))
        counts = [r["c"] for r in rows]
        mean = sum(counts) / len(counts)
        assert all(abs(c - mean) < 6 * math.sqrt(mean) for c in counts)

    def test_hash_sid_partitions_domain(self, spark):
        """All tuples of one key value must share a sid (count-distinct
        needs domain-partitioned subsamples)."""
        from repro import synth_data

        synth_data.uniform_keys(spark, n=5000, n_keys=50).createOrReplaceTempView(
            "vs_keys2"
        )
        b = 9
        rows = spark.sql(
            f"SELECT k, count(DISTINCT {sid_hash_expr(('k',), b)}) AS nsid "
            "FROM vs_keys2 GROUP BY k"
        ).collect()
        assert all(r["nsid"] == 1 for r in rows)

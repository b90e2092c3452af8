"""Consolidated bootstrap [10] expressed in SQL (the §6.4 baseline).

The paper's cost argument: bootstrap must materialise/aggregate b
resamples of the *full* sample — O(b·n) — versus O(n) for variational
subsampling. This module reproduces the same cost structure without
UDAs: a LATERAL VIEW explode fans every sample tuple out b times, a
per-(tuple, resample) Poisson(1) multiplicity (inverse-CDF on rand(),
the standard with-replacement approximation for large n) weights it,
and one grouped aggregation computes all b resample estimates. The
percentile-of-deviations rule then yields the bootstrap CI.
"""
from __future__ import annotations

import math

from ..core.query import AggCall

# P(X <= k) for X ~ Poisson(1), k = 0..7 — inverse-CDF thresholds
_POISSON1_CDF = [
    0.36787944, 0.73575888, 0.91969860, 0.98101184,
    0.99634015, 0.99940582, 0.99991676, 0.99998975,
]


def poisson1_case_sql(rand_col: str = "verdict_r") -> str:
    clauses = " ".join(
        f"WHEN {rand_col} < {c!r} THEN {k}" for k, c in enumerate(_POISSON1_CDF)
    )
    return f"(CASE {clauses} ELSE 8 END)"


def consolidated_bootstrap_sql(
    sample_view: str,
    agg: AggCall,
    groups: tuple[str, ...] = (),
    where: str | None = None,
    *,
    b: int = 100,
    confidence: float = 0.95,
    seed: int | None = None,
) -> str:
    """SQL producing ``groups..., <alias>, <alias>_lo, <alias>_hi``.

    Supports count/sum/avg. The O(b·n) resample fan-out is the measured
    overhead in the Figure 7 experiment.
    """
    e = agg.expr if agg.expr not in ("*", "") else "1"
    rand = f"rand({seed})" if seed is not None else "rand()"
    alpha = 1.0 - confidence
    mult = poisson1_case_sql()

    fanout = (
        f"SELECT s.*, vb.rsid, {rand} AS verdict_r "
        f"FROM {sample_view} s "
        f"LATERAL VIEW explode(sequence(1, {b})) vb AS rsid"
    )
    if where:
        fanout = f"SELECT * FROM ({fanout}) verdict_f WHERE {where}"

    if agg.fn in ("count", "sum"):
        est = f"sum({mult} * ({e}) / verdict_prob)"
    elif agg.fn == "avg":
        est = f"sum({mult} * ({e})) / nullif(sum({mult}), 0)"
    else:
        raise ValueError(f"bootstrap baseline supports count/sum/avg, not {agg.fn!r}")

    per_resample = (
        f"SELECT {', '.join(list(groups) + ['rsid'])}, {est} AS verdict_est "
        f"FROM ({fanout}) verdict_bs "
        f"GROUP BY {', '.join(list(groups) + ['rsid'])}"
    )
    sel = list(groups) + [
        f"avg(verdict_est) AS {agg.alias}",
        f"percentile(verdict_est, {alpha / 2!r}) AS {agg.alias}_lo",
        f"percentile(verdict_est, {1.0 - alpha / 2!r}) AS {agg.alias}_hi",
    ]
    sql = f"SELECT {', '.join(sel)} FROM ({per_resample}) verdict_bq"
    if groups:
        sql += f" GROUP BY {', '.join(groups)}"
    return sql


def expected_fanout_rows(n: int, b: int) -> int:
    """The O(b·n) row count the engine must process (for tests)."""
    return n * b


def poisson1_pmf(k: int) -> float:
    """Reference Poisson(1) pmf (tests validate the CASE thresholds)."""
    return math.exp(-1.0) / math.factorial(k)

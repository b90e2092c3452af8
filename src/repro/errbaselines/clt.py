"""Closed-form CLT error estimation (the Aqua-style baseline of §6.5).

One SQL statement over a sample view computes both the point estimate
and a normal-approximation confidence half-width. Valid for independent
tuples (uniform samples); this restriction — no non-PK-FK joins, no
UDAs — is exactly why the paper replaces closed forms with variational
subsampling.
"""
from __future__ import annotations

from ..core.query import AggCall
from ..core.rewriter import z_value


def clt_sql(
    sample_view: str,
    agg: AggCall,
    groups: tuple[str, ...] = (),
    where: str | None = None,
    *,
    confidence: float = 0.95,
) -> str:
    """SQL producing ``groups..., <alias>, <alias>_err`` via closed forms.

    count/sum use the Horvitz–Thompson variance for Bernoulli sampling,
    ``Var = sum(x_i^2 (1-p)/p^2)``; avg uses ``sd/sqrt(n)``.
    """
    z = z_value(confidence)
    e = agg.expr if agg.expr not in ("*", "") else "1"
    p = "verdict_prob"
    if agg.fn == "count":
        est = f"sum(1.0/{p})"
        var = f"sum((1.0 - {p}) / ({p} * {p}))"
        err = f"sqrt({var}) * {z!r}"
    elif agg.fn == "sum":
        est = f"sum(({e})/{p})"
        var = f"sum((({e}) * ({e})) * (1.0 - {p}) / ({p} * {p}))"
        err = f"sqrt({var}) * {z!r}"
    elif agg.fn == "avg":
        est = f"avg({e})"
        err = f"(stddev_samp({e}) / sqrt(count(*))) * {z!r}"
    else:
        raise ValueError(f"closed-form CLT not available for {agg.fn!r}")
    select = list(groups) + [f"{est} AS {agg.alias}", f"{err} AS {agg.alias}_err"]
    sql = f"SELECT {', '.join(select)} FROM {sample_view}"
    if where:
        sql += f" WHERE {where}"
    if groups:
        sql += f" GROUP BY {', '.join(groups)}"
    return sql

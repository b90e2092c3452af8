"""Traditional subsampling expressed in SQL (Query 1 of the paper).

Each of the b subsamples is an independent ~n_s-subset of the sample,
so tuples may belong to several subsamples — materialising the
``orders_subsamples`` fan-out costs O(b·n), which is exactly the
overhead Figure 7 charges against traditional subsampling. (The paper's
Query 1 draws each subsample without replacement at exactly n_s; the
standard Bernoulli(n_s/n) per-(tuple, subsample) approximation keeps
the construction in one SELECT while preserving the O(b·n) cost and the
statistics — subsample sizes concentrate at n_s.)
"""
from __future__ import annotations

from ..core.query import AggCall
from ..core.rewriter import z_value


def traditional_subsampling_sql(
    sample_view: str,
    agg: AggCall,
    groups: tuple[str, ...] = (),
    where: str | None = None,
    *,
    n: int,
    n_s: int | None = None,
    b: int = 100,
    confidence: float = 0.95,
    seed: int | None = None,
) -> str:
    """SQL producing ``groups..., <alias>, <alias>_err``.

    ``n`` is the sample row count (from the catalog); ``n_s`` defaults
    to sqrt(n). The inner fan-out keeps a (tuple, sid) pair with
    probability n_s/n, then per-subsample estimates are aggregated and
    the subsampling CI ``stddev(est_i) * sqrt(n_s/n) * z`` is applied.
    """
    e = agg.expr if agg.expr not in ("*", "") else "1"
    if n_s is None:
        n_s = max(2, int(round(n**0.5)))
    keep = n_s / n
    rand = f"rand({seed})" if seed is not None else "rand()"
    z = z_value(confidence)

    fanout = (
        f"SELECT s.*, vb.sid FROM {sample_view} s "
        f"LATERAL VIEW explode(sequence(1, {b})) vb AS sid "
        f"WHERE {rand} < {keep!r}"
    )
    if where:
        fanout = f"SELECT * FROM ({fanout}) verdict_f WHERE {where}"

    if agg.fn in ("count", "sum"):
        # scale the subsample HT total up by n/n_s to full-sample scale
        est = f"sum(({e}) / verdict_prob) * {n / n_s!r}"
        full = f"sum(({e}) / verdict_prob)"
    elif agg.fn == "avg":
        est = f"avg({e})"
        full = f"avg({e})"
    else:
        raise ValueError(f"supports count/sum/avg, not {agg.fn!r}")

    per_sub = (
        f"SELECT {', '.join(list(groups) + ['sid'])}, {est} AS verdict_est "
        f"FROM ({fanout}) verdict_ss "
        f"GROUP BY {', '.join(list(groups) + ['sid'])}"
    )
    err = f"(stddev_samp(verdict_est) * sqrt({keep!r})) * {z!r}"
    sel = list(groups) + [
        f"avg(verdict_est) AS {agg.alias}",
        f"{err} AS {agg.alias}_err",
    ]
    sql = f"SELECT {', '.join(sel)} FROM ({per_sub}) verdict_sq"
    if groups:
        sql += f" GROUP BY {', '.join(groups)}"
    # the answer itself still comes from the full sample; callers that
    # need the exact-sample point estimate run `full` separately:
    _ = full
    return sql

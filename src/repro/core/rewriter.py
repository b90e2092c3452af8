"""AQP Rewriter + Syntax Changer (Fig. 1b): logical query x sample plan
-> one rewritten SQL string implementing the Appendix G template.

The rewritten query has three layers, all plain SQL:

1. **variational source** (``vt``): the FROM clause with base tables
   replaced by sample views; adds ``verdict_prob`` (per-tuple inclusion
   probability — a product across independently sampled relations, or
   the minimum across equi-joined universe samples) and ``verdict_sid``
   (subsample id — random per tuple, hash-of-value for count-distinct,
   composed with Theorem 4's h(i, j) when two variational tables join);
2. **inner aggregate**: ``GROUP BY (groups, sid)`` computing, per
   subsample, its size, raw Horvitz–Thompson sums, and the
   window-scaled unbiased estimate of the true answer;
3. **outer combiner**: the full-sample HT answer plus the Theorem 2
   error bound ``stddev(est_i) * sqrt(avg(sub_size)/sum(sub_size)) * z``.

A ``Dialect`` seam marks where Impala/Redshift syntax adapters would
attach (the paper's thin per-engine drivers); only the Spark dialect is
implemented because Spark is the only engine in this environment.
"""
from __future__ import annotations

import math
from dataclasses import dataclass
from typing import Callable

from .catalog import HASHED, SampleMeta
from .parser import UnsupportedQueryError
from .query import AggCall, AggQuery, Relation, agg_sql
from .planner import PlanEntry
from .staircase import erfcinv
from .variational import (
    b_for,
    join_sid_expr,
    sid_hash_expr,
    sid_rand_expr,
)


class Dialect:
    """Engine-specific SQL syntax (the paper's Syntax Changer).

    Spark is the only backend available here; Impala/Redshift adapters
    would override the quoting / function-name hooks below.
    """

    name = "spark"

    def percentile(self, expr: str, q: float) -> str:
        return f"percentile({expr}, {q})"


SPARK = Dialect()


def z_value(confidence: float) -> float:
    """Two-sided normal quantile: P(|Z| <= z) = confidence."""
    if not 0.0 < confidence < 1.0:
        raise ValueError(f"confidence must be in (0,1), got {confidence}")
    return math.sqrt(2.0) * erfcinv(1.0 - confidence)


@dataclass(frozen=True)
class AggOutput:
    """One output column pair of a rewritten query."""

    alias: str
    err_alias: str | None


@dataclass(frozen=True)
class Rewritten:
    sql: str
    outputs: tuple[AggOutput, ...]
    b: int


def _plain(col: str) -> str:
    """Strip alias qualification: after the vt layer columns are unique."""
    return col.split(".")[-1]


# --------------------------------------------------------------------------
# variational source construction
# --------------------------------------------------------------------------


def _vt_sql(
    rel: Relation,
    assignment: dict[str, SampleMeta | None],
    where: str | None,
    b: int,
    *,
    columns_of: Callable[[str], list[str]],
    seed: int | None,
    hash_sid_cols: tuple[str, ...] | None = None,
) -> str:
    """SQL for the variational table of the (joined) FROM clause.

    ``hash_sid_cols``: when set (count-distinct entries), per-tuple sids
    are derived by hashing these columns so subsamples partition the
    value domain instead of the tuple space.
    """
    sub_sqls: list[str] = []
    sid_cols: list[str] = []
    hashed_sid_cols: list[str] = []
    prob_cols: list[str] = []
    hashed_prob_cols: list[str] = []
    for i, tref in enumerate(rel.tables):
        meta = assignment.get(tref.name)
        cols = ", ".join(columns_of(tref.name))
        ident = tref.ident
        if meta is None:
            sub_sqls.append(f"(SELECT {cols} FROM {tref.name}) {ident}")
            continue
        if meta.stype == HASHED:
            sid = sid_hash_expr(meta.columns, b)
            sub_sqls.append(
                f"(SELECT {cols}, verdict_prob AS verdict_prob_{i}, "
                f"{sid} AS verdict_sid_{i} FROM {meta.view}) {ident}"
            )
            hashed_sid_cols.append(f"verdict_sid_{i}")
            hashed_prob_cols.append(f"verdict_prob_{i}")
        else:
            if hash_sid_cols:
                sid = sid_hash_expr(hash_sid_cols, b)
            else:
                sid = sid_rand_expr(b, None if seed is None else seed + i)
            sub_sqls.append(
                f"(SELECT {cols}, verdict_prob AS verdict_prob_{i}, "
                f"{sid} AS verdict_sid_{i} FROM {meta.view}) {ident}"
            )
            sid_cols.append(f"verdict_sid_{i}")
            prob_cols.append(f"verdict_prob_{i}")

    # FROM clause with the original join structure
    from_parts = [sub_sqls[0]]
    for edge, sub in zip(rel.joins, sub_sqls[1:]):
        cond = " AND ".join(f"{l} = {r}" for l, r in edge.on)
        from_parts.append(f"INNER JOIN {sub} ON {cond}")
    from_sql = " ".join(from_parts)

    # probability: product of independent samples; equi-joined universe
    # samples survive together, so they contribute min(tau_i) once.
    prob_terms = [f"{c}" for c in prob_cols]
    if len(hashed_prob_cols) == 1:
        prob_terms.append(hashed_prob_cols[0])
    elif len(hashed_prob_cols) > 1:
        prob_terms.append(f"least({', '.join(hashed_prob_cols)})")
    prob_expr = " * ".join(prob_terms) if prob_terms else "CAST(1.0 AS DOUBLE)"

    # sid: equi-joined universe samples agree on sid (same hashed value),
    # so the group contributes a single sid; remaining sids fold through
    # h(i, j). No sampled relation at all means no sid (exact path —
    # callers never reach here in that case).
    sids = list(sid_cols)
    if hashed_sid_cols:
        sids.append(hashed_sid_cols[0])
    if not sids:
        raise UnsupportedQueryError("variational table without any sample")
    sid_expr = sids[0]
    for s in sids[1:]:
        sid_expr = join_sid_expr(sid_expr, s, b)

    all_cols = ", ".join(
        c for t in rel.tables for c in columns_of(t.name)
    )
    sql = (
        f"SELECT {all_cols}, {prob_expr} AS verdict_prob, "
        f"{sid_expr} AS verdict_sid FROM {from_sql}"
    )
    if where:
        sql += f" WHERE {where}"
    return sql


# --------------------------------------------------------------------------
# aggregate templates
# --------------------------------------------------------------------------


def _scale(raw: str, b: int) -> str:
    """Per-subsample estimate of a *total* (count/sum): ``b * raw``.

    Each subsample holds an expected 1/b of the sample, so scaling its
    Horvitz–Thompson sum by b makes it unbiased for the full answer,
    with variance b times the full-sample estimator's variance — which
    is precisely what the Theorem 2 ``sqrt(n_s/n)`` correction undoes.

    Note: the paper's printed Query 9 scales by a window over the group
    (``mean(1/p) * group total``); for a constant-probability sample
    that expression is *identical across subsamples*, so its stddev
    degenerates to zero (the printed query also references an undefined
    ``count_order`` column — an editing artifact). The fixed-b scaling
    here is the form Theorem 2's proof actually analyses (subsample
    aggregates of disjoint iid blocks).
    """
    return f"(({raw}) * {b})"


@dataclass
class _AggPieces:
    inner_cols: list[str]
    final: str
    err: str


def _pieces(
    agg: AggCall,
    k: int,
    *,
    b: int,
    domain_tau: float | None,
    z: float,
    dialect: Dialect,
) -> _AggPieces:
    e = agg.expr if agg.expr not in ("*", "") else "1"
    ht_cnt = "sum(1.0 / verdict_prob)"
    ht_sum = f"sum(({e}) / verdict_prob)"
    generic_err = (
        f"(stddev_samp(est_{k}) * sqrt(avg(verdict_sub_size)) "
        f"/ sqrt(sum(verdict_sub_size))) * {z!r} AS {agg.alias}_err"
    )
    if agg.fn == "count":
        return _AggPieces(
            [f"{ht_cnt} AS raw_{k}", f"{_scale(ht_cnt, b)} AS est_{k}"],
            f"sum(raw_{k}) AS {agg.alias}",
            generic_err,
        )
    if agg.fn == "sum":
        return _AggPieces(
            [f"{ht_sum} AS raw_{k}", f"{_scale(ht_sum, b)} AS est_{k}"],
            f"sum(raw_{k}) AS {agg.alias}",
            generic_err,
        )
    if agg.fn == "avg":
        return _AggPieces(
            [
                f"{ht_sum} AS num_{k}",
                f"{ht_cnt} AS den_{k}",
                f"({ht_sum}) / ({ht_cnt}) AS est_{k}",
            ],
            f"sum(num_{k}) / sum(den_{k}) AS {agg.alias}",
            generic_err,
        )
    if agg.fn in ("var", "stddev"):
        fn = "var_samp" if agg.fn == "var" else "stddev_samp"
        return _AggPieces(
            [f"{fn}({e}) AS est_{k}"],
            f"sum(est_{k} * verdict_sub_size) / sum(verdict_sub_size) "
            f"AS {agg.alias}",
            generic_err,
        )
    if agg.fn == "quantile":
        p = dialect.percentile(e, agg.q if agg.q is not None else 0.5)
        return _AggPieces(
            [f"{p} AS est_{k}"],
            f"sum(est_{k} * verdict_sub_size) / sum(verdict_sub_size) "
            f"AS {agg.alias}",
            generic_err,
        )
    if agg.fn == "count_distinct":
        if domain_tau is None or domain_tau <= 0:
            raise UnsupportedQueryError(
                "count-distinct needs a hashed sample on the counted column"
            )
        # subsamples partition the sampled value domain: each holds a
        # tau/b slice, so d_i * b / tau estimates the full distinct count
        # independently; the plain mean recovers distinct(sample)/tau.
        return _AggPieces(
            [f"count(DISTINCT {e}) * {b} / {domain_tau!r} AS est_{k}"],
            f"avg(est_{k}) AS {agg.alias}",
            f"(stddev_samp(est_{k}) / sqrt(count(*))) * {z!r} "
            f"AS {agg.alias}_err",
        )
    raise UnsupportedQueryError(f"cannot approximate aggregate {agg.fn!r}")


def _substitute_having(having: str, aggs: tuple[AggCall, ...]) -> str:
    """Replace raw aggregate expressions in HAVING with their aliases
    so the clause can run against the rewritten (combined) output."""
    from .parser import tokenize

    out = having
    for a in aggs:
        rendered = agg_sql(a)
        raw = rendered[: rendered.upper().rfind(" AS ")]
        out = out.replace(raw, a.alias)
        # the parser re-emits expressions space-joined ("count ( * )");
        # normalise the rendered form the same way so it matches
        out = out.replace(" ".join(tokenize(raw)), a.alias)
    return out


# --------------------------------------------------------------------------
# flat queries
# --------------------------------------------------------------------------


def rewrite_flat(
    query: AggQuery,
    entry: PlanEntry,
    *,
    columns_of: Callable[[str], list[str]],
    confidence: float = 0.95,
    seed: int | None = None,
    b: int | None = None,
    dialect: Dialect = SPARK,
) -> Rewritten:
    """Rewrite a flat aggregate query per the Appendix G template."""
    if not isinstance(query.source, Relation):
        raise UnsupportedQueryError("rewrite_flat requires a flat query")
    assignment = entry.tables
    sampled = [m for m in assignment.values() if m is not None]
    if not sampled:
        raise UnsupportedQueryError("no sampled relation in plan entry")
    if b is None:
        b = b_for(min(m.rows for m in sampled))
    z = z_value(confidence)

    distinct_aggs = [a for a in entry.aggs if a.fn == "count_distinct"]
    hash_sid_cols: tuple[str, ...] | None = None
    domain_tau: float | None = None
    if distinct_aggs:
        col = _plain(distinct_aggs[0].expr)
        hash_sid_cols = (col,)
        for m in sampled:
            if m.stype == HASHED and tuple(m.columns) == (col,):
                domain_tau = m.ratio
                break

    vt = _vt_sql(
        query.source,
        assignment,
        query.where,
        b,
        columns_of=columns_of,
        seed=seed,
        hash_sid_cols=hash_sid_cols,
    )

    groups = tuple(_plain(g) for g in query.groups)
    pieces = [
        _pieces(a, k, b=b, domain_tau=domain_tau, z=z, dialect=dialect)
        for k, a in enumerate(entry.aggs)
    ]

    inner_select = list(groups) + ["verdict_sid", "count(*) AS verdict_sub_size"]
    for p in pieces:
        inner_select.extend(p.inner_cols)
    group_by = ", ".join(list(groups) + ["verdict_sid"])
    inner_sql = (
        f"SELECT {', '.join(inner_select)} FROM ({vt}) verdict_vt "
        f"GROUP BY {group_by}"
    )

    outer_select = list(groups) + [p.final for p in pieces] + [p.err for p in pieces]
    outer_sql = f"SELECT {', '.join(outer_select)} FROM ({inner_sql}) verdict_sub"
    if groups:
        outer_sql += f" GROUP BY {', '.join(groups)}"

    if query.having:
        hv = _substitute_having(query.having, entry.aggs)
        outer_sql = f"SELECT * FROM ({outer_sql}) verdict_hv WHERE {hv}"
    if query.order_by:
        outer_sql += f" ORDER BY {query.order_by}"
    if query.limit is not None:
        outer_sql += f" LIMIT {query.limit}"

    outputs = tuple(AggOutput(a.alias, f"{a.alias}_err") for a in entry.aggs)
    return Rewritten(sql=outer_sql, outputs=outputs, b=b)


# --------------------------------------------------------------------------
# nested queries (Section 5.2, Query 5 shape)
# --------------------------------------------------------------------------


def rewrite_nested(
    query: AggQuery,
    entry: PlanEntry,
    *,
    columns_of: Callable[[str], list[str]],
    confidence: float = 0.95,
    seed: int | None = None,
    b: int | None = None,
    dialect: Dialect = SPARK,
) -> Rewritten:
    """Rewrite an aggregate-over-aggregate query as one linear pipeline.

    Query 7's variational derived table (inner GROUP BY gains ``sid``)
    feeds per-subsample outer estimates. Each per-sid estimate is an
    unbiased estimate of the final answer, so — exactly as in the flat
    template for scale-free statistics — the answer is their
    subsample-size-weighted mean and the error is the Theorem 2 scaled
    stddev. One chain vt -> t_v -> per-sid -> combine; no second pass
    over the sample (Spark inlines CTEs, so a separate sid-free answer
    path would re-execute the variational source).
    """
    inner = query.source
    if not isinstance(inner, AggQuery) or not isinstance(inner.source, Relation):
        raise UnsupportedQueryError("rewrite_nested requires one nesting level")
    assignment = entry.tables
    sampled = [m for m in assignment.values() if m is not None]
    if not sampled:
        raise UnsupportedQueryError("no sampled relation in plan entry")
    if b is None:
        b = b_for(min(m.rows for m in sampled))
    z = z_value(confidence)

    vt = _vt_sql(
        inner.source, assignment, inner.where, b, columns_of=columns_of, seed=seed
    )
    g_in = tuple(_plain(g) for g in inner.groups)

    def inner_est(a: AggCall) -> str:
        e = a.expr if a.expr not in ("*", "") else "1"
        ht_cnt = "sum(1.0 / verdict_prob)"
        ht_sum = f"sum(({e}) / verdict_prob)"
        if a.fn == "count":
            return f"{_scale(ht_cnt, b)} AS {a.alias}"
        if a.fn == "sum":
            return f"{_scale(ht_sum, b)} AS {a.alias}"
        if a.fn == "avg":
            return f"({ht_sum}) / ({ht_cnt}) AS {a.alias}"
        raise UnsupportedQueryError(
            f"inner aggregate {a.fn!r} unsupported in nested queries"
        )

    # Query 7: variational table of the derived table t
    tv_select = (
        list(g_in)
        + ["verdict_sid", "count(*) AS verdict_tuples"]
        + [inner_est(a) for a in inner.aggs]
    )
    tv_sql = (
        f"SELECT {', '.join(tv_select)} FROM ({vt}) verdict_vt "
        f"GROUP BY {', '.join(list(g_in) + ['verdict_sid'])}"
    )

    g_out = tuple(_plain(g) for g in query.groups)

    def outer_agg(a: AggCall) -> str:
        e = a.expr if a.expr not in ("*", "") else "1"
        if a.fn == "count":
            return "count(*)"
        if a.fn in ("sum", "avg", "min", "max"):
            return f"{a.fn}({e})"
        if a.fn in ("var", "stddev"):
            return f"{'var_samp' if a.fn == 'var' else 'stddev_samp'}({e})"
        if a.fn == "quantile":
            return dialect.percentile(e, a.q if a.q is not None else 0.5)
        raise UnsupportedQueryError(f"outer aggregate {a.fn!r} unsupported")

    where_out = f" WHERE {query.where}" if query.where else ""
    # per-subsample outer estimates over t_v
    sub_select = (
        list(g_out)
        + ["verdict_sid", "sum(verdict_tuples) AS verdict_sub_size"]
        + [f"{outer_agg(a)} AS est_{k}" for k, a in enumerate(query.aggs)]
    )
    sub_sql = (
        f"SELECT {', '.join(sub_select)} FROM ({tv_sql}) verdict_tv{where_out} "
        f"GROUP BY {', '.join(list(g_out) + ['verdict_sid'])}"
    )
    final_select = list(g_out)
    for k, a in enumerate(query.aggs):
        final_select.append(
            f"sum(est_{k} * verdict_sub_size) / sum(verdict_sub_size) "
            f"AS {a.alias}"
        )
    for k, a in enumerate(query.aggs):
        final_select.append(
            f"(stddev_samp(est_{k}) * sqrt(avg(verdict_sub_size)) "
            f"/ sqrt(sum(verdict_sub_size))) * {z!r} AS {a.alias}_err"
        )
    sql = f"SELECT {', '.join(final_select)} FROM ({sub_sql}) verdict_sub"
    if g_out:
        sql += f" GROUP BY {', '.join(g_out)}"
    if query.order_by:
        sql += f" ORDER BY {query.order_by}"
    if query.limit is not None:
        sql += f" LIMIT {query.limit}"
    outputs = tuple(AggOutput(a.alias, f"{a.alias}_err") for a in query.aggs)
    return Rewritten(sql=sql, outputs=outputs, b=b)

"""Comparison-subquery flattening (Section 2.2).

``WHERE expr op (SELECT agg(col) FROM t [WHERE t.c = outer.c])`` is
turned into a join with the aggregated derived table (correlated case)
or into a scalar-subquery predicate over a one-row derived view
(uncorrelated case). The derived table is materialised as its own view
by the caller — the paper splices it inline as a derived table in FROM;
materialising first is semantically identical and keeps the final
rewritten query inside the Relation model (base tables + equi-joins).
Either way only standard SELECT statements reach the engine.
"""
from __future__ import annotations

from dataclasses import dataclass, replace
from typing import Callable

from .parser import UnsupportedQueryError
from .query import AggQuery, JoinEdge, Relation, TableRef


@dataclass(frozen=True)
class DerivedView:
    """A derived table the caller must register before executing the
    flattened query. ``query`` may itself be answered approximately.

    ``rename`` maps the correlation column to a fresh name so the
    derived view never collides with the outer table's columns (the
    rewriter relies on globally-unique column names)."""

    view: str
    query: AggQuery
    scalar: bool  # True: one-row aggregate used via a scalar subquery
    rename: tuple[str, str] | None = None


def flatten(
    q: AggQuery,
    *,
    columns_of: Callable[[str], list[str]],
    fresh_view: Callable[[str], str],
) -> tuple[AggQuery, list[DerivedView]]:
    """Remove ``q.subquery_filters`` by flattening into joins/views.

    Returns the rewritten query (no subquery filters left) and the list
    of derived views to register. ``columns_of`` resolves which side of
    a correlated equality belongs to the subquery's table.
    """
    if not q.subquery_filters:
        return q, []
    if not isinstance(q.source, Relation):
        raise UnsupportedQueryError("subquery filter inside nested query")
    derived: list[DerivedView] = []
    joins = list(q.source.joins)
    preds: list[str] = [q.where] if q.where else []
    for cs in q.subquery_filters:
        inner = cs.subquery
        alias = inner.aggs[0].alias
        if cs.corr is None:
            view = fresh_view("scalar_sub")
            derived.append(DerivedView(view, inner, scalar=True))
            preds.append(f"{cs.left_expr} {cs.op} (SELECT {alias} FROM {view})")
            continue
        a, b = cs.corr
        inner_tbl = inner.base_tables()[0].name
        inner_cols = set(columns_of(inner_tbl))
        if b in inner_cols:
            inner_col, outer_col = b, a
        elif a in inner_cols:
            inner_col, outer_col = a, b
        else:
            raise UnsupportedQueryError(
                f"correlation columns {a!r}/{b!r} not found in {inner_tbl}"
            )
        # the derived table: per-correlation-value aggregate (the
        # paper's `select city, avg(price) ... group by city` example);
        # its correlation column is renamed to stay globally unique
        grouped = replace(inner, groups=(inner_col,))
        view = fresh_view("flat_sub")
        corr_col = f"verdict_corr_{view.rsplit('_', 1)[-1]}"
        derived.append(
            DerivedView(view, grouped, scalar=False, rename=(inner_col, corr_col))
        )
        joins.append(
            JoinEdge(right=TableRef(name=view), on=((outer_col, corr_col),))
        )
        preds.append(f"{cs.left_expr} {cs.op} {alias}")
    flattened = replace(
        q,
        source=Relation(first=q.source.first, joins=tuple(joins)),
        where=" AND ".join(f"({p})" for p in preds) if preds else None,
        subquery_filters=(),
    )
    return flattened, derived

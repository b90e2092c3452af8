"""VerdictDB facade: the middleware the user talks to (Section 2).

``VerdictContext`` owns the sample catalog and drives the full pipeline
of Figure 2: parse -> flatten comparison subqueries -> split off extreme
statistics -> plan samples under the I/O budget -> rewrite -> execute on
the engine -> assemble the approximate answer with error estimates.
Unsupported queries are passed to the engine unchanged (no speedup, no
error), and a HAC accuracy violation triggers an exact rerun
(Section 2.4).

All data-touching work is SQL text executed via ``spark.sql`` — the
middleware itself only ever manipulates result sets (the Answer
Rewriter's job) and metadata.
"""
from __future__ import annotations

import itertools
import time
from dataclasses import replace

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from . import sampling
from .catalog import HASHED, STRATIFIED, SampleCatalog
from .estimators import ApproxResult
from .flatten import flatten
from .parser import UnsupportedQueryError, parse
from .planner import (
    DEFAULT_IO_BUDGET,
    DEFAULT_K,
    Plan,
    PlanEntry,
    exact_plan,
    plan_query,
)
from .query import EXTREME, AggQuery, Relation, agg_sql, exact_sql
from .rewriter import AggOutput, rewrite_flat, rewrite_nested

_derived_counter = itertools.count()

#: AQP is declared infeasible when the grouping attributes' distinct
#: count exceeds this fraction of the sample size (Section 6.2 behaviour)
GROUP_CARDINALITY_LIMIT = 0.2


def _apply_order_limit(df: DataFrame, order_by: str, limit: int | None) -> DataFrame:
    """Re-apply a simple ``col [desc][, ...]`` ORDER BY (and LIMIT) on an
    assembled multi-part result — parts ran without ordering."""
    specs = []
    for item in order_by.split(","):
        toks = item.split()
        if not toks:
            continue
        col = F.col(toks[0])
        if len(toks) > 1 and toks[1].lower() == "desc":
            col = col.desc()
        specs.append(col)
    if specs:
        df = df.orderBy(*specs)
    if limit is not None:
        df = df.limit(limit)
    return df


class VerdictContext:
    """Driver-level AQP middleware over one SparkSession."""

    def __init__(
        self,
        spark: SparkSession,
        *,
        budget: float = DEFAULT_IO_BUDGET,
        confidence: float = 0.95,
        k: int = DEFAULT_K,
        seed: int | None = None,
    ):
        self.spark = spark
        self.catalog = SampleCatalog()
        self.budget = budget
        self.confidence = confidence
        self.k = k
        self.seed = seed
        self._base_rows: dict[str, int] = {}
        # cardinality-probe results are metadata: cache them so repeated
        # queries pay the probe once (the paper's catalog would, too)
        self._card_cache: dict[tuple[str, tuple[str, ...]], int] = {}

    # ---- sample preparation (offline stage) ---------------------------
    def create_uniform_sample(self, table: str, ratio: float = 0.01, **kw):
        meta = sampling.create_uniform_sample(
            self.spark, table, ratio=ratio, catalog=self.catalog,
            seed=kw.pop("seed", self.seed), **kw,
        )
        self._base_rows[table] = meta.base_rows
        return meta

    def create_hashed_sample(self, table: str, columns, ratio: float = 0.01, **kw):
        meta = sampling.create_hashed_sample(
            self.spark, table, tuple(columns), ratio=ratio,
            catalog=self.catalog, **kw,
        )
        self._base_rows[table] = meta.base_rows
        return meta

    def create_stratified_sample(self, table: str, columns, ratio: float = 0.01, **kw):
        meta = sampling.create_stratified_sample(
            self.spark, table, tuple(columns), ratio=ratio,
            catalog=self.catalog, seed=kw.pop("seed", self.seed), **kw,
        )
        self._base_rows[table] = meta.base_rows
        return meta

    def create_recommended_samples(
        self, table: str, *, target_rows: int = 10_000_000, top: int = 10
    ):
        """Appendix F default policy: always a uniform sample; hashed
        samples on the highest-cardinality columns (>1% of |T| unique),
        stratified samples on the lowest-cardinality ones (<1%).

        ``target_rows`` is the paper's 10M-row knob: tau = target / |T|
        (clamped to 1). Cardinalities come from one SQL aggregate using
        the engine's approximate distinct — metadata-grade accuracy is
        all the policy needs.
        """
        n = self._rows(table)
        tau = min(1.0, target_rows / n)
        created = [self.create_uniform_sample(table, ratio=tau)]
        cols = self.spark.table(table).columns
        card_row = self.spark.sql(
            "SELECT "
            + ", ".join(f"approx_count_distinct({c}) AS {c}" for c in cols)
            + f" FROM {table}"
        ).collect()[0]
        cards = {c: card_row[c] for c in cols}
        high = sorted(
            (c for c in cols if cards[c] > 0.01 * n),
            key=lambda c: -cards[c],
        )[:top]
        low = sorted(
            (c for c in cols if 1 < cards[c] <= 0.01 * n),
            key=lambda c: cards[c],
        )[:top]
        for c in high:
            created.append(self.create_hashed_sample(table, (c,), ratio=tau))
        for c in low:
            created.append(self.create_stratified_sample(table, (c,), ratio=tau))
        return created

    # ---- query processing (online stage) ------------------------------
    def sql(
        self,
        query_text: str,
        *,
        budget: float | None = None,
        confidence: float | None = None,
        accuracy: float | None = None,
        seed: int | None = None,
    ) -> ApproxResult:
        """Answer ``query_text`` approximately when supported.

        ``accuracy`` is the optional HAC requirement of Section 2.4
        (e.g. 0.99 = answers within +-1%); a violation triggers an exact
        rerun on the base tables.
        """
        confidence = confidence if confidence is not None else self.confidence
        t0 = time.perf_counter()
        try:
            q = parse(query_text)
        except UnsupportedQueryError as e:
            df = self.spark.sql(query_text)
            return ApproxResult(
                df=df, outputs=(), approx=False,
                fallback_reason=f"unsupported: {e}",
                latency_sec=time.perf_counter() - t0,
            )
        try:
            res = self._answer(
                q, budget=budget if budget is not None else self.budget,
                confidence=confidence, seed=seed if seed is not None else self.seed,
            )
        except UnsupportedQueryError as e:
            df = self.spark.sql(query_text)
            res = ApproxResult(
                df=df, outputs=(), approx=False,
                fallback_reason=f"unsupported: {e}",
            )
        res.latency_sec = time.perf_counter() - t0
        if res.violates(accuracy):
            df = self._exact_df(q)
            res = ApproxResult(
                df=df,
                outputs=tuple(AggOutput(a.alias, None) for a in q.aggs),
                approx=False,
                fallback_reason="HAC violation: accuracy requirement not met",
                latency_sec=time.perf_counter() - t0,
                group_cols=tuple(g.split(".")[-1] for g in q.groups),
            )
        return res

    def exact(self, query_text: str) -> DataFrame:
        """Run a query on the base tables, bypassing AQP (baseline)."""
        return self.spark.sql(query_text)

    # ---- internals -----------------------------------------------------
    def _rows(self, table: str) -> int:
        if table not in self._base_rows:
            self._base_rows[table] = self.spark.sql(
                f"SELECT count(*) AS n FROM {table}"
            ).collect()[0]["n"]
        return self._base_rows[table]

    def _columns_of(self, table: str) -> list[str]:
        return self.spark.table(table).columns

    def _exact_df(self, q: AggQuery) -> DataFrame:
        return self.spark.sql(exact_sql(q))

    def _answer(
        self, q: AggQuery, *, budget: float, confidence: float, seed: int | None
    ) -> ApproxResult:
        # 1. flatten comparison subqueries into joins / scalar views.
        #    Derived views are computed exactly: they feed *filters*, so
        #    keeping them exact isolates approximation error to the
        #    aggregates themselves (a conservative variant of §2.2).
        q, derived = flatten(
            q,
            columns_of=self._columns_of,
            fresh_view=lambda kind: f"verdict_{kind}_{next(_derived_counter)}",
        )
        for dv in derived:
            df = self.spark.sql(exact_sql(dv.query))
            if dv.rename is not None:
                df = df.withColumnRenamed(*dv.rename)
            df.createOrReplaceTempView(dv.view)

        # 2. split off extreme statistics (min/max: computed exactly)
        extreme = tuple(a for a in q.aggs if a.fn in EXTREME)
        meanlike = tuple(a for a in q.aggs if a.fn not in EXTREME)
        if not meanlike:
            raise UnsupportedQueryError("only extreme statistics requested")
        q_mean = replace(q, aggs=meanlike)

        # 3. plan samples under the I/O budget
        base_rows = {t.name: self._rows(t.name) for t in q.base_tables()}
        plan = plan_query(
            q_mean, self.catalog, base_rows, budget=budget, k=self.k
        )
        groups = tuple(g.split(".")[-1] for g in q.groups)
        if not plan.uses_sampling:
            raise UnsupportedQueryError(
                "no sample combination within the I/O budget"
            )

        # Section 6.2: AQP is infeasible when the grouping attributes are
        # near-unique — each group would get a handful of sample tuples
        # (tq-3/tq-8/tq-15 in the paper ran exact for this reason). The
        # cardinality probe runs on the (cached) sample view, not the
        # base table, so the check itself stays cheap.
        if groups:
            inner_groups = (
                tuple(g.split(".")[-1] for g in q_mean.source.groups)
                if q_mean.nested
                else groups
            )
            for entry in plan.entries:
                for meta in entry.tables.values():
                    if meta is None:
                        continue
                    probe_cols = [
                        g for g in inner_groups
                        if g in self._columns_of(meta.table)
                    ]
                    if not probe_cols:
                        continue
                    key = (meta.view, tuple(probe_cols))
                    if key not in self._card_cache:
                        self._card_cache[key] = self.spark.sql(
                            f"SELECT approx_count_distinct(struct("
                            f"{', '.join(probe_cols)})) AS d FROM {meta.view}"
                        ).collect()[0]["d"]
                    d = self._card_cache[key]
                    if d > GROUP_CARDINALITY_LIMIT * max(meta.rows, 1):
                        raise UnsupportedQueryError(
                            f"grouping cardinality {d} too high for sample "
                            f"{meta.view} ({meta.rows} rows)"
                        )

        # 4. rewrite + execute each consolidated plan entry. With
        #    several entries (or a separate extreme part), ORDER BY /
        #    LIMIT / HAVING must wait until assembly, so parts run bare.
        multi = len(plan.entries) > 1 or bool(extreme)
        if multi and q_mean.nested:
            raise UnsupportedQueryError(
                "nested query needs a single consolidated plan entry"
            )
        if multi and q_mean.having:
            raise UnsupportedQueryError(
                "HAVING across multiple plan entries"
            )
        entry_results: list[tuple[DataFrame, tuple[AggOutput, ...]]] = []
        for entry in plan.entries:
            part = q_mean if not multi else replace(
                q_mean, aggs=entry.aggs, order_by=None, limit=None
            )
            if not entry.uses_sampling:
                df = self._exact_df(part)
                outs = tuple(AggOutput(a.alias, None) for a in entry.aggs)
            else:
                rewriter = rewrite_nested if q_mean.nested else rewrite_flat
                rw = rewriter(
                    part,
                    entry,
                    columns_of=self._columns_of,
                    confidence=confidence,
                    seed=seed,
                )
                df = self.spark.sql(rw.sql)
                outs = rw.outputs
            entry_results.append((df, outs))

        # 5. exact part for extreme statistics, if any (decomposition of
        #    Section 2.2: min/max are never approximated)
        if extreme:
            df = self._exact_df(
                replace(q, aggs=extreme, order_by=None, limit=None)
            )
            entry_results.append(
                (df, tuple(AggOutput(a.alias, None) for a in extreme))
            )

        # 6. assemble (Answer Rewriter): join partial results on groups
        df, outputs = entry_results[0]
        for part_df, part_outs in entry_results[1:]:
            if groups:
                df = df.join(part_df, on=list(groups), how="inner")
            else:
                df = df.crossJoin(part_df)
            outputs = outputs + part_outs
        # restore the user's aggregate order
        order = {a.alias: i for i, a in enumerate(q.aggs)}
        outputs = tuple(sorted(outputs, key=lambda o: order.get(o.alias, 99)))
        select = list(groups) + [
            c for o in outputs
            for c in ([o.alias] + ([o.err_alias] if o.err_alias else []))
        ]
        df = df.select(*[F.col(c) for c in select])
        if multi and q.order_by:
            df = _apply_order_limit(df, q.order_by, q.limit)
        return ApproxResult(
            df=df,
            outputs=outputs,
            approx=True,
            confidence=confidence,
            plan=plan,
            group_cols=groups,
        )

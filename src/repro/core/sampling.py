"""Sample-table construction in pure SQL (Sections 3.1–3.2).

Every builder issues plain ``SELECT`` statements through
``spark.sql(...)`` — the middleware constraint of the paper. The
resulting DataFrame is cached and counted (the local stand-in for the
paper's ``CREATE TABLE ... AS SELECT`` materialisation; a lazy view over
``rand()`` would silently re-draw the sample on every use) and
registered as a temp view whose name the planner receives via
:class:`~repro.core.catalog.SampleMeta`.

Each sample table is the base table plus one extra column,
``verdict_prob`` — the per-tuple inclusion probability (Section 3.1).
That single column is what lets one Horvitz–Thompson rewrite template
serve all sample types.

Randomness: all builders accept a ``seed`` forwarded to SQL ``rand(seed)``
so tests are reproducible for a fixed session/partitioning.
"""
from __future__ import annotations

import itertools

from pyspark.sql import DataFrame, SparkSession

from .catalog import HASHED, STRATIFIED, UNIFORM, SampleCatalog, SampleMeta
from .staircase import DEFAULT_DELTA, staircase_case_sql, staircase_steps

_view_counter = itertools.count()

# Denominator for the hash-to-[0,1) trick used by hashed samples; any
# engine with an integer hash and pmod can evaluate it.
_HASH_BUCKETS = 1_000_000


def _fresh_view(table: str, kind: str) -> str:
    return f"{table}__{kind}_{next(_view_counter)}"


def _materialise(spark: SparkSession, sql: str, view: str) -> tuple[DataFrame, int]:
    # Samples are small by construction (a few % of the base table);
    # coalescing avoids dragging the base table's partition count — and
    # its per-task scheduling overhead — into every rewritten query.
    df = spark.sql(sql).coalesce(4)
    df = df.cache()
    rows = df.count()
    df.createOrReplaceTempView(view)
    return df, rows


def _count(spark: SparkSession, table: str) -> int:
    return spark.sql(f"SELECT count(*) AS n FROM {table}").collect()[0]["n"]


def hash01_expr(cols: tuple[str, ...], salt: int = 0) -> str:
    """SQL expression hashing a column set into [0, 1) uniformly.

    The +0.5 centres each bucket so the comparison against tau is
    unbiased at any bucket granularity.
    """
    args = ", ".join(cols) + (f", {salt}" if salt else "")
    return f"((pmod(hash({args}), {_HASH_BUCKETS}) + 0.5) / {_HASH_BUCKETS}.0)"


def create_uniform_sample(
    spark: SparkSession,
    table: str,
    *,
    ratio: float = 0.01,
    seed: int | None = None,
    catalog: SampleCatalog | None = None,
) -> SampleMeta:
    """Bernoulli sample: every tuple kept independently with prob ``ratio``."""
    view = _fresh_view(table, "uniform")
    rand = f"rand({seed})" if seed is not None else "rand()"
    sql = (
        f"SELECT *, CAST({ratio!r} AS DOUBLE) AS verdict_prob "
        f"FROM {table} WHERE {rand} < {ratio!r}"
    )
    _, rows = _materialise(spark, sql, view)
    meta = SampleMeta(table, view, UNIFORM, (), ratio, rows, _count(spark, table))
    if catalog is not None:
        catalog.add(meta)
    return meta


def create_hashed_sample(
    spark: SparkSession,
    table: str,
    columns: tuple[str, ...],
    *,
    ratio: float = 0.01,
    catalog: SampleCatalog | None = None,
) -> SampleMeta:
    """Universe sample on ``columns``: keep tuples whose hash falls below tau.

    All tuples sharing a value of ``columns`` survive or die together,
    which is what makes sample–sample equi-joins on these columns
    recover the full join density (Section 5.1). Per Section 3.1 the
    stored probability is the realised ratio |T_s|/|T| (constant per
    tuple), so the view is built in two steps: sample, count, then wrap
    with the literal probability column.
    """
    base_rows = _count(spark, table)
    view = _fresh_view(table, "hashed")
    raw_view = view + "_raw"
    sql = f"SELECT * FROM {table} WHERE {hash01_expr(columns)} < {ratio!r}"
    _, rows = _materialise(spark, sql, raw_view)
    prob = rows / base_rows if base_rows else 0.0
    _materialise(
        spark,
        f"SELECT *, CAST({prob!r} AS DOUBLE) AS verdict_prob FROM {raw_view}",
        view,
    )
    meta = SampleMeta(table, view, HASHED, tuple(columns), ratio, rows, base_rows)
    if catalog is not None:
        catalog.add(meta)
    return meta


def create_stratified_sample(
    spark: SparkSession,
    table: str,
    columns: tuple[str, ...],
    *,
    ratio: float = 0.01,
    min_per_stratum: int | None = None,
    delta: float = DEFAULT_DELTA,
    seed: int | None = None,
    catalog: SampleCatalog | None = None,
) -> SampleMeta:
    """Two-pass probabilistic stratified sample (Section 3.2).

    Pass 1 computes per-stratum sizes with a GROUP BY; pass 2 joins them
    back and Bernoulli-samples each tuple with the staircase probability
    that guarantees (w.p. 1-delta) at least
    ``m = min(|T| * ratio / d, strata_size)`` tuples per stratum
    (Equation 1 / Lemma 1). Both passes are single standard SELECTs —
    no procedural SQL, fully parallelisable.
    """
    cols = ", ".join(columns)
    base_rows = _count(spark, table)
    temp_view = _fresh_view(table, "strata")
    _materialise(
        spark,
        f"SELECT {cols}, count(*) AS strata_size FROM {table} GROUP BY {cols}",
        temp_view,
    )
    d = _count(spark, temp_view)
    if min_per_stratum is None:
        m = max(1.0, base_rows * ratio / max(d, 1))
    else:
        m = float(min_per_stratum)
    max_stratum = spark.sql(
        f"SELECT max(strata_size) AS mx FROM {temp_view}"
    ).collect()[0]["mx"]
    case = staircase_case_sql(
        staircase_steps(m, int(max_stratum), delta=delta), "t2.strata_size"
    )
    on = " AND ".join(f"t1.{c} = t2.{c}" for c in columns)
    rand = f"rand({seed})" if seed is not None else "rand()"
    view = _fresh_view(table, "stratified")
    sql = (
        f"SELECT * FROM ("
        f"  SELECT t1.*, {case} AS verdict_prob"
        f"  FROM {table} t1 INNER JOIN {temp_view} t2 ON {on}"
        f") WHERE {rand} < verdict_prob"
    )
    _, rows = _materialise(spark, sql, view)
    meta = SampleMeta(table, view, STRATIFIED, tuple(columns), ratio, rows, base_rows)
    if catalog is not None:
        catalog.add(meta)
    return meta


def drop_sample(spark: SparkSession, meta: SampleMeta) -> None:
    """Unpersist and deregister a sample view (test hygiene)."""
    try:
        spark.table(meta.view).unpersist()
    except Exception:
        pass
    spark.catalog.dropTempView(meta.view)

"""Sample-table metadata catalog (Section 2.3).

The paper records sample metadata "in a specific schema inside the
database catalog". Here the backend is a single Spark session, so the
catalog is an in-process registry keyed by base-table name; each entry
describes one materialised sample temp view. All fields a planner or
rewriter needs — type, column set, sampling parameter tau, actual row
counts — are captured at creation time so that query-time planning never
re-scans data.
"""
from __future__ import annotations

from dataclasses import dataclass, field

UNIFORM = "uniform"
HASHED = "hashed"  # a.k.a. universe sample
STRATIFIED = "stratified"


@dataclass(frozen=True)
class SampleMeta:
    """Metadata for one sample table.

    ``ratio`` is the sampling parameter tau from Section 3.1 (for
    stratified samples, the budget parameter of Equation 1 — per-tuple
    probabilities vary and live in the ``verdict_prob`` column).
    ``rows``/``base_rows`` are exact counts taken at creation.
    """

    table: str
    view: str
    stype: str
    columns: tuple[str, ...]
    ratio: float
    rows: int
    base_rows: int

    @property
    def sampling_ratio(self) -> float:
        """Effective (realised) sampling ratio |T_s| / |T|."""
        return self.rows / self.base_rows if self.base_rows else 0.0


@dataclass
class SampleCatalog:
    """Registry of sample tables grouped by base table."""

    _by_table: dict[str, list[SampleMeta]] = field(default_factory=dict)

    def add(self, meta: SampleMeta) -> None:
        self._by_table.setdefault(meta.table, []).append(meta)

    def for_table(self, table: str) -> list[SampleMeta]:
        return list(self._by_table.get(table, []))

    def tables(self) -> list[str]:
        return sorted(self._by_table)

    def find(
        self,
        table: str,
        stype: str | None = None,
        columns: tuple[str, ...] | None = None,
    ) -> list[SampleMeta]:
        """Samples of ``table`` matching type and (exact) column set."""
        out = []
        for m in self.for_table(table):
            if stype is not None and m.stype != stype:
                continue
            if columns is not None and tuple(m.columns) != tuple(columns):
                continue
            out.append(m)
        return out

    def clear(self, table: str | None = None) -> None:
        if table is None:
            self._by_table.clear()
        else:
            self._by_table.pop(table, None)

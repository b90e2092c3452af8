"""Answer Rewriter (Fig. 1b): approximate result handling.

Wraps the DataFrame returned by a rewritten query together with the
(answer, error) column pairing, confidence level, and plan metadata, and
implements the High-level Accuracy Contract check of Section 2.4: the
accuracy requirement is interpreted *after* execution, by comparing the
estimated relative errors against the requirement; violation triggers an
exact rerun (done by the facade).
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame

from .planner import Plan
from .rewriter import AggOutput


@dataclass
class ApproxResult:
    """Result of a VerdictDB query.

    ``outputs`` pairs each answer column with its error column (the
    half-width of the confidence interval at ``confidence``); error
    columns are absent (None) for exact passthrough. Per Section 2.4,
    error columns are only *included* when the caller asked for them —
    ``df`` always carries them when approximate, and :meth:`answer_df`
    projects them away for legacy-application consumption.
    """

    df: DataFrame
    outputs: tuple[AggOutput, ...]
    approx: bool
    confidence: float = 0.95
    plan: Plan | None = None
    fallback_reason: str | None = None
    latency_sec: float | None = None
    group_cols: tuple[str, ...] = field(default_factory=tuple)

    def answer_df(self) -> DataFrame:
        """The result without error columns (transparent mode)."""
        cols = list(self.group_cols) + [o.alias for o in self.outputs]
        return self.df.select(*cols)

    def max_relative_error(self) -> float | None:
        """Largest |err / answer| across rows and aggregates, for HAC.

        None when the result is exact or has no valid error estimates.
        """
        if not self.approx:
            return None
        rows = self.df.collect()
        worst: float | None = None
        for row in rows:
            for o in self.outputs:
                if o.err_alias is None:
                    continue
                val, err = row[o.alias], row[o.err_alias]
                if val is None or err is None or float(val) == 0.0:
                    continue
                rel = abs(float(err) / float(val))
                worst = rel if worst is None else max(worst, rel)
        return worst

    def violates(self, accuracy: float | None) -> bool:
        """HAC check: does any estimated error exceed ``1 - accuracy``?

        ``accuracy=0.99`` means every answer must be within +-1% at the
        result's confidence level. Unknown errors count as violations
        (the safe direction: rerun exactly).
        """
        if accuracy is None or not self.approx:
            return False
        worst = self.max_relative_error()
        if worst is None:
            return True
        return worst > (1.0 - accuracy)

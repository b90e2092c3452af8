"""In-memory reference implementations of the four error-estimation
methods compared in Sections 6.5 and B.3: CLT, bootstrap, traditional
subsampling, and variational subsampling.

The §6.5/B.3 studies need hundreds of independent trials per
configuration; running each trial through Spark SQL would measure
scheduling, not statistics. These numpy implementations follow the same
mathematics as the SQL forms (the SQL forms are cross-validated against
them in tests) and return (estimate, half_width) pairs for the mean
statistic, plus count variants parameterised by sampling ratio.
"""
from __future__ import annotations

import math

import numpy as np

from ..core.rewriter import z_value


def clt_mean(x: np.ndarray, confidence: float = 0.95) -> tuple[float, float]:
    """Closed-form CLT interval for the mean."""
    z = z_value(confidence)
    n = len(x)
    return float(np.mean(x)), float(z * np.std(x, ddof=1) / math.sqrt(n))


def bootstrap_mean(
    x: np.ndarray,
    *,
    b: int = 100,
    confidence: float = 0.95,
    rng: np.random.Generator | None = None,
) -> tuple[float, float]:
    """Percentile bootstrap: b resamples with replacement of size n.

    Cost O(b·n) — the reference point for the efficiency experiments.
    The half-width reported is half the CI width (symmetrised), so all
    four methods are comparable on one scale.
    """
    rng = rng or np.random.default_rng()
    n = len(x)
    g0 = float(np.mean(x))
    idx = rng.integers(0, n, size=(b, n))
    ests = x[idx].mean(axis=1)
    alpha = 1.0 - confidence
    t_lo, t_hi = np.quantile(g0 - ests, [alpha / 2, 1 - alpha / 2])
    return g0, float((t_hi - t_lo) / 2.0)


def traditional_subsampling_mean(
    x: np.ndarray,
    *,
    n_s: int | None = None,
    b: int = 100,
    confidence: float = 0.95,
    rng: np.random.Generator | None = None,
) -> tuple[float, float]:
    """Politis–Romano subsampling: b without-replacement subsamples of
    exact size n_s; CI scaled by sqrt(n_s / n). Construction is O(b·n)
    (b independent permutations/draws over the sample)."""
    rng = rng or np.random.default_rng()
    n = len(x)
    if n_s is None:
        n_s = max(2, int(round(math.sqrt(n))))
    g0 = float(np.mean(x))
    ests = np.empty(b)
    for i in range(b):
        ests[i] = x[rng.choice(n, size=n_s, replace=False)].mean()
    alpha = 1.0 - confidence
    dev = math.sqrt(n_s) * (ests - g0)  # sqrt(n_s)-scaled deviations
    t_lo, t_hi = np.quantile(dev, [alpha / 2, 1 - alpha / 2])
    half = (t_hi - t_lo) / (2.0 * math.sqrt(n))
    return g0, float(half)


def variational_subsampling_mean(
    x: np.ndarray,
    *,
    n_s: int | None = None,
    confidence: float = 0.95,
    rng: np.random.Generator | None = None,
) -> tuple[float, float]:
    """Variational subsampling (Section 4.2): one random sid in 1..b per
    tuple (b = n/n_s), disjoint subsamples of varying size, Equation 2's
    sqrt(n_{s,i})-scaled empirical distribution. Cost O(n)."""
    rng = rng or np.random.default_rng()
    n = len(x)
    if n_s is None:
        n_s = max(2, int(round(math.sqrt(n))))
    b = max(2, n // n_s)
    sid = rng.integers(0, b, size=n)
    g0 = float(np.mean(x))
    sums = np.bincount(sid, weights=x, minlength=b)
    cnts = np.bincount(sid, minlength=b)
    ok = cnts > 0
    ests = sums[ok] / cnts[ok]
    alpha = 1.0 - confidence
    dev = np.sqrt(cnts[ok]) * (ests - g0)  # Equation 2
    t_lo, t_hi = np.quantile(dev, [alpha / 2, 1 - alpha / 2])
    half = (t_hi - t_lo) / (2.0 * math.sqrt(n))
    return g0, float(half)


def variational_subsampling_count(
    mask: np.ndarray,
    sampling_ratio: float,
    *,
    n_s: int | None = None,
    confidence: float = 0.95,
    rng: np.random.Generator | None = None,
) -> tuple[float, float]:
    """Count estimate + CI from a boolean predicate column of a sample.

    Mirrors the SQL rewriter: per-subsample estimate = b * HT count of
    the subsample; CI from the scaled spread (Theorem 2).
    """
    rng = rng or np.random.default_rng()
    n = len(mask)
    if n_s is None:
        n_s = max(2, int(round(math.sqrt(n))))
    b = max(2, n // n_s)
    sid = rng.integers(0, b, size=n)
    ht = mask.astype(float) / sampling_ratio
    est0 = float(ht.sum())
    sums = np.bincount(sid, weights=ht, minlength=b)
    cnts = np.bincount(sid, minlength=b)
    ests = sums * b  # fixed-b scale-up to full-sample totals
    z = z_value(confidence)
    ok = cnts > 0
    half = (
        float(np.std(ests[ok], ddof=1))
        * math.sqrt(float(np.mean(cnts[ok])))
        / math.sqrt(float(cnts[ok].sum()))
        * z
    )
    return est0, half


def true_count_se(
    n_population: int, selectivity: float, sampling_ratio: float
) -> float:
    """Analytic ground-truth standard error of the HT count estimator
    under Bernoulli sampling (used as 'groundtruth' in Figure 8a)."""
    n_match = n_population * selectivity
    return math.sqrt(n_match * (1.0 - sampling_ratio) / sampling_ratio)


def true_mean_se(sd: float, n_sample: int) -> float:
    """Analytic standard error of a sample mean (Figure 8b groundtruth)."""
    return sd / math.sqrt(n_sample)


def variational_upper_bound(
    x: np.ndarray,
    *,
    n_s: int | None = None,
    confidence: float = 0.95,
    rng: np.random.Generator | None = None,
) -> tuple[float, float]:
    """(g0, upper confidence bound) for the mean via variational
    subsampling.

    The B.3 experiments measure the relative error of the estimated
    *bound* (one-sided, relative to g0), which exposes the
    small-``n_s`` penalty on skewed data that a symmetrised half-width
    hides: the subsample statistic's distribution has not converged
    yet, so its alpha/2 deviation quantile is biased — and the
    too-few-subsamples penalty at large ``n_s`` (b = n/n_s quantile
    points, the Dvoretzky-Kiefer-Wolfowitz b^{-1/2} term).
    """
    rng = rng or np.random.default_rng()
    n = len(x)
    if n_s is None:
        n_s = max(2, int(round(math.sqrt(n))))
    b = max(2, n // n_s)
    sid = rng.integers(0, b, size=n)
    g0 = float(np.mean(x))
    sums = np.bincount(sid, weights=x, minlength=b)
    cnts = np.bincount(sid, minlength=b)
    ok = cnts > 0
    dev = np.sqrt(cnts[ok]) * (sums[ok] / cnts[ok] - g0)
    alpha = 1.0 - confidence
    t_lo = float(np.quantile(dev, alpha / 2.0))
    return g0, g0 - t_lo / math.sqrt(n)  # upper end of the CI (t_lo < 0)

"""E6 — effect of the subsample size n_s (Figure 14 / Appendix B.3) and
the time-error tradeoff vs n and b (Figures 12/13).

Appendix B.3 derives that with b = n/n_s the error term
``n_s^{-1/2} + n_s/n + (n/n_s)^{-1/2}`` is minimised at n_s = sqrt(n);
this experiment validates the choice empirically: for each exponent
alpha, the relative error of the error-bound estimate (vs the analytic
truth) is averaged over trials.
"""
from __future__ import annotations

import time

import numpy as np

from ..errbaselines import numpy_ref


def run_subsample_size(
    *,
    n: int = 50_000,
    exponents: tuple[float, ...] = (0.25, 1 / 3, 0.5, 2 / 3, 0.75),
    trials: int = 150,
    mean: float = 10.0,
    sd: float = 10.0,
    seed: int = 708,
) -> list[dict]:
    rng = np.random.default_rng(seed)
    # skewed values, the paper's mean 10 = sd 10 setting (exponential)
    shape, scale = (mean / sd) ** 2, sd * sd / mean
    # the width of the true one-sided 95% bound (sampling distribution
    # of the mean is normal at this n)
    true_width = 1.96 * numpy_ref.true_mean_se(sd, n)
    rows: list[dict] = []
    for a in exponents:
        n_s = max(2, int(round(n**a)))
        rels = []
        for _ in range(trials):
            x = rng.gamma(shape, scale, n)
            g0, upper = numpy_ref.variational_upper_bound(
                x, n_s=n_s, rng=rng
            )
            # B.3's metric: relative error of the estimated error bound
            # ("if the true upper bound was $110.0 and the estimate
            #  $110.1, the relative error is 0.1%") — measured against
            # the true bound anchored at this sample's g0, so the
            # estimator's own sampling noise does not drown the signal
            rels.append(100.0 * abs((upper - g0) - true_width) / mean)
        rows.append(
            {
                "ns_exponent": round(a, 3),
                "n_s": n_s,
                "b": max(2, n // n_s),
                "rel_err_of_bound_pct": float(np.mean(rels)),
            }
        )
    return rows


def run_time_error_tradeoff(
    *,
    sizes: tuple[int, ...] = (10_000, 30_000, 100_000),
    b: int = 1000,
    trials: int = 10,
    mean: float = 10.0,
    sd: float = 10.0,
    seed: int = 709,
) -> list[dict]:
    """Figures 12a/12b: accuracy and latency of bound estimation vs n.

    b is fixed at 1000 for bootstrap/traditional (the paper's setting)
    and sqrt(n) for variational.
    """
    rng = np.random.default_rng(seed)
    rows: list[dict] = []
    for n in sizes:
        true_half = 1.96 * numpy_ref.true_mean_se(sd, n)
        for method, fn in (
            ("bootstrap", lambda x: numpy_ref.bootstrap_mean(x, b=b, rng=rng)),
            (
                "traditional",
                lambda x: numpy_ref.traditional_subsampling_mean(
                    x, b=b, rng=rng
                ),
            ),
            (
                "variational",
                lambda x: numpy_ref.variational_subsampling_mean(x, rng=rng),
            ),
        ):
            shape, scale = (mean / sd) ** 2, sd * sd / mean
            rels, secs = [], []
            for _ in range(trials):
                x = rng.gamma(shape, scale, n)
                t0 = time.perf_counter()
                _, half = fn(x)
                secs.append(time.perf_counter() - t0)
                rels.append(100.0 * abs(half - true_half) / mean)
            rows.append(
                {
                    "n": n,
                    "method": method,
                    "bound_rel_err_pct": float(np.mean(rels)),
                    "latency_s": float(np.mean(secs)),
                }
            )
    return rows

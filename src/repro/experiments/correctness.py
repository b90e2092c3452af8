"""E5 — statistical correctness of variational subsampling (Figure 8,
§6.5).

Uses the controlled ``synthetic`` dataset (values with mean 10, sd 10)
and many independent sample draws, recording the mean / 5th / 95th
percentiles of the *estimated* errors next to the analytic groundtruth:

- Figure 8a: a count query at several selectivities, sample size 10K
  drawn from a 1M population — estimated relative error vs groundtruth.
- Figure 8b: an avg query at several sample sizes — variational
  subsampling vs CLT, bootstrap, and traditional subsampling.
"""
from __future__ import annotations

import numpy as np

from ..errbaselines import numpy_ref


def run_selectivity_sweep(
    *,
    population: int = 1_000_000,
    sample_size: int = 10_000,
    selectivities: tuple[float, ...] = (0.001, 0.01, 0.1, 0.5),
    trials: int = 200,
    seed: int = 606,
) -> list[dict]:
    """Figure 8a: count-query error estimates across selectivities."""
    rng = np.random.default_rng(seed)
    ratio = sample_size / population
    rows: list[dict] = []
    for sel in selectivities:
        truth = population * sel
        true_se = numpy_ref.true_count_se(population, sel, ratio)
        gt_rel = 100.0 * 1.96 * true_se / truth
        est_rels = []
        for _ in range(trials):
            # a fresh Bernoulli sample of the population's indicator col
            n = rng.binomial(population, ratio)
            mask = rng.random(n) < sel
            _, half = numpy_ref.variational_subsampling_count(
                mask, ratio, rng=rng
            )
            est_rels.append(100.0 * half / truth)
        est = np.array(est_rels)
        rows.append(
            {
                "selectivity": sel,
                "groundtruth_rel_err_pct": gt_rel,
                "estimated_mean_pct": float(est.mean()),
                "estimated_p5_pct": float(np.percentile(est, 5)),
                "estimated_p95_pct": float(np.percentile(est, 95)),
                "deviation_pct_of_gt": 100.0 * abs(est.mean() - gt_rel) / gt_rel,
            }
        )
    return rows


def run_sample_size_sweep(
    *,
    sizes: tuple[int, ...] = (100_000, 1_000_000),
    trials_per_size: dict[int, int] | None = None,
    b: int = 100,
    mean: float = 10.0,
    sd: float = 10.0,
    seed: int = 607,
) -> list[dict]:
    """Figure 8b: avg-query error estimates, four methods, several n.

    Bootstrap/traditional subsampling are O(b*n) per trial, so the
    trial counts shrink with n (the paper faces the same costs)."""
    rng = np.random.default_rng(seed)
    trials_per_size = trials_per_size or {100_000: 100, 1_000_000: 25}
    rows: list[dict] = []
    for n in sizes:
        trials = trials_per_size.get(n, 25)
        gt_rel = 100.0 * 1.96 * numpy_ref.true_mean_se(sd, n) / mean
        per_method: dict[str, list[float]] = {
            "clt": [], "bootstrap": [], "traditional": [], "variational": [],
        }
        for _ in range(trials):
            x = rng.normal(mean, sd, n)
            _, h = numpy_ref.clt_mean(x)
            per_method["clt"].append(100.0 * h / mean)
            _, h = numpy_ref.bootstrap_mean(x, b=b, rng=rng)
            per_method["bootstrap"].append(100.0 * h / mean)
            _, h = numpy_ref.traditional_subsampling_mean(x, b=b, rng=rng)
            per_method["traditional"].append(100.0 * h / mean)
            _, h = numpy_ref.variational_subsampling_mean(x, rng=rng)
            per_method["variational"].append(100.0 * h / mean)
        for method, vals in per_method.items():
            v = np.array(vals)
            rows.append(
                {
                    "n": n,
                    "method": method,
                    "groundtruth_pct": gt_rel,
                    "estimated_mean_pct": float(v.mean()),
                    "estimated_p5_pct": float(np.percentile(v, 5)),
                    "estimated_p95_pct": float(np.percentile(v, 95)),
                    "deviation_pct_of_gt": 100.0
                    * abs(float(v.mean()) - gt_rel) / gt_rel,
                }
            )
    return rows

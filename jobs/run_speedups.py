"""E1 (Figures 4/9/10): per-query speedups + actual errors.

Usage: spark-submit jobs/run_speedups.py [--sf 0.1] [--ratio 0.01]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.1)
    ap.add_argument("--ratio", type=float, default=0.01)
    ap.add_argument("--budget", type=float, default=0.02)
    ap.add_argument("--repeats", type=int, default=2)
    args = ap.parse_args()

    spark = get_spark("verdict-speedups")
    from repro.core.verdict import VerdictContext
    from repro.experiments.report import emit
    from repro.experiments.speedups import run_speedups, summarize
    from repro.workloads.insta import (
        INSTA_QUERIES, prepare_insta_samples, register_insta_files,
    )
    from repro.workloads.tpch_lite import (
        TPCH_QUERIES, prepare_tpch_samples, register_tpch_files,
    )

    register_tpch_files(spark, sf=args.sf, fmt="csv")
    v = VerdictContext(spark, budget=args.budget, seed=11)
    prepare_tpch_samples(v, ratio=args.ratio)
    rows = run_speedups(spark, v, TPCH_QUERIES, seed=101, repeats=args.repeats)
    emit("e1_tpch_speedups", "E1: TPC-H-lite speedups (Fig 4/9/10)", rows)
    emit("e1_tpch_summary", "E1 summary", [summarize(rows)])

    register_insta_files(spark, sf=args.sf, fmt="csv")
    vi = VerdictContext(spark, budget=args.budget, seed=11)
    prepare_insta_samples(vi, ratio=args.ratio)
    rows = run_speedups(spark, vi, INSTA_QUERIES, seed=102, repeats=args.repeats)
    emit("e1_insta_speedups", "E1: instacart-lite speedups", rows)
    emit("e1_insta_summary", "E1 summary (insta)", [summarize(rows)])
    spark.stop()


if __name__ == "__main__":
    main()

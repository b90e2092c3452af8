"""E3 (Figure 6): VerdictDB vs tightly-integrated AQP.

Usage: spark-submit jobs/run_vs_integrated.py [--sf 0.1]
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
    args = ap.parse_args()

    spark = get_spark("verdict-vs-integrated")
    from repro.core.verdict import VerdictContext
    from repro.experiments.report import emit
    from repro.experiments.vs_integrated import run_vs_integrated
    from repro.integrated.snappy_sim import IntegratedAQPEngine
    from repro.workloads.tpch_lite import (
        TPCH_QUERIES, prepare_tpch_samples, register_tpch_files,
    )

    register_tpch_files(spark, sf=args.sf, fmt="csv")
    v = VerdictContext(spark, budget=0.02, seed=11)
    prepare_tpch_samples(v, ratio=args.ratio)
    eng = IntegratedAQPEngine(spark, seed=11)
    eng.create_sample("lineitem", fraction=args.ratio)
    eng.create_sample("orders", fraction=args.ratio)
    subset = tuple(
        w for w in TPCH_QUERIES
        if w.name in ("tq-1", "tq-4", "tq-6", "tq-5", "tq-12", "tq-median")
    )
    rows = run_vs_integrated(spark, v, eng, subset)
    emit("e3_vs_integrated", "E3: VerdictDB vs integrated AQP (Fig 6)", rows)
    spark.stop()


if __name__ == "__main__":
    main()

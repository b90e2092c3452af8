"""E4 (Figure 7): error-estimation overhead, three query shapes.

Usage: spark-submit jobs/run_error_estimation.py [--b 200]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.1)
    ap.add_argument("--b", type=int, default=200)
    args = ap.parse_args()

    spark = get_spark("verdict-error-estimation")
    from repro.experiments.error_estimation import run_error_estimation
    from repro.experiments.report import emit
    from repro.workloads.tpch_lite import register_tpch_files

    register_tpch_files(spark, sf=args.sf, fmt="csv")
    rows = run_error_estimation(
        spark, sample_ratio=1.0, hash_ratio=0.5, b=args.b
    )
    emit("e4_error_estimation",
         f"E4: error-estimation overhead, b={args.b} (Fig 7)", rows)
    spark.stop()


if __name__ == "__main__":
    main()

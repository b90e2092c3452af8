"""E7 (Figure 11): sample preparation time vs data load time.

Usage: spark-submit jobs/run_sample_prep.py [--sf 0.1]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.1)
    args = ap.parse_args()

    spark = get_spark("verdict-sample-prep")
    from repro.experiments.report import emit
    from repro.experiments.sample_prep import run_sample_prep
    from repro.workloads.tpch_lite import register_tpch_files

    register_tpch_files(spark, sf=args.sf, fmt="csv")
    rows = run_sample_prep(spark, table="lineitem")
    emit("e7_sample_prep", "E7: sample prep vs data load (Fig 11)", rows)
    spark.stop()


if __name__ == "__main__":
    main()

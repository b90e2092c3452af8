"""E2 (Figure 5): speedup vs data size, fixed sample size.

Usage: spark-submit jobs/run_scaleup.py [--sfs 0.05 0.2 0.5]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sfs", type=float, nargs="+", default=[0.05, 0.2, 0.5])
    ap.add_argument("--sample-rows", type=int, default=6000)
    args = ap.parse_args()

    spark = get_spark("verdict-scaleup")
    from repro.experiments.report import emit
    from repro.experiments.scaleup import run_scaleup

    rows = run_scaleup(
        spark, sfs=tuple(args.sfs), sample_rows=args.sample_rows
    )
    emit("e2_scaleup", "E2: speedup vs data size (Fig 5)", rows)
    spark.stop()


if __name__ == "__main__":
    main()

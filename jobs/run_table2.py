"""Table 2: sampling-based count-distinct / median vs native sketches.

Usage: spark-submit jobs/run_table2.py [--sf 0.5]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sf", type=float, default=0.5)
    ap.add_argument("--ratio", type=float, default=0.01)
    args = ap.parse_args()

    spark = get_spark("verdict-table2")
    from repro.experiments.report import emit
    from repro.experiments.table2 import run_table2, setup_table2

    v = setup_table2(spark, sf=args.sf, ratio=args.ratio)
    rows = run_table2(spark, v, table="lineitem_t2")
    emit("table2", "Table 2: sampling-based AQP vs native approximation", rows)
    spark.stop()


if __name__ == "__main__":
    main()

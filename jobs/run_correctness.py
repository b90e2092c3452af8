"""E5 (Figure 8): statistical correctness of variational subsampling.

Pure-numpy many-trial study; no Spark needed (runs in seconds).
Usage: python jobs/run_correctness.py [--trials 200]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--trials", type=int, default=200)
    args = ap.parse_args()
    from repro.experiments.correctness import (
        run_sample_size_sweep, run_selectivity_sweep,
    )
    from repro.experiments.report import emit

    emit(
        "e5_selectivity",
        "E5a: count error estimates vs selectivity (Fig 8a)",
        run_selectivity_sweep(trials=args.trials),
    )
    emit(
        "e5_sample_size",
        "E5b: avg error estimates, four methods (Fig 8b)",
        run_sample_size_sweep(),
    )


if __name__ == "__main__":
    main()

"""E6 (Figures 12/13/14): subsample-size and time-error tradeoffs.

Usage: python jobs/run_subsample_size.py
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))


def main() -> None:
    from repro.experiments.report import emit
    from repro.experiments.subsample_size import (
        run_subsample_size, run_time_error_tradeoff,
    )

    emit(
        "e6_subsample_size",
        "E6: effect of n_s, n=50K (Fig 14)",
        run_subsample_size(),
    )
    emit(
        "e6_time_error",
        "E6: time-error tradeoff, b=1000 (Fig 12)",
        run_time_error_tradeoff(),
    )


if __name__ == "__main__":
    main()

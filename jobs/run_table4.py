"""Table 4 — generate all 11 synthetic dataset equivalents and print the
registry stats (paper rows/cols/MB vs ours).

Usage: python jobs/run_table4.py [--scale 0.02]
"""
import argparse

from _session import get_spark  # noqa: F401  (keeps entrypoint uniform)

from repro.datasets import DATASETS
from repro.experiments.tables import table4_rows


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1 / 50, help="rows vs paper rows")
    args = ap.parse_args()
    generated = {
        name: spec.generate(spec.default_rows(args.scale)) for name, spec in DATASETS.items()
    }
    print("TABLE 4 — datasets (synthetic equivalents, see DESIGN.md)")
    print(table4_rows(generated))


if __name__ == "__main__":
    main()

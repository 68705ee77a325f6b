"""Reproduce Table 7: SFC learning time (seconds), varying N.

Usage: python jobs/table7_learning_time.py [--quick]
"""
import argparse
import sys

from repro.experiments import table7
from repro.experiments.common import render_table


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--quick", action="store_true", help="smaller N values")
    args = ap.parse_args(argv)
    n_values = [10_000, 100_000] if args.quick else [10_000, 100_000, 1_000_000]
    rows = table7.run(n_values=n_values)
    print(render_table("Table 7 — SFC learning time (seconds)", rows))
    return 0


if __name__ == "__main__":
    sys.exit(main())

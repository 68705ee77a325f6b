"""Reproduce Figures 11-13: BMTree with SP vs GC vs LC rewards.

Usage: python jobs/bmtree_variants.py [--figure {11,12,13,all}]
"""
import argparse
import sys

from repro.experiments import fig11_13
from repro.experiments.common import render_table


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--figure", choices=["11", "12", "13", "all"], default="all")
    args = ap.parse_args(argv)
    if args.figure in ("11", "all"):
        print(render_table("Fig 11 — vary N (OSM)", fig11_13.vary_cardinality()))
    if args.figure in ("12", "all"):
        print(render_table("Fig 12 — vary n (OSM)", fig11_13.vary_queries()))
    if args.figure in ("13", "all"):
        print(render_table("Fig 13 — vary rho, h (SKEW)", fig11_13.vary_rho_and_h()))
    return 0


if __name__ == "__main__":
    sys.exit(main())

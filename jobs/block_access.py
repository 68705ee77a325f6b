"""Reproduce Figures 14-17: block accesses of LBMC vs competitors.

Usage: python jobs/block_access.py [--figure {14,15,16,17,all}]
"""
import argparse
import sys

from repro.experiments import fig14_17
from repro.experiments.common import render_table


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--figure", choices=["14", "15", "16", "17", "all"], default="all")
    ap.add_argument("--n-pts", type=int, default=100_000)
    args = ap.parse_args(argv)
    if args.figure in ("14", "all"):
        print(render_table("Fig 14 — all datasets", fig14_17.overall(n_pts=args.n_pts)))
    if args.figure in ("15", "all"):
        print(render_table("Fig 15 — vary N (OSM)", fig14_17.vary_cardinality()))
    if args.figure in ("16", "all"):
        print(render_table("Fig 16 — vary aspect (OSM)", fig14_17.vary_aspect(n_pts=args.n_pts)))
    if args.figure in ("17", "all"):
        print(render_table("Fig 17 — vary edge length (OSM)", fig14_17.vary_edge_length(n_pts=args.n_pts)))
    return 0


if __name__ == "__main__":
    sys.exit(main())

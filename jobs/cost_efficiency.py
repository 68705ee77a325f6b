"""Reproduce Figures 9-10: GC/LC vs NGC/NLC estimation times.

Usage: python jobs/cost_efficiency.py [--sweep {n,delta,ell,d,all}]
"""
import argparse
import sys

from repro.experiments import fig9_10
from repro.experiments.common import render_table


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sweep", choices=["n", "delta", "ell", "d", "all"], default="all")
    args = ap.parse_args(argv)
    sweeps = {
        "n": ("Fig 9a/10a — vary n", fig9_10.vary_n),
        "delta": ("Fig 9b/10b — vary delta", fig9_10.vary_delta),
        "ell": ("Fig 9c/10c — vary ell", fig9_10.vary_ell),
        "d": ("Fig 9d/10d — vary d (gains)", fig9_10.vary_d),
    }
    selected = sweeps if args.sweep == "all" else {args.sweep: sweeps[args.sweep]}
    for title, fn in selected.values():
        print(render_table(title, fn()))
    return 0


if __name__ == "__main__":
    sys.exit(main())

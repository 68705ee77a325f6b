"""Reproduce Table 6: initialization costs of GC and LC, varying n.

Usage: python jobs/table6_init_costs.py [--quick]
"""
import argparse
import sys

from repro.experiments import table6
from repro.experiments.common import render_table


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--quick", action="store_true", help="fewer n values")
    ap.add_argument("--ell", type=int, default=10)
    ap.add_argument("--delta", type=int, default=16)
    args = ap.parse_args(argv)
    n_values = [2**i for i in (1, 4, 7, 10)] if args.quick else None
    rows = table6.run(n_values=n_values, ell=args.ell, delta=args.delta)
    print(render_table("Table 6 — initialization costs of GC and LC", rows))
    return 0


if __name__ == "__main__":
    sys.exit(main())

"""Reproduce the execution-time / work-done comparisons of Figs. 6-13 as
tables (see DESIGN.md — figures are out of scope, the numbers are not).

Usage: python jobs/run_timing.py [--sliding] [--users N]
"""
import argparse
import sys

from repro.experiments import timing


def main(argv=None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--users", type=int, default=60)
    ap.add_argument("--groups", type=int, default=5)
    ap.add_argument("--sliding", action="store_true")
    ap.add_argument("--datasets", nargs="+", default=["movie", "publication"])
    ap.add_argument("--n", nargs="+", type=int, default=[500, 1000, 2000, 4000])
    ap.add_argument("--w", nargs="+", type=int, default=[400, 800, 1600, 3200])
    args = ap.parse_args(argv)
    rows = []
    for name in args.datasets:
        rows += timing.run(
            name,
            n_users=args.users,
            n_groups=args.groups,
            n_values=tuple(args.n),
            w_values=tuple(args.w),
            sliding=args.sliding,
        )
    print(timing.to_markdown(rows))
    return 0


if __name__ == "__main__":
    sys.exit(main())

"""Reproduce Table XI (efficacy of FilterThenVerifyApprox, varying h).

Usage: python jobs/run_table11.py [--users N] [--stream N] [--groups N]
Prints the markdown table (measured vs paper) to stdout.
No Spark needed — the engines are driver-side; see run_streaming_demo.py
for the distributed pipeline.
"""
import argparse
import sys

from repro.experiments import table11


def main(argv=None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--users", type=int, default=60)
    ap.add_argument("--groups", type=int, default=5)
    ap.add_argument("--stream", type=int, default=3000)
    ap.add_argument("--datasets", nargs="+", default=["movie", "publication"])
    args = ap.parse_args(argv)
    rows = []
    for name in args.datasets:
        rows += table11.run(
            name, n_users=args.users, n_groups=args.groups, n_stream=args.stream
        )
    print(table11.to_markdown(rows))
    return 0


if __name__ == "__main__":
    sys.exit(main())

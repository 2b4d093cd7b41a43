"""Reproduce Table XII (efficacy of FilterThenVerifyApproxSW, varying W
and h). Prints the markdown table (measured vs paper) to stdout."""
import argparse
import sys

from repro.experiments import table12


def main(argv=None) -> int:
    ap = argparse.ArgumentParser()
    ap.add_argument("--users", type=int, default=40)
    ap.add_argument("--groups", type=int, default=5)
    ap.add_argument("--stream", type=int, default=4000)
    ap.add_argument("--datasets", nargs="+", default=["movie", "publication"])
    args = ap.parse_args(argv)
    rows = []
    for name in args.datasets:
        rows += table12.run(
            name, n_users=args.users, n_groups=args.groups, n_stream=args.stream
        )
    print(table12.to_markdown(rows))
    return 0


if __name__ == "__main__":
    sys.exit(main())

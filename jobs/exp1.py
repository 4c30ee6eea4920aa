#!/usr/bin/env python
"""spark-submit entrypoint for the Exp-1 response-time comparison.

Usage: spark-submit jobs/exp1.py [--sf 1.0] [--datasets D1 D2 D5 D9 D14 D15]
"""
import argparse

from repro.experiments.exp1 import format_exp1, run_exp1


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--sf", type=float, default=1.0)
    ap.add_argument(
        "--datasets", nargs="+", default=["D1", "D2", "D5", "D9", "D14", "D15"]
    )
    args = ap.parse_args()
    print(format_exp1(run_exp1(names=tuple(args.datasets), sf=args.sf)))


if __name__ == "__main__":
    main()

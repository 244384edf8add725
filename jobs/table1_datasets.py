#!/usr/bin/env python
"""Reproduce Table I: dataset statistics (paper graphs vs stand-ins).

Usage: spark-submit jobs/table1_datasets.py [--scale 1e-3]
"""
import argparse
import sys

from repro.experiments.tables import format_table1, table1_rows


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1e-3)
    args = ap.parse_args(argv)
    print(format_table1(table1_rows(scale=args.scale)))
    return 0


if __name__ == "__main__":
    sys.exit(main())

#!/usr/bin/env python
"""Reproduce Tables II–IV: Co-Optimization vs Communication-First.

One dataset per invocation (AS → Table II, LJ → Table III, OK → Table IV):

    spark-submit jobs/tables_coopt.py --dataset AS
    spark-submit jobs/tables_coopt.py --dataset LJ --scale 5e-4
    spark-submit jobs/tables_coopt.py --dataset OK --budget 120

Prints the measured phase breakdown next to the paper's numbers.
"""
import argparse
import sys

sys.path.insert(0, __file__.rsplit("/", 1)[0])
from _session import get_spark  # noqa: E402

from repro.experiments.tables import format_coopt_table, run_coopt_table  # noqa: E402
from repro.synth_data import GRAPH_SCALE  # noqa: E402


def main(argv=None) -> int:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--dataset", choices=["AS", "LJ", "OK"], required=True)
    ap.add_argument("--queries", default="Q4,Q5,Q6")
    ap.add_argument("--scale", type=float, default=GRAPH_SCALE)
    ap.add_argument("--servers", type=int, default=16)
    ap.add_argument(
        "--budget",
        type=float,
        default=120.0,
        help="comm-first Leapfrog budget in seconds (stands in for the "
        "paper's 12 h cap)",
    )
    args = ap.parse_args(argv)
    spark = get_spark(f"coopt-{args.dataset}")
    try:
        rows = run_coopt_table(
            spark,
            args.dataset,
            tuple(args.queries.split(",")),
            scale=args.scale,
            n_servers=args.servers,
            commfirst_budget=args.budget,
        )
        print(format_coopt_table(rows))
    finally:
        spark.stop()
    return 0


if __name__ == "__main__":
    sys.exit(main())

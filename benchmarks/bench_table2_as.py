"""Benchmark regenerating Table II (AS: co-opt vs comm-first, Q4–Q6).

Run: pytest benchmarks/bench_table2_as.py --benchmark-only
"""
from benchmarks.common import bench_scale, run_and_check


def test_table2_as(spark, benchmark):
    run_and_check(spark, benchmark, "AS", bench_scale(1e-3))

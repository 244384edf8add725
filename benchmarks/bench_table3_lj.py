"""Benchmark regenerating Table III (LJ: co-opt vs comm-first, Q4–Q6).

Run: pytest benchmarks/bench_table3_lj.py --benchmark-only
"""
from benchmarks.common import bench_scale, run_and_check


def test_table3_lj(spark, benchmark):
    run_and_check(spark, benchmark, "LJ", bench_scale(1e-3))

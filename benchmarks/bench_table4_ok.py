"""Benchmark regenerating Table IV (OK: co-opt vs comm-first, Q4–Q6).

OK is the paper's largest graph; the default stand-in scale keeps its
relative size (~234k edges ≈ 1e-3 of the real graph).

Run: pytest benchmarks/bench_table4_ok.py --benchmark-only
"""
from benchmarks.common import bench_scale, run_and_check


def test_table4_ok(spark, benchmark):
    run_and_check(spark, benchmark, "OK", bench_scale(1e-3))

"""Benchmark regenerating Table I (dataset statistics).

Run: pytest benchmarks/bench_table1.py --benchmark-only
"""
from benchmarks.common import write_result
from repro.experiments.tables import format_table1, table1_rows


def test_table1_datasets(benchmark):
    rows = benchmark.pedantic(
        lambda: table1_rows(scale=1e-3), rounds=1, iterations=1
    )
    text = format_table1(rows)
    print("\n" + text)
    write_result("table_I", text)
    # sanity: stand-ins preserve the paper's size ordering
    sizes = {r.dataset: r.ours_edges for r in rows}
    assert (
        sizes["WB"] < sizes["AS"] < sizes["WT"]
        < sizes["LJ"] < sizes["EN"] < sizes["OK"]
    )

"""Fig. 12-style benchmark: ADJ vs HCubeJ vs HCubeJ+Cache vs SparkSQL vs
BigJoin on Q1/Q2 over the AS stand-in (wall-clock, timeouts reported).

Run: pytest benchmarks/bench_methods.py --benchmark-only
"""
import time

import pytest

from benchmarks.common import bench_budget, bench_scale
from repro.baselines.bigjoin import bigjoin_count
from repro.baselines.hcubej import run_hcubej
from repro.baselines.sparksql import sparksql_count
from repro.core.adj import ADJConfig, run_adj
from repro.core.cost import default_cost_model
from repro.core.query import get_query
from repro.synth_data import dataset_pdf


@pytest.fixture(scope="module")
def edges(spark):
    pdf = dataset_pdf("AS", scale=bench_scale(1e-3))
    df = spark.createDataFrame(pdf).persist()
    df.count()
    yield df
    df.unpersist()


COUNTS: dict[tuple[str, str], int] = {}
LINES: list[str] = []


def _record(qname, method, cnt, secs):
    from benchmarks.common import write_result

    COUNTS[(qname, method)] = cnt
    LINES.append(f"[Fig12] {qname} {method:<14} {secs:8.2f}s count={cnt}")
    print("\n" + LINES[-1])
    write_result("fig12_methods", "\n".join(LINES))
    ref = {c for (q, _), c in COUNTS.items() if q == qname}
    assert len(ref) == 1, f"methods disagree on {qname}: {ref}"


@pytest.mark.parametrize("qname", ["Q1", "Q2"])
def test_adj(spark, benchmark, edges, qname):
    q = get_query(qname)
    cm = default_cost_model(spark)
    rep = benchmark.pedantic(
        lambda: run_adj(
            spark, q, edges, ADJConfig(sample_k=100), cost_model=cm
        ),
        rounds=1,
        iterations=1,
    )
    _record(qname, "ADJ", rep.result_count, rep.total)


@pytest.mark.parametrize("qname", ["Q1", "Q2"])
@pytest.mark.parametrize("cache", [0, 100_000])
def test_hcubej(spark, benchmark, edges, qname, cache):
    q = get_query(qname)
    rep = benchmark.pedantic(
        lambda: run_hcubej(
            spark,
            q,
            edges,
            ADJConfig(cache_entries=cache, budget_seconds=bench_budget()),
        ),
        rounds=1,
        iterations=1,
    )
    name = "HCubeJ+Cache" if cache else "HCubeJ"
    if rep.timed_out:
        print(f"\n[Fig12] {qname} {name:<14} TIMEOUT>{bench_budget():.0f}s")
    else:
        _record(qname, name, rep.result_count, rep.total)


@pytest.mark.parametrize("qname", ["Q1", "Q2"])
def test_sparksql(spark, benchmark, edges, qname):
    q = get_query(qname)
    t0 = time.monotonic()
    cnt = benchmark.pedantic(
        lambda: sparksql_count(spark, q, edges), rounds=1, iterations=1
    )
    _record(qname, "SparkSQL", cnt, time.monotonic() - t0)


@pytest.mark.parametrize("qname", ["Q1", "Q2"])
def test_bigjoin(spark, benchmark, edges, qname):
    q = get_query(qname)
    t0 = time.monotonic()
    cnt = benchmark.pedantic(
        lambda: bigjoin_count(spark, q, edges), rounds=1, iterations=1
    )
    _record(qname, "BigJoin", cnt, time.monotonic() - t0)

"""Spark tests for the distributed sampling pipeline (§IV)."""
import duckdb
import pytest

from repro.core.adj import relation_dfs
from repro.core.query import get_query
from repro.core.sampling import (
    estimate_cardinality_local,
    estimate_cardinality_spark,
)
from repro.synth_data import tiny_graph_pdf


def _duck_count(sql, edges_pdf):
    con = duckdb.connect()
    try:
        con.register("e", edges_pdf)
        return con.execute(f"SELECT count(*) FROM ({sql})").fetchone()[0]
    finally:
        con.close()


EDGES = tiny_graph_pdf()


def _setup(spark, qname):
    q = get_query(qname)
    edges = spark.createDataFrame(EDGES)
    rels = relation_dfs(edges, q)
    schemas = {r.name: r.attrs for r in q.relations}
    return q, rels, schemas


class TestDistributedSampling:
    @pytest.mark.parametrize("qname,order", [
        ("Q1", ("a", "b", "c")),
        ("Q7", ("a", "b", "c")),
    ])
    def test_exhaustive_sampling_exact(self, spark, qname, order):
        q, rels, schemas = _setup(spark, qname)
        est = estimate_cardinality_spark(
            spark, rels, schemas, order, k=10**9
        )
        assert est.estimate == pytest.approx(_duck_count(q.to_sql(), EDGES))

    def test_matches_local_estimator_when_exhaustive(self, spark):
        q, rels, schemas = _setup(spark, "Q1")
        order = ("a", "b", "c")
        spark_est = estimate_cardinality_spark(
            spark, rels, schemas, order, k=10**9
        )
        rows = EDGES[["src", "dst"]].to_numpy()
        db = {r.name: (r.attrs, rows) for r in q.relations}
        local_est = estimate_cardinality_local(db, order, k=10**9)
        assert spark_est.estimate == pytest.approx(local_est.estimate)
        assert spark_est.val_count == local_est.val_count

    def test_partial_sampling_reasonable(self, spark):
        q, rels, schemas = _setup(spark, "Q1")
        truth = _duck_count(q.to_sql(), EDGES)
        if truth == 0:
            pytest.skip("no triangles")
        est = estimate_cardinality_spark(
            spark, rels, schemas, ("a", "b", "c"), k=15, seed=2
        )
        D = max(est.estimate, truth) / max(min(est.estimate, truth), 1)
        assert D < 5.0

    def test_stats_populated(self, spark):
        _, rels, schemas = _setup(spark, "Q1")
        est = estimate_cardinality_spark(
            spark, rels, schemas, ("a", "b", "c"), k=10
        )
        assert est.k <= 10
        assert est.val_count > 0
        assert est.extensions > 0
        assert est.elapsed > 0
        assert est.attr == "a"

    def test_missing_attr_rejected(self, spark):
        _, rels, schemas = _setup(spark, "Q1")
        with pytest.raises(ValueError):
            estimate_cardinality_spark(spark, rels, schemas, ("z",), k=5)

"""SparkSQL baseline: multi-round binary joins through Catalyst (§VII-A).

The query is decomposed into a left-deep chain of pairwise natural joins
— exactly how Spark SQL processes a multiway join — with relations
greedily reordered so every join shares at least one attribute (no
accidental cartesian products; the paper's queries are connected).
Broadcast joins are disabled session-wide (conftest), so every step is a
real shuffle join and intermediate results are fully materialized by the
exchange, which is the failure mode the paper reports for this baseline.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro.core.adj import relation_dfs
from repro.core.query import JoinQuery


def join_order(query: JoinQuery) -> list[int]:
    """Left-deep order: start with the first relation, then repeatedly
    take the earliest relation sharing an attribute with the bound set."""
    remaining = list(range(len(query.relations)))
    order = [remaining.pop(0)]
    bound = set(query.relations[order[0]].attrs)
    while remaining:
        nxt = next(
            (i for i in remaining if query.relations[i].attr_set & bound),
            remaining[0],
        )
        remaining.remove(nxt)
        order.append(nxt)
        bound |= query.relations[nxt].attr_set
    return order


def sparksql_join(
    spark: SparkSession, query: JoinQuery, edges: DataFrame
) -> DataFrame:
    """The natural join of all relations as chained ``DataFrame.join``s,
    projected to ``attrs(Q)``."""
    rels = relation_dfs(edges, query)
    order = join_order(query)
    df: DataFrame | None = None
    for i in order:
        r = query.relations[i]
        rdf = rels[r.name]
        if df is None:
            df = rdf
            continue
        shared = [c for c in df.columns if c in rdf.columns]
        df = df.join(rdf, on=shared) if shared else df.crossJoin(rdf)
    assert df is not None
    return df.select(*query.attrs)


def sparksql_count(
    spark: SparkSession, query: JoinQuery, edges: DataFrame
) -> int:
    """Result cardinality via the SparkSQL baseline."""
    return sparksql_join(spark, query, edges).count()

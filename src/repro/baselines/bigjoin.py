"""BigJoin baseline — multi-round parallel Leapfrog in dataflow (paper [8]).

Ammar et al.'s BigJoin extends partial bindings one attribute at a time
as a sequence of dataflow rounds: for each prefix the relation proposing
the *fewest* extensions is selected (the worst-case-optimality trick),
its proposals are generated, and every other relation containing the new
attribute validates them with semi-joins. Every round is a set of
Catalyst shuffle joins that materialize the intermediate binding table —
the multi-round shuffling cost the one-round methods avoid.
"""
from __future__ import annotations

from functools import reduce

from pyspark.sql import Column, DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.baselines.hcubej import heuristic_order
from repro.core.adj import relation_dfs
from repro.core.query import JoinQuery, Relation


def _argmin_chain(cols: list[str]) -> Column:
    """Index of the smallest of ``cols`` (first wins ties)."""
    mn = F.least(*[F.col(c) for c in cols]) if len(cols) > 1 else F.col(cols[0])
    expr = F.lit(len(cols) - 1)
    for i in range(len(cols) - 2, -1, -1):
        expr = F.when(F.col(cols[i]) == mn, F.lit(i)).otherwise(expr)
    return expr


def bigjoin(
    spark: SparkSession,
    query: JoinQuery,
    edges: DataFrame,
    order: tuple[str, ...] | None = None,
) -> DataFrame:
    """Evaluate the query attribute-at-a-time; returns bindings over
    ``attrs(Q)`` (column order follows ``order``)."""
    order = tuple(order or heuristic_order(query))
    rels = relation_dfs(edges, query)
    bindings: DataFrame | None = None
    bound: list[str] = []
    for attr in order:
        C: list[Relation] = query.relations_with(attr)
        if not C:
            raise ValueError(f"attribute {attr} in no relation")
        if bindings is None:
            projs = [
                rels[r.name].select(F.col(attr)).distinct() for r in C
            ]
            bindings = reduce(
                lambda x, y: x.join(y, on=attr, how="inner"), projs
            )
            bound = [attr]
            continue
        proposers = [r for r in C if r.attr_set & set(bound)]
        if not proposers:
            # attribute disconnected from the bound prefix: extend by the
            # intersection of the candidates' A-projections (cross product)
            projs = [
                rels[r.name].select(F.col(attr)).distinct() for r in C
            ]
            vals = reduce(lambda x, y: x.join(y, on=attr, how="inner"), projs)
            bindings = bindings.crossJoin(vals)
            bound.append(attr)
            continue
        # per-prefix extension counts for every proposer; a prefix with no
        # match in some proposer has an empty intersection and dies (inner)
        work = bindings
        cnt_cols: list[str] = []
        for i, r in enumerate(proposers):
            ov = [a for a in bound if a in r.attr_set]
            cnts = (
                rels[r.name]
                .groupBy(*ov)
                .count()
                .withColumnRenamed("count", f"_c{i}")
            )
            work = work.join(cnts, on=ov, how="inner")
            cnt_cols.append(f"_c{i}")
        work = work.withColumn("_chosen", _argmin_chain(cnt_cols))
        pieces: list[DataFrame] = []
        for i, r in enumerate(proposers):
            ov = [a for a in bound if a in r.attr_set]
            part = (
                work.filter(F.col("_chosen") == i)
                .select(*bound)
                .join(rels[r.name], on=ov)
                .select(*bound, attr)
            )
            pieces.append(part)
        proposals = reduce(DataFrame.unionByName, pieces)
        # validation: every relation containing the new attribute semi-joins
        # the proposals on its bound-attribute overlap plus the attribute
        for r in C:
            ov2 = [a for a in bound + [attr] if a in r.attr_set]
            proposals = proposals.join(
                rels[r.name].select(*ov2).distinct(),
                on=ov2,
                how="left_semi",
            )
        bindings = proposals
        bound.append(attr)
    assert bindings is not None
    return bindings.select(*order)


def bigjoin_count(
    spark: SparkSession,
    query: JoinQuery,
    edges: DataFrame,
    order: tuple[str, ...] | None = None,
) -> int:
    """Result cardinality via the BigJoin baseline."""
    return bigjoin(spark, query, edges, order).count()

"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# ---------------------------------------------------------------------------
# Graph datasets — stand-ins for the paper's SNAP/LAW graphs (§VII-A
# Table I). No network access in this container, so each real graph is
# replaced by a deterministic synthetic power-law graph ~1000× smaller
# (see DESIGN.md §4). Heavy-tailed degree skew is preserved via a
# Zipf-weighted configuration model; the relative size ordering
# WB < AS < WT < LJ < EN < OK matches the paper.
# ---------------------------------------------------------------------------

#: name -> (|R| edges in the real graph, real size in MB) from Table I.
PAPER_TABLE1 = {
    "WB": (13_200_000, 101.5),
    "AS": (22_100_000, 169.3),
    "WT": (50_900_000, 388.2),
    "LJ": (69_400_000, 529.2),
    "EN": (183_900_000, 1370.0),
    "OK": (234_400_000, 1788.1),
}

#: default down-scale applied to the paper's edge counts.
GRAPH_SCALE = 1e-3

#: per-dataset seeds so every stand-in is distinct yet deterministic.
_GRAPH_SEEDS = {"WB": 11, "AS": 12, "WT": 13, "LJ": 14, "EN": 15, "OK": 16}


def graph_edges_pdf(
    *,
    n_edges: int,
    n_nodes: int | None = None,
    zipf_a: float = 0.6,
    seed: int = 0,
) -> pd.DataFrame:
    """Directed simple power-law graph as a pandas frame ``(src, dst)``.

    Endpoints are drawn independently with probability ∝ rank^-zipf_a
    (a Zipf configuration model): hubs emerge with degree ≈
    ``n_edges · p(1)``, giving the skew that makes cyclic queries
    computationally hard. Self-loops and duplicate edges are dropped, so
    the realized edge count is slightly below ``n_edges``.
    """
    g = _rng(seed)
    if n_nodes is None:
        n_nodes = max(8, n_edges // 12)
    ranks = np.arange(1, n_nodes + 1)
    w = 1.0 / ranks**zipf_a
    w /= w.sum()
    src = g.choice(ranks, size=n_edges, p=w)
    dst = g.choice(ranks, size=n_edges, p=w)
    keep = src != dst
    pdf = pd.DataFrame({"src": src[keep], "dst": dst[keep]})
    pdf = pdf.drop_duplicates(ignore_index=True)
    return pdf.astype({"src": "int64", "dst": "int64"})


def dataset_pdf(name: str, *, scale: float = GRAPH_SCALE) -> pd.DataFrame:
    """The stand-in for Table I dataset ``name`` at ``scale`` of the real
    edge count. Deterministic in (name, scale)."""
    try:
        real_edges, _ = PAPER_TABLE1[name]
    except KeyError:
        raise KeyError(
            f"unknown dataset {name!r}; have {sorted(PAPER_TABLE1)}"
        ) from None
    return graph_edges_pdf(
        n_edges=max(8, int(real_edges * scale)), seed=_GRAPH_SEEDS[name]
    )


def dataset_edges(
    spark: SparkSession, name: str, *, scale: float = GRAPH_SCALE
) -> DataFrame:
    """Spark DataFrame ``(src, dst)`` for a Table I stand-in dataset."""
    return spark.createDataFrame(dataset_pdf(name, scale=scale))


def tiny_graph_pdf(*, n_edges: int = 300, n_nodes: int = 40, seed: int = 7) -> pd.DataFrame:
    """A small dense-ish graph for unit tests (triangles guaranteed at
    this density)."""
    return graph_edges_pdf(n_edges=n_edges, n_nodes=n_nodes, zipf_a=0.3, seed=seed)

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
# Bipartite-graph generators for the SOFA reproduction (paper §2.1, §6.1).
#
# The paper's evaluation is on bipartite graphs G = (U ∪ V, E), streamed as
# left-side vertices with their incident edges. Generators below are pure
# NumPy (the sequential engine consumes them directly); `to_spark_edges` /
# `to_spark_stream` lift them into DataFrames for the Spark implementation.
# ---------------------------------------------------------------------------
from dataclasses import dataclass, field
from typing import List, Optional


@dataclass
class BipartiteGraph:
    """A bipartite graph as an adjacency list over the left side.

    ``adj[u]`` is a sorted int64 array with the right-neighbors of left
    vertex ``u``. Ground-truth planted clusters (when generated) are kept
    as index lists; ``right_clusters`` may overlap, ``left_clusters``
    partition U for SBM data and may overlap for BMF-style data.
    """

    n_left: int
    n_right: int
    adj: List[np.ndarray]
    left_clusters: List[np.ndarray] = field(default_factory=list)
    right_clusters: List[np.ndarray] = field(default_factory=list)

    @property
    def n_edges(self) -> int:
        return int(sum(len(a) for a in self.adj))

    def degrees(self) -> np.ndarray:
        return np.asarray([len(a) for a in self.adj], dtype=np.int64)

    def edge_pandas(self) -> pd.DataFrame:
        """Edge list as a pandas frame with columns (u, v)."""
        us = np.repeat(np.arange(self.n_left), self.degrees())
        vs = np.concatenate(self.adj) if self.n_edges else np.empty(0, np.int64)
        return pd.DataFrame({"u": us.astype(np.int64), "v": vs.astype(np.int64)})


def bipartite_sbm(
    *,
    k: int,
    ell: int,
    n_right: int,
    r: int,
    p: float,
    q: float,
    seed: int = 0,
) -> BipartiteGraph:
    """Planted bipartite SBM exactly as in paper §6.1.

    For each of ``k`` ground-truth clusters, ``ell`` left vertices are
    planted; each right cluster V_i is ``r`` vertices sampled uniformly
    from the ``n_right`` right vertices (clusters may overlap). A left
    vertex in U_i links to v ∈ V_i w.p. ``p`` and to v ∉ V_i w.p. ``q``.
    """
    g = _rng(seed)
    right_clusters = [
        np.sort(g.choice(n_right, size=r, replace=False)) for _ in range(k)
    ]
    left_clusters = [
        np.arange(i * ell, (i + 1) * ell, dtype=np.int64) for i in range(k)
    ]
    adj: List[np.ndarray] = []
    all_v = np.arange(n_right)
    for i in range(k):
        vi = right_clusters[i]
        in_vi = np.zeros(n_right, dtype=bool)
        in_vi[vi] = True
        outside = all_v[~in_vi]
        for _ in range(ell):
            sig = vi[g.random(len(vi)) < p]
            noise = outside[g.random(len(outside)) < q]
            adj.append(np.sort(np.concatenate([sig, noise])).astype(np.int64))
    return BipartiteGraph(k * ell, n_right, adj, left_clusters, right_clusters)


def noise_q_for_expected_degree(expected_noise_deg: float, n_right: int, r: int) -> float:
    """q such that a left vertex gets ``expected_noise_deg`` noise edges
    in expectation (paper §6.1 uses 20 expected random neighbors)."""
    return min(1.0, expected_noise_deg / max(1, n_right - r))


def planted_zipf_bipartite(
    *,
    n_left: int,
    n_right: int,
    k_true: int,
    r: int,
    p: float,
    memberships_per_left: float,
    background_deg: float,
    zipf_alpha: float = 1.3,
    degree_zipf: float = 0.0,
    seed: int = 0,
) -> BipartiteGraph:
    """Real-world-like bipartite graph: overlapping planted clusters plus
    zipf-skewed background noise.

    This is the generator behind the six real-world stand-in datasets
    (DESIGN.md §3). Each left vertex draws ``Poisson(memberships_per_left)``
    cluster memberships (possibly zero — a pure-noise vertex), links to each
    member cluster's right vertices w.p. ``p``, and adds
    ``Poisson(background_deg)`` background edges to right vertices drawn
    from a zipf(``zipf_alpha``) popularity distribution — reproducing the
    few-high-degree-right-vertices property the paper stresses. When
    ``degree_zipf > 0``, per-left-vertex activity is itself zipf-skewed, so
    the median left degree can be driven to ~1 (the Book pathology).
    """
    g = _rng(seed)
    right_clusters = [
        np.sort(g.choice(n_right, size=r, replace=False)) for _ in range(k_true)
    ]
    # zipf popularity over right vertices for background edges
    pop = 1.0 / np.arange(1, n_right + 1) ** zipf_alpha
    pop /= pop.sum()
    pop_perm = g.permutation(n_right)  # popular ids scattered, not 0..n
    left_clusters: List[np.ndarray] = [[] for _ in range(k_true)]
    adj: List[np.ndarray] = []
    if degree_zipf > 0:
        act = 1.0 / np.arange(1, n_left + 1) ** degree_zipf
        act = act / act.mean()  # mean 1 — scales Poisson rates
        act = g.permutation(act)
    else:
        act = np.ones(n_left)
    for u in range(n_left):
        n_mem = g.poisson(memberships_per_left * act[u])
        mems = g.choice(k_true, size=min(n_mem, k_true), replace=False)
        parts = []
        for i in mems:
            vi = right_clusters[i]
            parts.append(vi[g.random(len(vi)) < p])
            left_clusters[i].append(u)
        n_bg = g.poisson(background_deg * act[u])
        if n_bg > 0:
            parts.append(pop_perm[g.choice(n_right, size=n_bg, p=pop)])
        if parts:
            nbrs = np.unique(np.concatenate(parts)).astype(np.int64)
        else:
            nbrs = np.empty(0, dtype=np.int64)
        adj.append(nbrs)
    lc = [np.asarray(sorted(c), dtype=np.int64) for c in left_clusters]
    return BipartiteGraph(n_left, n_right, adj, lc, right_clusters)


def lineitem_bipartite(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> BipartiteGraph:
    """Market-basket bipartite view of TPC-H-lite lineitem: left = orders,
    right = parts, edge = order contains part (paper §1 motivates exactly
    this market-basket stream)."""
    pdf = lineitem(spark, sf=sf, seed=seed).select("l_orderkey", "l_partkey").toPandas()
    pdf = pdf.drop_duplicates()
    n_left = int(pdf["l_orderkey"].max())
    n_right = int(pdf["l_partkey"].max())
    adj: List[np.ndarray] = [np.empty(0, dtype=np.int64)] * n_left
    for okey, grp in pdf.groupby("l_orderkey"):
        adj[int(okey) - 1] = np.sort(grp["l_partkey"].to_numpy() - 1).astype(np.int64)
    return BipartiteGraph(n_left, n_right, adj)


def to_spark_edges(spark: SparkSession, graph: BipartiteGraph) -> DataFrame:
    """Edge-list DataFrame (u BIGINT, v BIGINT)."""
    return spark.createDataFrame(graph.edge_pandas())


def to_spark_stream(spark: SparkSession, graph: BipartiteGraph, *, num_partitions: Optional[int] = None) -> DataFrame:
    """Vertex-stream DataFrame: one row per left vertex, in stream order,
    with its neighbor array — the unit of arrival in the paper's model."""
    pdf = pd.DataFrame(
        {
            "u": np.arange(graph.n_left, dtype=np.int64),
            "neighbors": [a.tolist() for a in graph.adj],
        }
    )
    df = spark.createDataFrame(pdf, schema="u bigint, neighbors array<bigint>")
    if num_partitions is not None:
        df = df.repartition(num_partitions, "u")
    return df

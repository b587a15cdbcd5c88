"""Social-network substrate: synthetic stand-ins for the paper's datasets.

The paper evaluates on Flixster, Douban-Book, Douban-Movie and Twitter
(Table 2). Those require crawled data we cannot download, so we generate
deterministic power-law graphs with the same *shape* at reduced scale
(documented in DESIGN.md / EXPERIMENTS.md): Flixster-lite is undirected
with the highest average degree of the three small networks, the
Douban-lites are directed and sparser, Twitter-lite is the largest and by
far the densest (paper avg degree 70.5).

Edges carry the weighted-cascade influence probability
``p(u, v) = 1 / d_in(v)`` (§6.1.3), computed with a Spark aggregation.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


@dataclass
class SocialGraph:
    """A directed influence graph: cached edges (src, dst, p) + metadata.

    ``n`` counts nodes 0..n-1 (isolated nodes allowed); ``m`` is the
    number of directed edges stored; ``directed`` is False when the edge
    list is a symmetrized undirected graph (each pair stored both ways).
    """

    name: str
    n: int
    directed: bool
    edges: DataFrame

    @property
    def m(self) -> int:
        if not hasattr(self, "_m"):
            self._m = self.edges.count()
        return self._m

    def reverse_edges(self) -> DataFrame:
        """Edges with src/dst swapped (for reverse-reachability sampling)."""
        return self.edges.select(
            F.col("dst").alias("src"), F.col("src").alias("dst"), "p"
        )


def _with_weighted_cascade(spark: SparkSession, pairs: pd.DataFrame) -> DataFrame:
    """Attach p = 1/d_in(dst) to a (src, dst) pandas edge list via Spark."""
    edges = spark.createDataFrame(pairs).select(
        F.col("src").cast("long"), F.col("dst").cast("long")
    )
    indeg = edges.groupBy("dst").agg(F.count("*").alias("d_in"))
    return (
        edges.join(indeg, "dst")
        .select("src", "dst", (F.lit(1.0) / F.col("d_in")).alias("p"))
        .persist()
    )


def from_edge_pairs(
    spark: SparkSession,
    pairs: np.ndarray,
    *,
    name: str,
    n: int,
    directed: bool = True,
) -> SocialGraph:
    """Build a SocialGraph from an (m, 2) array of (src, dst) pairs.

    Self-loops and duplicate edges are dropped; undirected graphs are
    symmetrized (both directions stored).
    """
    pairs = pairs[pairs[:, 0] != pairs[:, 1]]
    if not directed:
        pairs = np.concatenate([pairs, pairs[:, ::-1]])
    pairs = np.unique(pairs, axis=0)
    pdf = pd.DataFrame({"src": pairs[:, 0], "dst": pairs[:, 1]})
    g = SocialGraph(
        name=name, n=n, directed=directed, edges=_with_weighted_cascade(spark, pdf)
    )
    g.edges.count()  # materialize the cache
    return g


def power_law_graph(
    spark: SparkSession,
    *,
    name: str,
    n: int,
    m_target: int,
    directed: bool = True,
    seed: int = 0,
    alpha: float = 0.8,
) -> SocialGraph:
    """Deterministic heavy-tailed random graph.

    Endpoints are drawn from a Zipf-like rank distribution with exponent
    ``alpha`` over two independent node permutations (so in- and
    out-degree hubs differ), giving power-law-ish in/out degree tails like
    real social networks. ``m_target`` is approximate (duplicates and
    self-loops are dropped). For undirected graphs ``m_target`` counts
    undirected pairs.
    """
    rng = np.random.default_rng(seed)
    ranks = np.arange(1, n + 1, dtype=float)
    w = ranks ** (-alpha)
    w /= w.sum()
    n_draw = int(m_target * 1.25)
    perm_src = rng.permutation(n)
    perm_dst = rng.permutation(n)
    src = perm_src[rng.choice(n, size=n_draw, p=w)]
    dst = perm_dst[rng.choice(n, size=n_draw, p=w)]
    pairs = np.unique(np.column_stack([src, dst]), axis=0)
    pairs = pairs[pairs[:, 0] != pairs[:, 1]]
    if len(pairs) > m_target:
        keep = rng.choice(len(pairs), size=m_target, replace=False)
        pairs = pairs[np.sort(keep)]
    return from_edge_pairs(spark, pairs, name=name, n=n, directed=directed)


def er_graph(
    spark: SparkSession, *, name: str, n: int, m_target: int, seed: int = 0
) -> SocialGraph:
    """Small Erdős–Rényi-style directed graph (tests)."""
    rng = np.random.default_rng(seed)
    pairs = rng.integers(0, n, size=(int(m_target * 1.3), 2))
    pairs = np.unique(pairs[pairs[:, 0] != pairs[:, 1]], axis=0)[:m_target]
    return from_edge_pairs(spark, pairs, name=name, n=n, directed=True)


#: Edges of the Figure 1 example network (all probabilities 1). Nodes are
#: 0-indexed: paper's v1..v7 are 0..6. Reachability: v5 (=4) reaches
#: {v3..v7} (5 nodes incl. itself), v1 (=0) reaches {v1..v4} (4 nodes).
FIG1_EDGES = [(0, 1), (1, 2), (2, 3), (4, 2), (4, 5), (5, 6)]


def fig1_graph(spark: SparkSession) -> SocialGraph:
    """The 7-node example network of Figure 1 with p = 1 on every edge."""
    pdf = pd.DataFrame(FIG1_EDGES, columns=["src", "dst"])
    edges = spark.createDataFrame(pdf).select(
        F.col("src").cast("long"), F.col("dst").cast("long"), F.lit(1.0).alias("p")
    ).persist()
    g = SocialGraph(name="fig1", n=7, directed=True, edges=edges)
    g.edges.count()
    return g


#: Stand-in sizes: name -> (n, m_target, directed, seed). Paper sizes in
#: parentheses: Flixster 12.9K/192K undirected, Douban-Book 23.3K/141K,
#: Douban-Movie 34.9K/274K, Twitter 41.7M/1.47G. We scale to laptop-Spark
#: size keeping relative density (Twitter-lite avg degree ~70).
NETWORK_SPECS = {
    "flixster-lite": (1500, 22200, False, 11),
    "douban-book-lite": (2300, 14950, True, 12),
    "douban-movie-lite": (3500, 27650, True, 13),
    "twitter-lite": (5000, 352500, True, 14),
}


def load_network(spark: SparkSession, name: str) -> SocialGraph:
    """Build one of the four stand-in networks by name."""
    n, m, directed, seed = NETWORK_SPECS[name]
    return power_law_graph(
        spark, name=name, n=n, m_target=m, directed=directed, seed=seed
    )

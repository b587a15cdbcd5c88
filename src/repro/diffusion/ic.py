"""Single-item independent-cascade diffusion (§2) as iterative dataflow.

``spread_mc`` estimates the expected spread σ(S) by simulating W edge
possible worlds *in one Spark job*: the state DataFrame carries a
``world`` column and the frontier expansion joins all worlds against the
edge list simultaneously. Edge liveness is the deterministic hash coin of
``diffusion.common.coin`` keyed by (world, src, dst), so the same seed
reproduces the same worlds — and nested seed sets see *consistent* worlds
(used to test monotonicity and submodularity of σ per-world).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.diffusion.common import checkpointed, coin
from repro.graphs.generator import SocialGraph

MAX_SUPERSTEPS = 200


def _worlds_seeds(
    spark: SparkSession, seeds: list[int], n_worlds: int
) -> DataFrame:
    worlds = spark.range(n_worlds).select(F.col("id").cast("int").alias("world"))
    seed_df = spark.createDataFrame(
        [(int(s),) for s in seeds], "node long"
    )
    return worlds.crossJoin(seed_df)


def active_nodes(
    graph: SocialGraph, seeds: list[int], *, n_worlds: int, seed: int
) -> DataFrame:
    """(world, node) pairs active at the end of diffusion, all worlds."""
    spark = graph.edges.sparkSession
    if not seeds:
        return spark.createDataFrame([], "world int, node long")
    active = checkpointed(_worlds_seeds(spark, seeds, n_worlds))
    frontier = active
    edges = graph.edges
    for _ in range(MAX_SUPERSTEPS):
        msgs = (
            frontier.join(edges, frontier.node == edges.src)
            .where(coin(seed, "world", "src", "dst") < F.col("p"))
            .select("world", F.col("dst").alias("node"))
            .distinct()
        )
        new = checkpointed(msgs.join(active, ["world", "node"], "left_anti"))
        if new.isEmpty():
            break
        active = checkpointed(active.union(new))
        frontier = new
    return active


def spread_mc(
    graph: SocialGraph, seeds: list[int], *, n_worlds: int = 32, seed: int = 0
) -> float:
    """Monte-Carlo estimate of the expected spread σ(seeds)."""
    if not seeds:
        return 0.0
    per_world = (
        active_nodes(graph, seeds, n_worlds=n_worlds, seed=seed)
        .groupBy("world")
        .count()
        .toPandas()
    )
    total = float(per_world["count"].sum())  # worlds absent => impossible (seeds always active)
    return total / n_worlds


def exact_reachable(graph: SocialGraph, seeds: list[int]) -> set[int]:
    """Deterministic reachability (valid when every edge has p = 1)."""
    edges = graph.edges.select("src", "dst").toPandas()
    adj: dict[int, list[int]] = {}
    for s, d in edges.itertuples(index=False):
        adj.setdefault(int(s), []).append(int(d))
    seen = set(int(s) for s in seeds)
    stack = list(seen)
    while stack:
        u = stack.pop()
        for v in adj.get(u, ()):
            if v not in seen:
                seen.add(v)
                stack.append(v)
    return seen


def spread_exact_enumeration(graph: SocialGraph, seeds: list[int]) -> float:
    """Exact σ(S) by enumerating all 2^m edge worlds (tiny graphs only)."""
    edges = graph.edges.select("src", "dst", "p").toPandas()
    m = len(edges)
    assert m <= 16, "exact enumeration is 2^m"
    total = 0.0
    es = edges.to_numpy()
    for world in range(1 << m):
        prob = 1.0
        adj: dict[int, list[int]] = {}
        for j in range(m):
            s, d, p = int(es[j][0]), int(es[j][1]), float(es[j][2])
            if world >> j & 1:
                prob *= p
                adj.setdefault(s, []).append(d)
            else:
                prob *= 1.0 - p
        if prob == 0.0:
            continue
        seen = set(int(x) for x in seeds)
        stack = list(seen)
        while stack:
            u = stack.pop()
            for v in adj.get(u, ()):
                if v not in seen:
                    seen.add(v)
                    stack.append(v)
        total += prob * len(seen)
    return total

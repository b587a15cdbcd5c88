"""Random reverse-reachable (RR) set sampling and greedy max-cover.

RR-set *generation* — the dominant cost in IMM/PRIMM — is a batched
Spark dataflow: thousands of RR sets grow simultaneously as a reverse
BFS over the transposed edge list, with a deterministic coin per
``(rr_id, src, dst)``. Each RR set may retain nodes with a per-node
probability (``node_prob``), which is how the Com-IC baselines reweight
RR sets by GAP adoption probabilities.

``RRCollection`` accumulates generated sets on the driver and runs IMM's
``NodeSelection`` (lazy-free plain greedy max-cover with an inverted
index) — sequential by nature, tiny at our scale, as in the reference
IMM implementation.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import functions as F

from repro.diffusion.common import checkpointed, coin
from repro.graphs.generator import SocialGraph

MAX_DEPTH = 200


def sample_rr_sets(
    graph: SocialGraph,
    n_rr: int,
    *,
    seed: int,
    id_offset: int = 0,
    node_probs: np.ndarray | None = None,
) -> list[np.ndarray]:
    """Generate ``n_rr`` RR sets in one iterative Spark job.

    Roots are uniform over V. An edge (u, v) is traversed (reverse
    direction) iff its coin keyed ``(seed, rr_id, u, v)`` is < p(u, v).
    If ``node_probs`` is given (length n), a traversed-to node u is kept
    in the RR set iff its coin keyed ``(seed, rr_id, u)`` is <
    ``node_probs[u]`` — rejected nodes do not extend the BFS (used by the
    Com-IC baselines; plain IC keeps every node).

    Returns a list of ``n_rr`` numpy arrays of node ids; ``id_offset``
    shifts the coin keys so successive batches are independent.
    """
    spark = graph.edges.sparkSession
    rng = np.random.default_rng((seed, id_offset))
    roots = rng.integers(0, graph.n, size=n_rr)
    frontier_pdf = pd.DataFrame(
        {"rr": np.arange(n_rr, dtype=np.int64) + id_offset, "node": roots}
    )
    frontier = spark.createDataFrame(frontier_pdf)
    if node_probs is not None:
        probs = spark.createDataFrame(
            pd.DataFrame(
                {"node": np.arange(graph.n, dtype=np.int64), "q": node_probs}
            )
        )
        frontier = frontier.join(probs, "node").where(
            coin(seed + 7, "rr", "node") < F.col("q")
        ).select("rr", "node")
    frontier = checkpointed(frontier)
    visited = frontier
    redges = graph.reverse_edges()  # src = original dst; walk dst->src
    for _ in range(MAX_DEPTH):
        if frontier.isEmpty():
            break
        # reverse step: from node v (frontier) to its in-neighbour u over
        # original edge (u, v): redges has src=v, dst=u, p=p(u, v).
        step = (
            frontier.join(redges, frontier.node == redges.src)
            .where(coin(seed, "rr", F.col("dst"), F.col("src")) < F.col("p"))
            .select("rr", F.col("dst").alias("node"))
            .distinct()
        )
        new = step.join(visited, ["rr", "node"], "left_anti")
        if node_probs is not None:
            new = (
                new.join(probs, "node")
                .where(coin(seed + 7, "rr", "node") < F.col("q"))
                .select("rr", "node")
            )
        new = checkpointed(new)
        visited = checkpointed(visited.union(new))
        frontier = new
    pdf = visited.toPandas()
    out: list[np.ndarray] = [np.empty(0, dtype=np.int64)] * n_rr
    if len(pdf):
        pdf = pdf.sort_values("rr")
        for rr, grp in pdf.groupby("rr"):
            out[int(rr) - id_offset] = grp["node"].to_numpy()
    return out


class RRCollection:
    """Driver-side accumulator of RR sets + greedy NodeSelection."""

    def __init__(self, n_nodes: int) -> None:
        self.n = n_nodes
        self.sets: list[np.ndarray] = []

    def __len__(self) -> int:
        return len(self.sets)

    def extend(self, new_sets: list[np.ndarray]) -> None:
        self.sets.extend(new_sets)

    def node_selection(self, k: int) -> tuple[list[int], np.ndarray]:
        """IMM's NodeSelection: greedy max ``k``-cover over the RR sets.

        Returns the ordered seed list (length ``min(k, n)``) and the
        cumulative covered *fraction* after each prefix, so
        ``F_R(S_j) = coverage[j-1]`` — exactly what PRIMM's check needs.
        """
        n_rr = len(self.sets)
        if n_rr == 0:
            return [], np.zeros(0)
        flat_nodes = np.concatenate([s for s in self.sets]) if n_rr else np.empty(0)
        flat_rrs = np.concatenate(
            [np.full(len(s), i, dtype=np.int64) for i, s in enumerate(self.sets)]
        ) if n_rr else np.empty(0)
        counts = np.bincount(flat_nodes, minlength=self.n).astype(np.int64)
        # inverted index node -> rr ids (CSR)
        order = np.argsort(flat_nodes, kind="stable")
        sorted_nodes = flat_nodes[order]
        sorted_rrs = flat_rrs[order]
        starts = np.searchsorted(sorted_nodes, np.arange(self.n + 1))
        covered = np.zeros(n_rr, dtype=bool)
        seeds: list[int] = []
        coverage: list[float] = []
        n_cov = 0
        for _ in range(min(k, self.n)):
            v = int(counts.argmax())
            seeds.append(v)
            for rr in sorted_rrs[starts[v]:starts[v + 1]]:
                if not covered[rr]:
                    covered[rr] = True
                    n_cov += 1
                    s = self.sets[rr]
                    counts[s] -= 1
            coverage.append(n_cov / n_rr)
        return seeds, np.asarray(coverage)

    def coverage_of(self, seeds: list[int]) -> float:
        """F_R(S): fraction of RR sets intersecting ``seeds``."""
        if not len(self.sets):
            return 0.0
        seed_set = np.zeros(self.n, dtype=bool)
        seed_set[np.asarray(seeds, dtype=np.int64)] = True
        hit = sum(1 for s in self.sets if len(s) and seed_set[s].any())
        return hit / len(self.sets)

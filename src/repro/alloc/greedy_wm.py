"""greedyWM (Algorithm 1): greedy welfare-maximizing seed allocation.

Select the top-b̄ prefix-preserving seeds with PRIMM, then assign the
top-``b_i`` of them to every item ``i``. The algorithm is agnostic to
valuations, prices and noise — it needs only the graph and the budget
vector (the "power of bundling", §5.1); the (1−1/e−ε) welfare guarantee
is Theorem 3.

Budget convention: ``budgets[j]`` is the budget of item ``j`` (bit ``j``),
non-increasing in ``j`` (the paper's item ordering).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.diffusion.epic import Allocation
from repro.graphs.generator import SocialGraph
from repro.im.primm import PrimmResult, primm


@dataclass
class AllocationResult:
    """An allocation plus provenance for runtime accounting."""

    allocation: dict[int, int]     # node -> itemset bitmask
    seeds_per_item: dict[int, list[int]]
    n_rr: int = 0                  # RR sets generated (0 for RR-free algos)


def greedy_wm(
    graph: SocialGraph,
    budgets: list[int],
    *,
    eps: float = 0.5,
    ell: float = 1.0,
    seed: int = 0,
) -> AllocationResult:
    """Algorithm 1. Returns node→mask with top-``b_i`` seeds per item."""
    res: PrimmResult = primm(graph, list(budgets), eps=eps, ell=ell, seed=seed)
    allocation: dict[int, int] = {}
    seeds_per_item: dict[int, list[int]] = {}
    for item, b in enumerate(budgets):
        chosen = res.seeds[: int(b)]
        seeds_per_item[item] = chosen
        for v in chosen:
            allocation[v] = allocation.get(v, 0) | (1 << item)
    return AllocationResult(
        allocation=allocation, seeds_per_item=seeds_per_item, n_rr=res.n_rr
    )

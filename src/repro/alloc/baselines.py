"""item-disj and bundle-disj baselines (§6.1.2.2–6.1.2.3).

- **item-disj** gives every seed node exactly one item: one IMM call with
  budget Σ b_i, then items (visited in non-increasing budget order) take
  disjoint slices of the ranked seed list.
- **bundle-disj** forms minimum-sized bundles with non-negative
  deterministic utility and gives each bundle a fresh (disjoint) seed
  set of size min-budget, decrementing budgets; leftover budgets reuse
  earlier bundles' seeds and finally fresh IMM seeds. It invokes IMM once
  per bundle/leftover (the reason it is slower than greedyWM at many
  items, Fig. 6).
"""
from __future__ import annotations

from itertools import combinations

import numpy as np

from repro.alloc.greedy_wm import AllocationResult
from repro.core.utility import UtilityModel
from repro.graphs.generator import SocialGraph
from repro.im.imm import imm


def item_disj(
    graph: SocialGraph,
    budgets: list[int],
    *,
    eps: float = 0.5,
    ell: float = 1.0,
    seed: int = 0,
) -> AllocationResult:
    """One item per seed node (§6.1.2.2)."""
    total = int(sum(budgets))
    res = imm(graph, total, eps=eps, ell=ell, seed=seed)
    ranked = list(res.seeds)
    allocation: dict[int, int] = {}
    seeds_per_item: dict[int, list[int]] = {}
    order = sorted(range(len(budgets)), key=lambda j: -budgets[j])
    pos = 0
    for item in order:
        b = int(budgets[item])
        chosen = ranked[pos : pos + b]
        pos += b
        seeds_per_item[item] = chosen
        for v in chosen:
            allocation[v] = allocation.get(v, 0) | (1 << item)
    return AllocationResult(allocation, seeds_per_item, n_rr=res.n_rr)


def _min_bundle(det_util: np.ndarray, items: list[int], rem: dict[int, int]) -> int:
    """Smallest non-negative-deterministic-utility subset of ``items``
    (ties: first in mask order, the paper's scan order). 0 if none."""
    avail = [j for j in items if rem.get(j, 0) > 0]
    for size in range(1, len(avail) + 1):
        candidates = sorted(
            sum(1 << j for j in combo) for combo in combinations(avail, size)
        )
        for mask in candidates:
            if det_util[mask] >= -1e-12:
                return mask
    return 0


def bundle_disj(
    graph: SocialGraph,
    model: UtilityModel,
    budgets: list[int],
    *,
    eps: float = 0.5,
    ell: float = 1.0,
    seed: int = 0,
) -> AllocationResult:
    """Bundle-based disjoint allocation (§6.1.2.3)."""
    det = model.det_utility()
    rem = {j: int(b) for j, b in enumerate(budgets)}
    items = sorted(rem, key=lambda j: -budgets[j])
    bundles: list[tuple[int, list[int]]] = []   # (mask, seed nodes)
    allocation: dict[int, int] = {}
    seeds_per_item: dict[int, list[int]] = {j: [] for j in rem}
    used: set[int] = set()
    n_rr = 0

    def fresh_seeds(count: int) -> list[int]:
        """``count`` highest-ranked seeds disjoint from all used ones —
        one IMM invocation per call, as the paper's accounting assumes."""
        nonlocal n_rr
        res = imm(graph, count + len(used), eps=eps, ell=ell, seed=seed)
        n_rr += res.n_rr
        out = [v for v in res.seeds if v not in used][:count]
        used.update(out)
        return out

    while True:
        mask = _min_bundle(det, items, rem)
        if mask == 0:
            break
        members = [j for j in items if mask >> j & 1]
        b_bundle = min(rem[j] for j in members)
        nodes = fresh_seeds(b_bundle)
        bundles.append((mask, nodes))
        for j in members:
            rem[j] -= b_bundle
            seeds_per_item[j].extend(nodes)
        for v in nodes:
            allocation[v] = allocation.get(v, 0) | mask
    # Leftover budgets: reuse earlier bundles' seeds, then fresh seeds.
    for j in items:
        for mask, nodes in bundles:
            if rem[j] <= 0:
                break
            if mask >> j & 1:
                continue
            take = nodes[: rem[j]]
            rem[j] -= len(take)
            seeds_per_item[j].extend(take)
            for v in take:
                allocation[v] = allocation.get(v, 0) | (1 << j)
        if rem[j] > 0:
            nodes = fresh_seeds(rem[j])
            rem[j] = 0
            seeds_per_item[j].extend(nodes)
            for v in nodes:
                allocation[v] = allocation.get(v, 0) | (1 << j)
    return AllocationResult(allocation, seeds_per_item, n_rr=n_rr)

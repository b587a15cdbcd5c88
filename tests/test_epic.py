"""Tests for the EPIC diffusion simulator — Example 1 end-to-end, the
model's proven properties (Theorem 1, Lemma 4, Theorem 2's asymmetries),
and consistency of the multi-allocation batched evaluation."""
import numpy as np
import pytest

from repro.core import configs
from repro.core.itemsets import popcount
from repro.diffusion.epic import (
    allocation_from_pairs,
    final_adoptions,
    simulate_welfare,
    simulate_welfare_multi,
)
from repro.diffusion.ic import exact_reachable
from repro.graphs.generator import er_graph, fig1_graph


@pytest.fixture(scope="module")
def fig1(spark):
    return fig1_graph(spark)


@pytest.fixture(scope="module")
def example():
    return configs.example_model()


# ---- Example 1 ---------------------------------------------------------

GREEDY = [(4, 0), (4, 1), (4, 2), (0, 0)]     # all 3 items -> v5; i1 -> v1
ALT = [(0, 0), (0, 1), (4, 0), (4, 2)]        # {i1,i2} -> v1; {i1,i3} -> v5


def test_example1_greedy_welfare_15(fig1, example):
    r = simulate_welfare(fig1, example, allocation_from_pairs(GREEDY), n_worlds=2, seed=0)
    assert r.welfare == pytest.approx(15.0)
    assert r.adoptions == pytest.approx(15.0)


def test_example1_alternative_welfare_11_adoptions_16(fig1, example):
    """The allocation with MORE adoptions (16 vs 15) has LESS welfare
    (11 vs 15) — the paper's motivating misalignment."""
    r = simulate_welfare(fig1, example, allocation_from_pairs(ALT), n_worlds=2, seed=0)
    assert r.welfare == pytest.approx(11.0)
    assert r.adoptions == pytest.approx(16.0)


def test_example1_adoption_sets(fig1, example):
    """v1,v2 adopt {i1,i2}; v3,v4 adopt all; v5,v6,v7 adopt {i1,i3}."""
    adopt = final_adoptions(fig1, example, allocation_from_pairs(ALT), n_worlds=1, seed=0)
    got = dict(zip(adopt["node"], adopt["adopt"]))
    assert got[0] == 0b011 and got[1] == 0b011
    assert got[2] == 0b111 and got[3] == 0b111
    assert got[4] == 0b101 and got[5] == 0b101 and got[6] == 0b101


def test_example1_seed_adopts_nothing_alone(fig1, example):
    """i1 alone has negative utility: a lone i1 seed adopts nothing and
    nothing propagates."""
    r = simulate_welfare(fig1, example, {0: 0b001}, n_worlds=2, seed=0)
    assert r.welfare == 0.0 and r.adoptions == 0.0


# ---- model properties --------------------------------------------------


def test_theorem1_monotone_per_world(spark):
    """Theorem 1: welfare is monotone in the allocation — holds in every
    shared possible world thanks to consistent coins."""
    g = er_graph(spark, name="er-epic1", n=60, m_target=300, seed=1)
    m = configs.two_item_model(3)
    small = allocation_from_pairs([(0, 0), (1, 1)])
    big = allocation_from_pairs([(0, 0), (1, 1), (2, 0), (3, 1), (4, 0)])
    res = simulate_welfare_multi(g, m, {"small": small, "big": big}, n_worlds=6, seed=3)
    assert np.all(
        res["big"].per_world_welfare >= res["small"].per_world_welfare - 1e-9
    )


def test_lemma4_adoption_propagates_by_reachability(fig1, example):
    """If u adopts item i, every node reachable from u adopts i too."""
    adopt = final_adoptions(
        fig1, example, allocation_from_pairs(GREEDY), n_worlds=1, seed=0
    )
    got = dict(zip(adopt["node"], adopt["adopt"]))
    for u, mask in list(got.items()):
        for v in exact_reachable(fig1, [u]):
            assert got.get(v, 0) & mask == mask


def test_multi_matches_single(spark):
    g = er_graph(spark, name="er-epic2", n=50, m_target=250, seed=2)
    m = configs.two_item_model(1)
    alloc = allocation_from_pairs([(0, 0), (0, 1), (7, 0), (7, 1)])
    multi = simulate_welfare_multi(g, m, {"a": alloc, "b": {}}, n_worlds=4, seed=9)
    single = simulate_welfare(g, m, alloc, n_worlds=4, seed=9)
    assert multi["a"].welfare == pytest.approx(single.welfare)
    assert multi["b"].welfare == 0.0


def test_deterministic_in_seed(spark):
    g = er_graph(spark, name="er-epic3", n=50, m_target=250, seed=3)
    m = configs.two_item_model(5)
    alloc = allocation_from_pairs([(0, 0), (1, 1)])
    a = simulate_welfare(g, m, alloc, n_worlds=4, seed=21).welfare
    b = simulate_welfare(g, m, alloc, n_worlds=4, seed=21).welfare
    assert a == b


def test_per_world_welfare_nonnegative(spark):
    """No node ever ends with a negative-utility adoption set (the
    argmax always admits ∅), so per-world welfare is never negative."""
    g = er_graph(spark, name="er-epic4", n=60, m_target=300, seed=4)
    m = configs.two_item_model(1)
    alloc = allocation_from_pairs([(i, i % 2) for i in range(8)])
    r = simulate_welfare(g, m, alloc, n_worlds=6, seed=17)
    assert np.all(r.per_world_welfare >= -1e-9)


def test_real_model_bundle_spreads(spark):
    """The non-supermodular real model: seeding the full positive bundle
    {ps,c,g1,g2,g3} at a hub yields positive welfare via the pair-table
    path."""
    g = er_graph(spark, name="er-epic5", n=60, m_target=360, seed=5)
    m = configs.real_model()
    alloc = {0: 0b11111, 1: 0b11111}
    r = simulate_welfare(g, m, alloc, n_worlds=4, seed=2)
    assert r.welfare > 0.0
    assert r.adoptions >= 2 * 5  # at least the seeds adopt the bundle


def test_supermodularity_bundling_beats_splitting(fig1, example):
    """Theorem 2 intuition: bundling complements at one hub beats
    splitting them across hubs (the crux of greedyWM's optimality)."""
    bundled = allocation_from_pairs([(4, 0), (4, 1), (4, 2)])
    split = allocation_from_pairs([(4, 0), (0, 1), (1, 2)])
    res = simulate_welfare_multi(
        fig1, example, {"bundled": bundled, "split": split}, n_worlds=2, seed=0
    )
    assert res["bundled"].welfare > res["split"].welfare


def test_empty_allocation(fig1, example):
    r = simulate_welfare(fig1, example, {}, n_worlds=2, seed=0)
    assert r.welfare == 0.0 and r.adoptions == 0.0

"""Unit tests for the utility model and adoption lookup tables."""
import numpy as np
import pytest

from repro.core import configs
from repro.core.itemsets import popcount, submasks
from repro.core.utility import (
    UtilityModel,
    adoption_tables_for_worlds,
    g_table,
    g_table_values,
    norm_cdf,
    pair_table,
)

# ---- Table 3 GAP reproduction (Eq. 5) ---------------------------------

PAPER_GAP = {
    1: {"q_1|0": 0.1, "q_2|0": 0.1, "q_1|2": 0.99, "q_2|1": 0.99},
    3: {"q_1|0": 0.5, "q_2|0": 0.5, "q_1|2": 0.84, "q_2|1": 0.84},
    5: {"q_1|0": 0.5, "q_2|0": 0.16, "q_1|2": 0.98, "q_2|1": 0.84},
}


@pytest.mark.parametrize("cfg", [1, 2, 3, 4, 5, 6])
@pytest.mark.parametrize("param", ["q_1|0", "q_2|0", "q_1|2", "q_2|1"])
def test_table3_gap_matches_paper(cfg, param):
    """The GAP column of Table 3 is derived from price/value/noise via
    Eq. (5); our derivation must match the paper's printed values."""
    base = cfg if cfg in PAPER_GAP else cfg - 1  # 2,4,6 share 1,3,5's utilities
    got = configs.two_item_model(cfg).gap_params()[param]
    assert got == pytest.approx(PAPER_GAP[base][param], abs=0.005)


def test_norm_cdf_known_values():
    assert norm_cdf(0.0) == pytest.approx(0.5)
    assert norm_cdf(1.0) == pytest.approx(0.8413, abs=1e-4)
    assert norm_cdf(-2.3) == pytest.approx(0.0107, abs=1e-4)


# ---- model invariants --------------------------------------------------


@pytest.mark.parametrize("cfg", [1, 2, 3, 4, 5, 6])
def test_two_item_models_supermodular(cfg):
    m = configs.two_item_model(cfg)
    assert m.supermodular
    assert m.monotone_value()
    assert m.det_utility()[0] == 0.0


def test_expected_utility_is_det_utility():
    """E[U] = V - P because noise is zero-mean (§3.1)."""
    m = configs.two_item_model(3)
    rng = np.random.default_rng(0)
    samples = np.stack(
        [m.utilities_in_world(m.sample_noise(rng)) for _ in range(4000)]
    )
    assert np.allclose(samples.mean(axis=0), m.det_utility(), atol=0.1)


def test_noise_additive_over_items():
    m = configs.two_item_model(1)
    noise = np.array([0.7, -0.3])
    u = m.utilities_in_world(noise)
    det = m.det_utility()
    assert u[1] == pytest.approx(det[1] + 0.7)
    assert u[2] == pytest.approx(det[2] - 0.3)
    assert u[3] == pytest.approx(det[3] + 0.4)


# ---- adoption lookup tables -------------------------------------------


def brute_unconstrained(util, d):
    """Max-utility subset of d; ties -> larger cardinality then mask."""
    best = max(submasks(d), key=lambda s: (round(util[s], 9), popcount(s), s))
    return best, util[best]


def brute_constrained(util, d, a):
    cands = [a | s for s in submasks(d & ~a)]
    return max(cands, key=lambda s: (round(util[s], 9), popcount(s), s))


@pytest.mark.parametrize("seed", range(8))
def test_g_table_matches_bruteforce_supermodular(seed):
    """g(D) achieves the max utility over subsets of D, and for
    supermodular U it is the union of all maximizers (Lemma 2)."""
    n = 4
    rng = np.random.default_rng(seed)
    # random supermodular U: modular base + increasing-size convex bonus
    base = (popcount(np.arange(1 << n)) ** 2).astype(float)
    util = base * rng.uniform(0.5, 1.5) + np.sort(rng.normal(0, 2, 1 << n))
    # build a genuinely supermodular function instead: V = a*|S|^2 + modular
    mod = np.array([sum(rng.normal(0, 3) for _ in range(1)) for _ in range(n)])
    util = base + np.array([sum(mod[j] for j in range(n) if m >> j & 1) for m in range(1 << n)])
    util[0] = 0.0
    g = g_table(util, n)
    gv = g_table_values(util, n)
    for d in range(1 << n):
        _, bu = brute_unconstrained(util, d)
        assert util[g[d]] == pytest.approx(bu)
        assert gv[d] == pytest.approx(bu)
        assert (g[d] & d) == g[d]


@pytest.mark.parametrize("seed", range(8))
def test_pair_table_matches_bruteforce(seed):
    n = 4
    rng = np.random.default_rng(100 + seed)
    util = rng.normal(0, 2, 1 << n)
    util[0] = 0.0
    t = pair_table(util, n)
    for d in range(1 << n):
        for a in submasks(d):
            expect = brute_constrained(util, d, a)
            assert util[t[d, a]] == pytest.approx(util[expect])
            assert (t[d, a] & a) == a          # superset of previous adoption
            assert (t[d, a] & d) == t[d, a]    # subset of desire


@pytest.mark.parametrize("cfg", [1, 3, 5])
def test_g_and_pair_table_agree_when_supermodular(cfg):
    """For supermodular U, A_prev | g(D) equals the constrained argmax
    (the identity the fast path relies on) at every *reachable* state —
    i.e. whenever A_prev is a local maximum (Lemma 3 guarantees adoption
    sets always are)."""
    m = configs.two_item_model(cfg)
    rng = np.random.default_rng(7)
    for _ in range(5):
        util = m.utilities_in_world(m.sample_noise(rng))
        g = g_table(util, 2)
        p = pair_table(util, 2)
        for d in range(4):
            for a in submasks(d):
                if util[a] < max(util[s] for s in submasks(a)):
                    continue  # not a local maximum -> unreachable state
                assert (a | g[d]) == p[d, a]


def test_g_table_empty_set_zero():
    util = np.array([0.0, -1.0, -2.0, -5.0])
    g = g_table(util, 2)
    assert g[0] == 0 and g[3] == 0  # nothing positive -> adopt nothing


def test_adoption_tables_kind_selection():
    sup = configs.additive_model(4)
    kind, tables, util = adoption_tables_for_worlds(sup, np.zeros((2, 4)))
    assert kind == "g" and tables.shape == (2, 16)
    nonsup = configs.real_model()
    kind, tables, util = adoption_tables_for_worlds(nonsup, np.zeros((2, 5)))
    assert kind == "pair" and tables.shape == (2, 32, 32)


def test_real_model_full_bundle_adopted_from_full_desire():
    """Under zero noise, a node desiring everything adopts the best
    positive-utility itemset {ps, c, g1, g2, g3} (det utility +7)."""
    m = configs.real_model()
    util = m.utilities_in_world(np.zeros(5))
    t = pair_table(util, 5)
    assert t[31, 0] == 31
    assert util[31] == pytest.approx(7.0)

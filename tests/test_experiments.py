"""Tests for the table/figure harnesses (schemas and paper-diff checks)."""
import pandas as pd
import pytest

from repro.experiments.figures import skewed_budgets, uniform_budgets
from repro.experiments.tables import (
    PAPER_TABLE2,
    PAPER_TABLE3_GAP,
    table3,
    table4,
    table5,
)


def test_table3_derived_matches_paper_everywhere():
    df = table3()
    assert len(df) == 24  # 6 configs x 4 GAP params
    mismatch = df[(df["derived"] - df["paper"]).abs() > 0.005]
    assert mismatch.empty, mismatch


@pytest.mark.parametrize("cfg", [1, 2, 3, 4, 5, 6])
def test_table3_has_all_configs(cfg):
    df = table3()
    assert (df["config"] == cfg).sum() == 4


def test_table4_structural_claims():
    df = table4(n_items=6)  # smaller lattice for speed; same structure
    assert list(df["config"]) == [7, 8, 9, 10]
    assert df["supermodular_value"].all()
    assert df["monotone_value"].all()
    # config 7: every nonempty set has positive det utility (2^6 - 1)
    assert int(df[df["config"] == 7]["n_positive_det_utility"].iloc[0]) == 63
    # configs 8/9: exactly the supersets of the core: 2^5
    for cfg in (8, 9):
        assert int(df[df["config"] == cfg]["n_positive_det_utility"].iloc[0]) == 32


def test_table5_learning_recovers_ground_truth():
    df = table5(n_auctions=300, seed=1)
    assert len(df) == 5
    rel_err = (df["learned_value"] - df["paper_value"]).abs() / df["paper_value"]
    assert (rel_err < 0.02).all(), df
    # naive estimator is biased low vs the corrected one
    assert (df["naive_value"] < df["learned_value"]).all()


def test_paper_table2_reference_shape():
    assert list(PAPER_TABLE2["network"]) == [
        "Flixster", "Douban-Book", "Douban-Movie", "Twitter",
    ]


def test_paper_gap_reference_covers_all_configs():
    assert set(PAPER_TABLE3_GAP) == {1, 2, 3, 4, 5, 6}


def test_uniform_budgets():
    assert uniform_budgets(4, 7) == [7, 7, 7, 7]


def test_skewed_budgets_sum_and_shape():
    bv = skewed_budgets(10, 100)
    assert sum(bv) == 100
    assert bv == sorted(bv, reverse=True)
    assert bv[0] == 20 and bv[-1] == 2   # 20% max, 2% min


def test_skewed_budgets_small_total():
    bv = skewed_budgets(10, 50)
    assert sum(bv) == 50
    assert bv[0] == 10 and bv[-1] == 1

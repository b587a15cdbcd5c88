"""Unit tests for bitmask itemset algebra."""
import numpy as np
import pytest

from repro.core.itemsets import (
    bits,
    is_modular,
    is_monotone,
    is_supermodular,
    mask_item_matrix,
    popcount,
    submasks,
)


@pytest.mark.parametrize(
    "mask,expected",
    [(0, 0), (1, 1), (3, 2), (7, 3), (0b1010, 2), (0b11111, 5), (1023, 10)],
)
def test_popcount_scalar(mask, expected):
    assert popcount(mask) == expected


def test_popcount_vector():
    got = popcount(np.array([0, 1, 3, 7, 15, 1023]))
    assert list(got) == [0, 1, 2, 3, 4, 10]


@pytest.mark.parametrize(
    "mask,expected",
    [(0, []), (1, [0]), (0b101, [0, 2]), (0b110, [1, 2]), (0b11111, [0, 1, 2, 3, 4])],
)
def test_bits(mask, expected):
    assert bits(mask) == expected


@pytest.mark.parametrize("mask", [0, 1, 0b101, 0b111, 0b1011])
def test_submasks_complete(mask):
    subs = submasks(mask)
    assert len(subs) == 2 ** popcount(mask)
    assert set(subs) == {s for s in range(mask + 1) if (s & mask) == s}


@pytest.mark.parametrize("n", [1, 2, 3, 5, 8])
def test_mask_item_matrix_additive(n):
    m = mask_item_matrix(n)
    prices = np.arange(1.0, n + 1)
    per_mask = m @ prices
    # additive price of mask = sum of member prices
    for mask in range(1 << n):
        assert per_mask[mask] == pytest.approx(sum(prices[j] for j in bits(mask)))


@pytest.mark.parametrize("n", [2, 3, 4])
def test_modular_is_both_sub_and_supermodular(n):
    vals = mask_item_matrix(n) @ np.arange(1.0, n + 1)
    assert is_modular(vals, n)
    assert is_supermodular(vals, n)
    assert is_monotone(vals, n)


def test_supermodular_detects_violation():
    # f(S) = sqrt(|S|) is submodular, not supermodular
    n = 3
    vals = np.sqrt(popcount(np.arange(1 << n)).astype(float))
    assert not is_supermodular(vals, n)
    assert is_monotone(vals, n)


def test_supermodular_square_of_size():
    # f(S) = |S|^2 is supermodular and monotone
    n = 4
    vals = popcount(np.arange(1 << n)).astype(float) ** 2
    assert is_supermodular(vals, n)
    assert is_monotone(vals, n)
    assert not is_modular(vals, n)


def test_monotone_detects_violation():
    vals = np.array([0.0, 1.0, 2.0, 1.5])  # f({1,2}) < f({2})
    assert not is_monotone(vals, 2)

"""Support filter (matrix form)."""
import numpy as np
import pytest

from repro.core.filtering import support_mask


def test_keeps_significant_rows():
    total = np.full(10, 1000.0)
    S = np.vstack([np.full(10, 100.0), np.full(10, 0.5), np.full(10, 2.0)])
    mask = support_mask(S, total, ratio=0.001)
    assert mask.tolist() == [True, False, True]


def test_single_spike_is_enough():
    total = np.full(10, 1000.0)
    row = np.zeros(10)
    row[4] = 50.0
    mask = support_mask(row[None, :], total, ratio=0.01)
    assert mask.tolist() == [True]


def test_all_zero_row_dropped():
    total = np.full(5, 10.0)
    mask = support_mask(np.zeros((1, 5)), total)
    assert mask.tolist() == [False]


def test_zero_total_keeps_nonzero_slices():
    total = np.zeros(5)
    S = np.vstack([np.zeros(5), np.ones(5)])
    mask = support_mask(S, total, ratio=0.5)
    assert mask.tolist() == [False, True]


def test_negative_values_use_abs():
    total = np.full(5, -100.0)
    S = np.full((1, 5), -10.0)
    assert support_mask(S, total, ratio=0.05).tolist() == [True]


def test_ratio_boundary_inclusive():
    total = np.full(4, 100.0)
    S = np.full((1, 4), 10.0)
    assert support_mask(S, total, ratio=0.1).tolist() == [True]
    assert support_mask(S, total, ratio=0.100001).tolist() == [False]


def test_length_mismatch():
    with pytest.raises(ValueError):
        support_mask(np.zeros((1, 4)), np.zeros(5))

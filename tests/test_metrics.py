"""Unit tests for TLB and pruning-power metrics."""
import numpy as np
import pytest

from repro.core.metrics import pruning_power, tlb


def test_tlb_perfect_bound():
    d = np.array([1.0, 2.0, 3.0])
    assert tlb(d, d) == pytest.approx(1.0)


def test_tlb_half_bound():
    assert tlb(np.array([1.0, 1.0]), np.array([2.0, 2.0])) == pytest.approx(0.5)


def test_tlb_skips_zero_distance_pairs():
    assert tlb(np.array([0.0, 1.0]), np.array([0.0, 2.0])) == pytest.approx(0.5)


def test_tlb_all_zero_pairs():
    assert tlb(np.zeros(3), np.zeros(3)) == 1.0


def test_tlb_rejects_invalid_bound():
    with pytest.raises(ValueError):
        tlb(np.array([3.0]), np.array([2.0]))


def test_tlb_tolerates_float_noise():
    assert tlb(np.array([1.0 + 1e-9]), np.array([1.0])) <= 1.0


def test_pruning_power_basics():
    assert pruning_power(np.array([1.0, 5.0, 10.0]), 4.0) == pytest.approx(2 / 3)
    assert pruning_power(np.array([]), 1.0) == 0.0
    assert pruning_power(np.array([0.0, 0.0]), 1.0) == 0.0


def test_pruning_power_monotone_in_bsf():
    lbd2 = np.random.default_rng(0).random(100)
    assert pruning_power(lbd2, 0.2) >= pruning_power(lbd2, 0.8)

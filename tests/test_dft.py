"""Unit tests for the scaled DFT components and the DFT lower bound."""
import numpy as np
import pytest

from repro.core.distance import ed2
from repro.core.znorm import znormalize
from repro.summaries.dft import (component_space, dft_components, dft_lb2)


@pytest.mark.parametrize("n", [8, 16, 17, 64, 96, 100, 128, 255, 256])
def test_component_space_shape(n):
    sp = component_space(n)
    assert sp.m == n  # real series of length n have exactly n scalar dofs
    # DC is real-only; Nyquist real-only for even n
    assert sp.labels[0] == (0, 0)
    ks = [k for k, _ in sp.labels]
    assert max(ks) == n // 2


@pytest.mark.parametrize("n", [8, 64, 100, 256, 255])
def test_weights_are_2_except_dc_and_nyquist(n):
    sp = component_space(n)
    for (k, part), w in zip(sp.labels, sp.weights):
        if k == 0 or (n % 2 == 0 and k == n // 2):
            assert part == 0 and w == 1.0
        else:
            assert w == 2.0


@pytest.mark.parametrize("seed", range(6))
@pytest.mark.parametrize("n", [16, 64, 100, 256, 255])
def test_parseval_full_components_give_exact_ed(seed, n):
    g = np.random.default_rng(seed)
    A, B = g.standard_normal((4, n)), g.standard_normal((4, n))
    sp = component_space(n)
    lb2 = dft_lb2(dft_components(A, sp), dft_components(B, sp), sp.weights)
    for i in range(4):
        assert lb2[i] == pytest.approx(ed2(A[i], B[i]), rel=1e-9)


@pytest.mark.parametrize("seed", range(6))
@pytest.mark.parametrize("keep", [1, 4, 16, 33])
def test_subset_components_lower_bound(seed, keep):
    n = 128
    g = np.random.default_rng(seed)
    A = znormalize(g.standard_normal((10, n)))
    B = znormalize(g.standard_normal((10, n)))
    sp = component_space(n)
    sel = np.arange(min(keep, sp.m))
    lb2 = dft_lb2(dft_components(A, sp)[:, sel], dft_components(B, sp)[:, sel],
                  sp.weights[sel])
    for i in range(10):
        assert lb2[i] <= ed2(A[i], B[i]) + 1e-9


def test_dc_component_zero_for_znormalized():
    x = znormalize(np.random.default_rng(0).standard_normal((5, 64)))
    sp = component_space(64)
    np.testing.assert_allclose(dft_components(x, sp)[:, 0], 0, atol=1e-9)


def test_random_subset_still_lower_bounds():
    n = 96
    g = np.random.default_rng(9)
    A, B = g.standard_normal((20, n)), g.standard_normal((20, n))
    sp = component_space(n)
    sel = g.choice(sp.m, size=16, replace=False)
    lb2 = dft_lb2(dft_components(A, sp)[:, sel], dft_components(B, sp)[:, sel],
                  sp.weights[sel])
    truth = np.array([ed2(A[i], B[i]) for i in range(20)])
    assert (lb2 <= truth + 1e-9).all()


def test_length_mismatch_raises():
    sp = component_space(64)
    with pytest.raises(ValueError):
        dft_components(np.zeros((2, 32)), sp)

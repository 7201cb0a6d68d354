"""Unit tests for z-normalization."""
import numpy as np
import pytest

from repro.core.znorm import znormalize


@pytest.mark.parametrize("n", [2, 3, 17, 64, 256, 1001])
def test_single_series_zero_mean_unit_std(n):
    g = np.random.default_rng(n)
    z = znormalize(g.standard_normal(n) * 5 + 3)
    assert abs(z.mean()) < 1e-9
    assert abs(z.std() - 1) < 1e-9


@pytest.mark.parametrize("seed", range(5))
@pytest.mark.parametrize("shape", [(1, 16), (7, 32), (50, 100)])
def test_batch_rows_normalized(shape, seed):
    g = np.random.default_rng(seed)
    z = znormalize(g.standard_normal(shape) * 2 - 7)
    assert z.shape == shape
    np.testing.assert_allclose(z.mean(axis=1), 0, atol=1e-9)
    np.testing.assert_allclose(z.std(axis=1), 1, atol=1e-9)


def test_constant_series_maps_to_zeros():
    z = znormalize(np.full(32, 4.2))
    np.testing.assert_array_equal(z, np.zeros(32))


def test_mixed_constant_and_varying_rows():
    x = np.vstack([np.full(16, 1.0), np.arange(16, dtype=float)])
    z = znormalize(x)
    np.testing.assert_array_equal(z[0], np.zeros(16))
    assert abs(z[1].std() - 1) < 1e-9


def test_float32_preserved():
    z = znormalize(np.random.default_rng(0).standard_normal((3, 8)).astype(np.float32))
    assert z.dtype == np.float32


def test_float64_default():
    z = znormalize(np.random.default_rng(0).standard_normal((3, 8)))
    assert z.dtype == np.float64


def test_idempotent():
    g = np.random.default_rng(1)
    z1 = znormalize(g.standard_normal(64))
    np.testing.assert_allclose(znormalize(z1), z1, atol=1e-9)


def test_shift_and_scale_invariance():
    g = np.random.default_rng(2)
    x = g.standard_normal(64)
    np.testing.assert_allclose(znormalize(x), znormalize(3 * x + 10), atol=1e-9)

"""Unit tests for z-normalisation and PAA."""
import numpy as np
import pytest

from repro.core.paa import paa, znorm


@pytest.mark.parametrize("seed", range(5))
def test_znorm_zero_mean_unit_std(seed):
    x = np.random.default_rng(seed).normal(3.0, 5.0, (10, 64))
    z = znorm(x)
    np.testing.assert_allclose(z.mean(axis=1), 0.0, atol=1e-9)
    np.testing.assert_allclose(z.std(axis=1), 1.0, atol=1e-6)


def test_znorm_constant_series_is_zero():
    z = znorm(np.full((3, 16), 7.0))
    np.testing.assert_allclose(z, 0.0)


def test_znorm_1d_input():
    z = znorm(np.arange(8.0))
    assert z.shape == (8,)
    assert abs(z.mean()) < 1e-9


@pytest.mark.parametrize("length,w", [(64, 8), (64, 16), (96, 8), (32, 4), (8, 8)])
def test_paa_segment_means(length, w):
    rng = np.random.default_rng(1)
    x = rng.normal(size=(5, length))
    p = paa(x, w)
    assert p.shape == (5, w)
    seg = length // w
    for j in range(w):
        np.testing.assert_allclose(p[:, j], x[:, j * seg : (j + 1) * seg].mean(axis=1))


def test_paa_identity_when_w_equals_length():
    x = np.random.default_rng(2).normal(size=(3, 16))
    np.testing.assert_allclose(paa(x, 16), x)


def test_paa_rejects_indivisible_length():
    with pytest.raises(ValueError, match="not divisible"):
        paa(np.zeros((2, 10)), 4)


def test_paa_1d_input():
    p = paa(np.arange(8.0), 4)
    np.testing.assert_allclose(p, [0.5, 2.5, 4.5, 6.5])


def test_paa_preserves_mean():
    x = np.random.default_rng(3).normal(size=(4, 64))
    np.testing.assert_allclose(paa(x, 8).mean(axis=1), x.mean(axis=1))

"""Unit tests for iSAX symbols, region bounds, lower bounds, Gray codes."""
import numpy as np
import pytest

from repro.core.isax import (
    breakpoints,
    gray,
    inverse_gray,
    mindist_paa_paa,
    mindist_paa_regions,
    pack_bits,
    pack_symbols,
    prefix,
    region_bounds,
    symbols,
)
from repro.core.paa import paa, znorm


@pytest.mark.parametrize("bits", range(1, 9))
def test_breakpoints_monotone_and_symmetric(bits):
    bp = breakpoints(bits)
    assert len(bp) == (1 << bits) - 1
    assert np.all(np.diff(bp) > 0)
    np.testing.assert_allclose(bp, -bp[::-1], atol=1e-12)


def test_breakpoints_one_bit_is_zero():
    np.testing.assert_allclose(breakpoints(1), [0.0])


@pytest.mark.parametrize("bits", [1, 2, 4, 8])
def test_symbols_in_range(bits):
    vals = np.random.default_rng(0).normal(size=(20, 8))
    s = symbols(vals, bits)
    assert s.min() >= 0 and s.max() < (1 << bits)


def test_symbols_monotone_in_value():
    vals = np.linspace(-4, 4, 100)
    s = symbols(vals, 8)
    assert np.all(np.diff(s) >= 0)


def test_symbol_region_contains_value():
    vals = np.random.default_rng(1).normal(size=200)
    for bits in (1, 3, 8):
        s = symbols(vals, bits)
        lo, hi = region_bounds(s, np.full_like(s, bits))
        assert np.all(vals >= lo) and np.all(vals <= hi)


def test_prefix_consistency_across_cardinalities():
    vals = np.random.default_rng(2).normal(size=500)
    s8 = symbols(vals, 8)
    for bits in (1, 2, 4, 7):
        np.testing.assert_array_equal(prefix(s8, 8, bits), symbols(vals, bits))


def test_prefix_rejects_upscaling():
    with pytest.raises(ValueError):
        prefix(np.array([1]), 2, 4)


def test_region_bounds_outermost_unbounded():
    lo, hi = region_bounds(np.array([0, 3]), np.array([2, 2]))
    assert lo[0] == -np.inf and hi[1] == np.inf
    assert np.isfinite(hi[0]) and np.isfinite(lo[1])


def test_region_bounds_mixed_cardinalities():
    lo, hi = region_bounds(np.array([0, 1, 1]), np.array([1, 1, 3]))
    assert lo[0] == -np.inf and hi[0] == 0.0
    assert lo[1] == 0.0 and hi[1] == np.inf
    bp3 = breakpoints(3)
    assert lo[2] == bp3[0] and hi[2] == bp3[1]


@pytest.mark.parametrize("seed", range(8))
def test_mindist_region_is_lower_bound(seed):
    """MINDIST(q, region(s)) ≤ ED(q, s) — the pruning-safety invariant."""
    rng = np.random.default_rng(seed)
    w, length, bits = 8, 64, 8
    data = znorm(np.cumsum(rng.normal(size=(50, length)), axis=1))
    q = znorm(np.cumsum(rng.normal(size=length)))
    p = paa(data, w)
    q_paa = paa(q, w)
    s = symbols(p, bits)
    lo, hi = region_bounds(s, np.full_like(s, bits))
    lbs = mindist_paa_regions(q_paa, lo, hi, length)
    true = np.sqrt(((data - q) ** 2).sum(axis=1))
    assert np.all(lbs <= true + 1e-9)


@pytest.mark.parametrize("seed", range(8))
def test_mindist_paa_is_lower_bound_and_tighter(seed):
    rng = np.random.default_rng(seed)
    w, length = 8, 64
    data = znorm(np.cumsum(rng.normal(size=(50, length)), axis=1))
    q = znorm(np.cumsum(rng.normal(size=length)))
    p = paa(data, w)
    q_paa = paa(q, w)
    paa_lb = mindist_paa_paa(q_paa, p, length)
    true = np.sqrt(((data - q) ** 2).sum(axis=1))
    assert np.all(paa_lb <= true + 1e-9)
    s = symbols(p, 8)
    lo, hi = region_bounds(s, np.full_like(s, 8))
    region_lb = mindist_paa_regions(q_paa, lo, hi, length)
    assert np.all(region_lb <= paa_lb + 1e-9)


def test_mindist_zero_inside_region():
    lo = np.array([[-1.0, -1.0]])
    hi = np.array([[1.0, 1.0]])
    assert mindist_paa_regions(np.array([0.0, 0.5]), lo, hi, 8)[0] == 0.0


def test_pack_bits():
    assert pack_bits(np.array([1, 0, 1])) == 5
    np.testing.assert_array_equal(pack_bits(np.array([[0, 0], [1, 1]])), [0, 3])


def test_pack_symbols():
    assert pack_symbols(np.array([2, 1]), 2) == 0b1001
    assert pack_symbols(np.array([[3, 3]]), 2)[0] == 15


@pytest.mark.parametrize("n", [16, 256, 1024])
def test_gray_roundtrip(n):
    x = np.arange(n)
    np.testing.assert_array_equal(inverse_gray(gray(x)), x)


def test_gray_adjacent_differ_one_bit():
    x = np.arange(512)
    g = gray(x)
    diffs = g[1:] ^ g[:-1]
    # each consecutive pair of gray codes differs in exactly one bit
    popcount = np.array([bin(int(d)).count("1") for d in diffs])
    assert np.all(popcount == 1)


def test_inverse_gray_orders_by_sequence_position():
    words = gray(np.arange(64))
    rng = np.random.default_rng(0)
    shuffled = rng.permutation(words)
    ranks = inverse_gray(shuffled)
    restored = shuffled[np.argsort(ranks)]
    np.testing.assert_array_equal(restored, words)

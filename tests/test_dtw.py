"""DTW distance, LB_Keogh cascade, and exact DTW search tests."""
import numpy as np
import pytest

from repro.core.dtw import (
    brute_force_dtw_nn,
    dtw_distance,
    envelope,
    envelope_paa_bounds,
    exact_search_dtw,
    lb_keogh,
    mindist_env_paa,
    mindist_env_regions,
    warping_window,
)
from repro.core.index import build_index
from repro.core.paa import paa
from repro.synth_data import clustered_walks_np, make_queries_np


def _dtw_reference(a, b):
    """Unconstrained O(n²) DTW — independent reference implementation."""
    n, m = len(a), len(b)
    D = np.full((n + 1, m + 1), np.inf)
    D[0, 0] = 0.0
    for i in range(1, n + 1):
        for j in range(1, m + 1):
            d = (a[i - 1] - b[j - 1]) ** 2
            D[i, j] = d + min(D[i - 1, j], D[i, j - 1], D[i - 1, j - 1])
    return float(np.sqrt(D[n, m]))


@pytest.fixture(scope="module")
def setup():
    data = clustered_walks_np(250, 32, seed=13)
    ids = np.arange(250)
    index = build_index(ids, data, leaf_capacity=16)
    queries, _ = make_queries_np(data, 6, seed=31)
    return data, ids, index, queries


def test_warping_window():
    assert warping_window(64, 0.05) == 3
    assert warping_window(100, 0.15) == 15
    assert warping_window(10, 0.0001) == 1  # floor at 1


def test_dtw_identity_is_zero():
    a = np.random.default_rng(0).normal(size=32)
    assert dtw_distance(a, a, 3) == pytest.approx(0.0, abs=1e-12)


@pytest.mark.parametrize("seed", range(5))
def test_full_band_equals_unconstrained(seed):
    rng = np.random.default_rng(seed)
    a, b = rng.normal(size=16), rng.normal(size=16)
    assert dtw_distance(a, b, 16) == pytest.approx(_dtw_reference(a, b), abs=1e-9)


@pytest.mark.parametrize("seed", range(5))
def test_dtw_leq_euclidean(seed):
    rng = np.random.default_rng(seed + 100)
    a, b = rng.normal(size=32), rng.normal(size=32)
    ed = float(np.sqrt(((a - b) ** 2).sum()))
    assert dtw_distance(a, b, 3) <= ed + 1e-9


def test_wider_band_never_increases_distance():
    rng = np.random.default_rng(7)
    a, b = rng.normal(size=32), rng.normal(size=32)
    ds = [dtw_distance(a, b, r) for r in (1, 2, 4, 8, 16)]
    assert all(x >= y - 1e-12 for x, y in zip(ds, ds[1:]))


def test_envelope_contains_query():
    q = np.random.default_rng(1).normal(size=64)
    lo, hi = envelope(q, 4)
    assert np.all(lo <= q) and np.all(q <= hi)


def test_envelope_window_semantics():
    q = np.arange(10.0)
    lo, hi = envelope(q, 2)
    np.testing.assert_allclose(lo, np.maximum(q - 2, 0))
    np.testing.assert_allclose(hi, np.minimum(q + 2, 9))


@pytest.mark.parametrize("seed", range(6))
def test_lb_keogh_is_lower_bound_of_dtw(seed):
    rng = np.random.default_rng(seed)
    q = rng.normal(size=32)
    x = rng.normal(size=(20, 32))
    r = 3
    lo, hi = envelope(q, r)
    lbs = lb_keogh(lo, hi, x)
    true = np.array([dtw_distance(q, row, r) for row in x])
    assert np.all(lbs <= true + 1e-9)


@pytest.mark.parametrize("seed", range(4))
def test_cascade_bounds_ordering(seed):
    """env-region LB ≤ env-PAA LB ≤ LB_Keogh ≤ DTW for index members."""
    rng = np.random.default_rng(seed)
    data = clustered_walks_np(80, 32, seed=seed)
    index = build_index(np.arange(80), data, leaf_capacity=8)
    q = data[rng.integers(80)] + rng.normal(0, 0.3, 32)
    r = warping_window(32, 0.1)
    lo, hi = envelope(q, r)
    l_hat, u_hat = envelope_paa_bounds(lo, hi, index.w)
    keogh = lb_keogh(lo, hi, index.data)
    paa_lb = mindist_env_paa(l_hat, u_hat, index.paa, index.length)
    true = np.array([dtw_distance(q, row, r) for row in index.data])
    assert np.all(paa_lb <= keogh + 1e-9)
    assert np.all(keogh <= true + 1e-9)
    leaf_lbs = mindist_env_regions(l_hat, u_hat, index.leaf_lo, index.leaf_hi, index.length)
    for i, lf in enumerate(index.leaves):
        assert leaf_lbs[i] <= paa_lb[lf.members].min() + 1e-9


@pytest.mark.parametrize("qi", range(6))
def test_exact_dtw_search_matches_brute_force(setup, qi):
    data, ids, index, queries = setup
    st = exact_search_dtw(index, queries[qi], warp=0.1)
    ref_d, ref_id = brute_force_dtw_nn(data, ids, queries[qi], warp=0.1, k=1)[0]
    assert st.nn_dist == pytest.approx(ref_d, abs=1e-9)


@pytest.mark.parametrize("warp", [0.05, 0.15])
def test_exact_dtw_knn(setup, warp):
    data, ids, index, queries = setup
    st = exact_search_dtw(index, queries[0], warp=warp, k=5)
    ref = brute_force_dtw_nn(data, ids, queries[0], warp=warp, k=5)
    np.testing.assert_allclose([d for d, _ in st.topk], [d for d, _ in ref], atol=1e-9)


def test_dtw_search_prunes(setup):
    data, _, index, _ = setup
    rng = np.random.default_rng(2)
    q = data[rng.integers(len(data))] + rng.normal(0, 0.01, 32)
    from repro.core.paa import znorm

    st = exact_search_dtw(index, znorm(q), warp=0.05)
    assert st.real_series < len(data)


def test_dtw_seeded_search(setup):
    data, ids, index, queries = setup
    q = queries[1]
    ref_d, _ = brute_force_dtw_nn(data, ids, q, warp=0.1, k=1)[0]
    st = exact_search_dtw(index, q, warp=0.1, init_bsf=ref_d * 1.001)
    assert st.nn_dist == pytest.approx(ref_d, abs=1e-9)

"""Odyssey single-node exact search vs brute force; work accounting."""
import numpy as np
import pytest

from repro.core.index import build_index
from repro.core.knn import brute_force_knn
from repro.core.search import exact_search, list_schedule, make_batches
from repro.synth_data import clustered_walks_np, make_queries_np, random_walk_np


@pytest.fixture(scope="module")
def setup():
    data = clustered_walks_np(600, 64, seed=9)
    ids = np.arange(600)
    index = build_index(ids, data, leaf_capacity=32)
    queries, _ = make_queries_np(data, 12, seed=21)
    return data, ids, index, queries


@pytest.mark.parametrize("qi", range(12))
def test_exact_1nn_matches_brute_force(setup, qi):
    data, ids, index, queries = setup
    st = exact_search(index, queries[qi])
    ref_d, ref_id = brute_force_knn(data, ids, queries[qi], 1)[0]
    assert st.nn_dist == pytest.approx(ref_d, abs=1e-9)
    assert st.nn_id == ref_id


@pytest.mark.parametrize("qi", range(0, 12, 3))
@pytest.mark.parametrize("k", [3, 5, 10])
def test_exact_knn_matches_brute_force(setup, qi, k):
    data, ids, index, queries = setup
    st = exact_search(index, queries[qi], k=k)
    ref = brute_force_knn(data, ids, queries[qi], k)
    assert len(st.topk) == k
    np.testing.assert_allclose(
        [d for d, _ in st.topk], [d for d, _ in ref], atol=1e-9
    )


@pytest.mark.parametrize("qi", range(0, 12, 2))
def test_messi_mode_matches_brute_force(setup, qi):
    data, ids, index, queries = setup
    st = exact_search(index, queries[qi], sorted_pqs=False, pq_threshold=None)
    ref_d, _ = brute_force_knn(data, ids, queries[qi], 1)[0]
    assert st.nn_dist == pytest.approx(ref_d, abs=1e-9)


def test_seeded_search_still_finds_global_answer(setup):
    """BSF sharing: seeding with a (true) global bound must keep the local
    result correct whenever the local NN is within the bound."""
    data, ids, index, queries = setup
    for q in queries[:6]:
        ref_d, ref_id = brute_force_knn(data, ids, q, 1)[0]
        st = exact_search(index, q, init_bsf=ref_d * (1 + 1e-9) + 1e-12)
        assert st.nn_dist == pytest.approx(ref_d, abs=1e-9)
        assert st.nn_id == ref_id


def test_tight_seed_reduces_work(setup):
    data, ids, index, queries = setup
    q = queries[1]
    ref_d, _ = brute_force_knn(data, ids, q, 1)[0]
    unseeded = exact_search(index, q)
    seeded = exact_search(index, q, init_bsf=ref_d * 1.0001)
    assert seeded.real_series <= unseeded.real_series
    assert seeded.total_cost <= unseeded.total_cost + 1e-9


def test_odyssey_work_not_worse_than_messi(setup):
    """Sorted-PQ processing converges the BSF faster ⇒ fewer real distances
    in aggregate (the paper's motivation for the new PQ discipline)."""
    data, ids, index, queries = setup
    od = sum(exact_search(index, q).real_series for q in queries)
    me = sum(
        exact_search(index, q, sorted_pqs=False, pq_threshold=None).real_series
        for q in queries
    )
    assert od <= me


def test_pq_threshold_respected(setup):
    _, _, index, queries = setup
    st = exact_search(index, queries[0], pq_threshold=8)
    assert st.pq_sizes and max(st.pq_sizes) <= 8


def test_smaller_threshold_more_queues(setup):
    _, _, index, queries = setup
    small = exact_search(index, queries[0], pq_threshold=4)
    large = exact_search(index, queries[0], pq_threshold=64)
    assert len(small.pq_sizes) >= len(large.pq_sizes)


def test_counters_are_sane(setup):
    data, _, index, queries = setup
    st = exact_search(index, queries[2])
    assert 0 < st.real_series <= len(data)
    assert st.leaf_lb == index.n_leaves
    assert st.series_lb >= st.real_series or st.series_lb == 0
    assert st.total_cost == pytest.approx(
        st.approx_cost + st.traversal_cost + sum(st.pq_costs)
    )
    assert st.thread_time > 0


def test_pruning_reduces_real_distance_work(setup):
    """The index must beat a full scan on in-distribution queries."""
    data, ids, index, _ = setup
    rng = np.random.default_rng(3)
    q = data[rng.integers(len(data))] + rng.normal(0, 0.01, data.shape[1])
    st = exact_search(index, q)
    assert st.real_series < len(data) / 2


def test_hard_query_does_more_work_than_easy(setup):
    data, ids, index, _ = setup
    rng = np.random.default_rng(4)
    easy = data[5] + rng.normal(0, 0.01, data.shape[1])
    from repro.core.paa import znorm

    hard = znorm(np.cumsum(rng.normal(size=data.shape[1])))
    st_easy = exact_search(index, znorm(easy))
    st_hard = exact_search(index, hard)
    assert st_hard.total_cost > st_easy.total_cost
    assert st_hard.approx_bsf > st_easy.approx_bsf


def test_make_batches_partitions_leaves(setup):
    _, _, index, _ = setup
    for n in (1, 4, 8, 1000):
        batches = make_batches(index, n)
        flat = [i for b in batches for i in b]
        assert sorted(flat) == list(range(index.n_leaves))


def test_make_batches_respects_root_boundaries(setup):
    _, _, index, _ = setup
    batches = make_batches(index, 4)
    root_of = {i: lf.root_id for i, lf in enumerate(index.leaves)}
    seen_roots = set()
    for b in batches:
        roots = {root_of[i] for i in b}
        assert not (roots & seen_roots)  # a root subtree never spans batches
        seen_roots |= roots


def test_list_schedule_bounds():
    costs = [5.0, 1.0, 1.0, 1.0, 1.0, 1.0]
    span = list_schedule(costs, 2)
    assert span >= sum(costs) / 2
    assert span <= sum(costs)
    assert list_schedule(costs, 1) == pytest.approx(sum(costs))
    assert list_schedule([], 4) == 0.0


def test_more_threads_not_slower(setup):
    _, _, index, queries = setup
    t1 = exact_search(index, queries[0], n_threads=1).thread_time
    t8 = exact_search(index, queries[0], n_threads=8).thread_time
    assert t8 <= t1 + 1e-9


def test_empty_index_search():
    idx = build_index(np.array([0]), random_walk_np(1, 32, seed=0))
    st = exact_search(idx, random_walk_np(1, 32, seed=1)[0])
    assert np.isfinite(st.nn_dist)


def test_result_independent_of_batch_count(setup):
    data, ids, index, queries = setup
    ref = exact_search(index, queries[3], n_batches=1).nn_dist
    for n in (2, 8, 64):
        assert exact_search(index, queries[3], n_batches=n).nn_dist == pytest.approx(ref)

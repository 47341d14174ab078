"""DTW similarity search (paper §4): LB_Keogh cascade on the same index.

No index change is needed (exactly as the paper notes): the ED iSAX tree
answers DTW queries with a different lower-bound cascade —

  envelope-region LB (leaf level)  ≤  envelope-PAA LB (series level)
      ≤  LB_Keogh (pointwise)      ≤  DTW with Sakoe-Chiba band r

Each bound in the chain is a valid lower bound of the banded DTW distance
(Keogh & Ratanamahatana 2005), so pruning never discards the true NN.
"""
import heapq
from dataclasses import dataclass

import numpy as np

from .index import ISaxIndex
from .paa import paa
from .search import LEAF_OVERHEAD, SearchStats, _KBsf, _traversal_makespan, list_schedule, make_batches


def warping_window(length: int, frac: float) -> int:
    """Sakoe-Chiba half-width r from a warping fraction (e.g. 0.05 = 5%)."""
    return max(1, int(round(frac * length)))


def envelope(q: np.ndarray, r: int):
    """LB_Keogh envelope: ``lo[i] = min(q[i-r..i+r])``, ``hi`` the max."""
    q = np.asarray(q, dtype=np.float64)
    n = len(q)
    pad_lo = np.concatenate([np.full(r, np.inf), q, np.full(r, np.inf)])
    pad_hi = np.concatenate([np.full(r, -np.inf), q, np.full(r, -np.inf)])
    win = np.lib.stride_tricks.sliding_window_view(pad_lo, 2 * r + 1)
    lo = win.min(axis=1)
    win = np.lib.stride_tricks.sliding_window_view(pad_hi, 2 * r + 1)
    hi = win.max(axis=1)
    assert len(lo) == n
    return lo, hi


def lb_keogh(lo: np.ndarray, hi: np.ndarray, x: np.ndarray) -> np.ndarray:
    """Pointwise LB_Keogh of candidate rows ``x`` against a query envelope."""
    x = np.atleast_2d(np.asarray(x, dtype=np.float64))
    d = np.maximum(0.0, np.maximum(x - hi, lo - x))
    return np.sqrt(np.einsum("ij,ij->i", d, d))


def envelope_paa_bounds(lo: np.ndarray, hi: np.ndarray, w: int):
    """Per-segment envelope bounds (min of lo / max of hi per segment).

    Using min/max (not the mean) keeps the PAA-level bound valid."""
    n = len(lo)
    seg = n // w
    l_hat = lo.reshape(w, seg).min(axis=1)
    u_hat = hi.reshape(w, seg).max(axis=1)
    return l_hat, u_hat


def mindist_env_regions(l_hat, u_hat, leaf_lo, leaf_hi, length: int) -> np.ndarray:
    """Leaf-level DTW lower bound: envelope segment interval vs iSAX region."""
    d = np.maximum(0.0, np.maximum(leaf_lo - u_hat, l_hat - leaf_hi))
    w = l_hat.shape[-1]
    return np.sqrt(length / w * np.sum(d * d, axis=-1))


def mindist_env_paa(l_hat, u_hat, p, length: int) -> np.ndarray:
    """Series-level DTW lower bound: envelope interval vs candidate PAA."""
    d = np.maximum(0.0, np.maximum(p - u_hat, l_hat - p))
    w = l_hat.shape[-1]
    return np.sqrt(length / w * np.sum(d * d, axis=-1))


def dtw_distance(a: np.ndarray, b: np.ndarray, r: int) -> float:
    """Exact DTW with Sakoe-Chiba band of half-width ``r`` (O(n·r))."""
    a = np.asarray(a, dtype=np.float64)
    b = np.asarray(b, dtype=np.float64)
    n = len(a)
    prev = np.full(n + 1, np.inf)
    prev[0] = 0.0
    for i in range(1, n + 1):
        cur = np.full(n + 1, np.inf)
        j_lo, j_hi = max(1, i - r), min(n, i + r)
        ai = a[i - 1]
        for j in range(j_lo, j_hi + 1):
            d = (ai - b[j - 1]) ** 2
            cur[j] = d + min(prev[j], prev[j - 1], cur[j - 1])
        prev = cur
    return float(np.sqrt(prev[n]))


def exact_search_dtw(
    index: ISaxIndex,
    q: np.ndarray,
    *,
    k: int = 1,
    warp: float = 0.05,
    init_bsf: float = np.inf,
    n_threads: int = 8,
    n_batches: int | None = None,
    pq_threshold: int | None = 64,
    sorted_pqs: bool = True,
    help_th: int = 2,
) -> SearchStats:
    """Exact DTW k-NN on one node's index, Odyssey PQ discipline."""
    q = np.asarray(q, dtype=np.float64)
    r = warping_window(index.length, warp)
    lo, hi = envelope(q, r)
    l_hat, u_hat = envelope_paa_bounds(lo, hi, index.w)
    n_batches = n_threads if n_batches is None else n_batches
    dtw_unit = float(index.length * (2 * r + 1))

    stats = SearchStats(nn_dist=np.inf, nn_id=-1, topk=[], approx_bsf=np.inf)
    if index.n_leaves == 0:
        return stats

    # approximate search under the DTW bound: best leaf, true DTW to members
    leaf_lbs = mindist_env_regions(l_hat, u_hat, index.leaf_lo, index.leaf_hi, index.length)
    stats.leaf_lb = index.n_leaves
    best_leaf = int(np.argmin(leaf_lbs))
    members = index.leaves[best_leaf].members
    approx_d = np.array([dtw_distance(q, index.data[m], r) for m in members])
    kbsf = _KBsf(k, init_bsf)
    kbsf.offer_many(approx_d, index.ids[members])
    stats.approx_bsf = float(approx_d.min())
    stats.real_series += len(members)
    stats.approx_cost = index.n_leaves * index.w + len(members) * dtw_unit

    batches = make_batches(index, n_batches)
    bound = kbsf.bound
    pqs: list[list] = []
    batch_costs: list[float] = []
    for leaves in batches:
        batch_costs.append(len(leaves) * index.w)
        current: list = []
        for leaf_idx in leaves:
            lb = float(leaf_lbs[leaf_idx])
            if lb >= bound:
                continue
            current.append((lb, leaf_idx))
            stats.leaves_inserted += 1
            if pq_threshold is not None and len(current) >= pq_threshold:
                current.sort()
                pqs.append(current)
                current = []
        if current:
            current.sort()
            pqs.append(current)
    stats.traversal_cost = float(sum(batch_costs))
    stats.pq_sizes = [len(pq) for pq in pqs]
    if sorted_pqs:
        pqs.sort(key=lambda pq: pq[0][0])

    pq_costs: list[float] = []
    for pq in pqs:
        cost = 0.0
        for lb, leaf_idx in pq:
            if lb >= kbsf.bound:
                break
            mem = index.leaves[leaf_idx].members
            slb = mindist_env_paa(l_hat, u_hat, index.paa[mem], index.length)
            stats.series_lb += len(mem)
            cost += LEAF_OVERHEAD + len(mem) * index.w
            surv = mem[slb < kbsf.bound]
            if len(surv):
                keogh = lb_keogh(lo, hi, index.data[surv])
                cost += len(surv) * index.length
                surv = surv[keogh < kbsf.bound]
            for m in surv:
                d = dtw_distance(q, index.data[m], r)
                stats.real_series += 1
                cost += dtw_unit
                kbsf.offer(d, int(index.ids[m]))
            stats.leaves_processed += 1
        pq_costs.append(cost)
    stats.pq_costs = pq_costs

    topk = kbsf.topk()
    stats.topk = topk
    if topk:
        stats.nn_dist, stats.nn_id = topk[0]
    stats.thread_time = (
        stats.approx_cost / max(1, n_threads)
        + _traversal_makespan(batch_costs, n_threads, help_th)
        + list_schedule(pq_costs, n_threads)
    )
    return stats


def brute_force_dtw_nn(
    data: np.ndarray, ids: np.ndarray, q: np.ndarray, *, warp: float = 0.05, k: int = 1
) -> list[tuple[float, int]]:
    """Reference exact DTW k-NN by full scan (test oracle)."""
    r = warping_window(np.asarray(q).shape[-1], warp)
    dists = np.array([dtw_distance(q, row, r) for row in np.asarray(data, float)])
    order = np.lexsort((np.asarray(ids), dists))[:k]
    return [(float(dists[i]), int(ids[i])) for i in order]

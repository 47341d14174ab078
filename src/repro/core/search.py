"""Odyssey single-node exact query answering (paper Algorithms 1–2).

Phases, exactly as in the paper:

1. *Approximate search* seeds the BSF (optionally capped by a globally
   shared BSF — Odyssey's BSF-sharing).
2. *Tree traversal*: root subtrees are grouped into ``N_sb`` RS-batches;
   leaves whose MINDIST lower bound beats the BSF are pushed into the
   batch's active priority queue; when a queue reaches the threshold
   ``TH`` it is sealed and a new one starts (this is what makes queues
   steal-able at RS-batch granularity without moving data).
3. *PQ preprocessing*: the queue array is sorted by the lower bound of
   each queue's top element (Odyssey) or left in creation order (MESSI
   baseline mode, ``sorted_pqs=False``).
4. *PQ processing*: queues are consumed in order; a queue is abandoned as
   soon as its head's lower bound reaches the BSF; surviving leaves are
   filtered by the per-series PAA lower bound and the remainder get real
   (SIMD-style vectorised) Euclidean distances, updating the BSF.

The function returns exact work counters and the priority-queue cost
decomposition, which feed the cluster-level makespan simulator, plus a
simulated intra-node thread time (greedy list scheduling with the paper's
helper threshold), since physical threads on the test box are Spark's.
Supports k-NN (``k`` best-so-far distances) out of the box.
"""
import heapq
from dataclasses import dataclass, field

import numpy as np

from .index import ISaxIndex, approx_search
from .isax import mindist_paa_paa
from .paa import paa

#: cost units (flop-ish): real distance = L per series, lower bounds = w.
LEAF_OVERHEAD = 8.0


@dataclass
class SearchStats:
    """Result + work breakdown of one single-node query execution."""

    nn_dist: float
    nn_id: int
    topk: list  # [(dist, id)] sorted ascending, length <= k
    approx_bsf: float
    leaf_lb: int = 0  # leaf lower-bound computations
    series_lb: int = 0  # per-series lower-bound computations
    real_series: int = 0  # series whose real distance was computed
    leaves_inserted: int = 0
    leaves_processed: int = 0
    approx_cost: float = 0.0
    traversal_cost: float = 0.0
    pq_costs: list = field(default_factory=list)
    pq_sizes: list = field(default_factory=list)
    thread_time: float = 0.0

    @property
    def total_cost(self) -> float:
        return self.approx_cost + self.traversal_cost + float(sum(self.pq_costs))


def list_schedule(costs, n_threads: int) -> float:
    """Makespan of greedy (Fetch&Add-order) list scheduling."""
    if not costs:
        return 0.0
    clocks = [0.0] * max(1, n_threads)
    heapq.heapify(clocks)
    for c in costs:
        heapq.heappush(clocks, heapq.heappop(clocks) + float(c))
    return max(clocks)


def _traversal_makespan(costs, n_threads: int, help_th: int) -> float:
    """Traversal phase makespan: idle threads help on a batch, at most
    ``help_th`` helpers per batch (paper's HelpTH), so a batch's cost is
    divisible among up to ``1 + help_th`` threads."""
    if not costs:
        return 0.0
    total = float(sum(costs))
    widest = max(costs) / (1 + max(0, help_th))
    return max(total / max(1, n_threads), widest)


class _KBsf:
    """k best-so-far distances; the pruning bound is the k-th best, capped
    by a shared (global) bound when BSF-sharing is active."""

    def __init__(self, k: int, shared_bound: float):
        self.k = k
        self.shared = float(shared_bound)
        self._heap: list = []  # max-heap via negated distances
        self._ids: set[int] = set()  # a series may be offered in both the
        # approximate and the PQ-processing phase; count it once

    @property
    def bound(self) -> float:
        local = -self._heap[0][0] if len(self._heap) >= self.k else np.inf
        return min(local, self.shared)

    def offer(self, dist: float, sid: int) -> None:
        if sid in self._ids:
            return
        if len(self._heap) < self.k:
            heapq.heappush(self._heap, (-dist, sid))
            self._ids.add(sid)
        elif dist < -self._heap[0][0]:
            _, evicted = heapq.heapreplace(self._heap, (-dist, sid))
            self._ids.discard(evicted)
            self._ids.add(sid)

    def offer_many(self, dists: np.ndarray, sids: np.ndarray) -> None:
        if len(dists) == 0:
            return
        for i in np.argsort(dists, kind="stable"):
            d = float(dists[i])
            if len(self._heap) >= self.k and d >= -self._heap[0][0]:
                break  # sorted ascending: nothing further can qualify
            self.offer(d, int(sids[i]))

    def topk(self) -> list:
        return sorted((-d, i) for d, i in self._heap)


def make_batches(index: ISaxIndex, n_batches: int) -> list[list[int]]:
    """Split the (ordered) non-empty root subtrees into contiguous RS-batches
    of leaf indices."""
    root_ids = sorted(index.roots)
    n_batches = max(1, min(n_batches, len(root_ids))) if root_ids else 1
    batches: list[list[int]] = []
    per = -(-len(root_ids) // n_batches) if root_ids else 0
    for b in range(0, len(root_ids), per if per else 1):
        leaves: list[int] = []
        for rid in root_ids[b : b + per]:
            leaves.extend(index.roots[rid])
        batches.append(leaves)
    return batches or [[]]


def exact_search(
    index: ISaxIndex,
    q: np.ndarray,
    *,
    k: int = 1,
    init_bsf: float = np.inf,
    n_threads: int = 8,
    n_batches: int | None = None,
    pq_threshold: int | None = 64,
    sorted_pqs: bool = True,
    help_th: int = 2,
) -> SearchStats:
    """Exact k-NN search on one node's index (Odyssey; MESSI baseline via
    ``sorted_pqs=False, pq_threshold=None``)."""
    q = np.asarray(q, dtype=np.float64)
    q_paa = paa(q, index.w)
    n_batches = n_threads if n_batches is None else n_batches

    approx_bsf, approx_nn, dists, member_ids, approx_cost = approx_search(
        index, q, q_paa
    )
    kbsf = _KBsf(k, init_bsf)
    kbsf.offer_many(dists, member_ids)
    stats = SearchStats(
        nn_dist=np.inf,
        nn_id=-1,
        topk=[],
        approx_bsf=approx_bsf,
        approx_cost=approx_cost,
    )
    if index.n_leaves == 0:
        stats.thread_time = approx_cost / max(1, n_threads)
        return stats

    # --- tree traversal phase: build the priority queues per RS-batch ---
    all_lbs = index.leaf_lower_bounds(q_paa)
    stats.leaf_lb = index.n_leaves
    batches = make_batches(index, n_batches)
    bound = kbsf.bound
    pqs: list[list] = []  # each: sorted [(lb, leaf_idx)]
    batch_costs: list[float] = []
    for leaves in batches:
        batch_costs.append(len(leaves) * index.w)
        current: list = []
        for leaf_idx in leaves:
            lb = float(all_lbs[leaf_idx])
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

    # --- PQ preprocessing: sort queue array by top-element priority ---
    if sorted_pqs:
        pqs.sort(key=lambda pq: pq[0][0])

    # --- PQ processing ---
    pq_costs: list[float] = []
    for pq in pqs:
        cost = 0.0
        for lb, leaf_idx in pq:
            if lb >= kbsf.bound:
                break  # queue sorted by lb: the rest is pruned too
            members = index.leaves[leaf_idx].members
            slb = mindist_paa_paa(q_paa, index.paa[members], index.length)
            stats.series_lb += len(members)
            cost += LEAF_OVERHEAD + len(members) * index.w
            survivors = members[slb < kbsf.bound]
            if len(survivors) == 0:
                stats.leaves_processed += 1
                continue
            diffs = index.data[survivors] - q
            real = np.sqrt(np.einsum("ij,ij->i", diffs, diffs))
            stats.real_series += len(survivors)
            cost += len(survivors) * index.length
            kbsf.offer_many(real, index.ids[survivors])
            stats.leaves_processed += 1
        pq_costs.append(cost)
    stats.pq_costs = pq_costs

    topk = kbsf.topk()
    stats.topk = topk
    if topk:
        stats.nn_dist, stats.nn_id = topk[0]
    elif np.isfinite(approx_bsf):
        # everything pruned by the shared bound; local best is the approx one
        stats.nn_dist, stats.nn_id = approx_bsf, approx_nn
    stats.thread_time = (
        approx_cost / max(1, n_threads)
        + _traversal_makespan(batch_costs, n_threads, help_th)
        + list_schedule(pq_costs, n_threads)
    )
    return stats

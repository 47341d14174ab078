"""PARTIAL-k replication layout (paper §3.3).

A system of ``n_nodes`` nodes under PARTIAL-k has ``k`` replication groups
and ``n_nodes / k`` clusters. Each cluster collectively stores the whole
dataset split into ``k`` disjoint chunks; replication group ``g`` is the
set of nodes (one per cluster) that all store chunk ``g``. Consequently:

* replication degree (copies of each chunk) = ``n_nodes / k``
* PARTIAL-1 = FULL (every node stores everything)
* PARTIAL-n_nodes = EQUALLY-SPLIT (no replication)

Scheduling and work-stealing operate *within* a replication group, since
only nodes of the same group share an index.
"""
from dataclasses import dataclass


@dataclass(frozen=True)
class ReplicationConfig:
    """One PARTIAL-k setting for an ``n_nodes`` system."""

    n_nodes: int
    k: int  # number of replication groups = number of chunks

    def __post_init__(self):
        if self.n_nodes % self.k != 0:
            raise ValueError(
                f"PARTIAL-{self.k} needs k to divide n_nodes={self.n_nodes}"
            )

    @property
    def n_chunks(self) -> int:
        return self.k

    @property
    def group_size(self) -> int:
        """Nodes per replication group (= replicas of each chunk)."""
        return self.n_nodes // self.k

    @property
    def replication_degree(self) -> int:
        return self.group_size

    @property
    def n_clusters(self) -> int:
        return self.n_nodes // self.k

    @property
    def name(self) -> str:
        if self.k == 1:
            return "FULL"
        if self.k == self.n_nodes:
            return "EQUALLY-SPLIT"
        return f"PARTIAL-{self.k}"

    def groups(self) -> list[list[int]]:
        """Node ids per replication group: group g holds chunk g."""
        return [
            [g * self.group_size + r for r in range(self.group_size)]
            for g in range(self.k)
        ]

    def total_index_bytes(self, per_chunk_bytes: dict[int, int]) -> int:
        """Total index footprint: each chunk's index exists on every
        replica in its group."""
        return sum(per_chunk_bytes[c] for c in range(self.k)) * self.group_size

    def total_data_series(self, per_chunk_series: dict[int, int]) -> int:
        return sum(per_chunk_series[c] for c in range(self.k)) * self.group_size


def supported_degrees(n_nodes: int) -> list[ReplicationConfig]:
    """The ``1 + log2(n_nodes)`` settings the paper enumerates:
    k ∈ {1, 2, 4, …, n_nodes} (n_nodes must be a power of two)."""
    if n_nodes & (n_nodes - 1):
        raise ValueError("paper's replication ladder assumes power-of-two nodes")
    out = []
    k = 1
    while k <= n_nodes:
        out.append(ReplicationConfig(n_nodes, k))
        k *= 2
    return out

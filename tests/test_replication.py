"""PARTIAL-k replication layout tests (paper §3.3)."""
import pytest

from repro.distributed.replication import ReplicationConfig, supported_degrees


@pytest.mark.parametrize(
    "k,group_size,degree,name",
    [
        (1, 8, 8, "FULL"),
        (2, 4, 4, "PARTIAL-2"),
        (4, 2, 2, "PARTIAL-4"),
        (8, 1, 1, "EQUALLY-SPLIT"),
    ],
)
def test_partial_k_math_for_8_nodes(k, group_size, degree, name):
    cfg = ReplicationConfig(8, k)
    assert cfg.n_chunks == k
    assert cfg.group_size == group_size
    assert cfg.replication_degree == degree
    assert cfg.n_clusters == degree
    assert cfg.name == name


def test_groups_partition_nodes():
    cfg = ReplicationConfig(8, 4)
    groups = cfg.groups()
    assert len(groups) == 4
    flat = sorted(n for g in groups for n in g)
    assert flat == list(range(8))
    assert all(len(g) == 2 for g in groups)


def test_invalid_k_raises():
    with pytest.raises(ValueError):
        ReplicationConfig(8, 3)


def test_supported_degrees_count():
    """The paper: 1 + log2(N) settings; for 8 nodes that is 4."""
    degs = supported_degrees(8)
    assert [c.k for c in degs] == [1, 2, 4, 8]
    assert len(supported_degrees(16)) == 5


def test_supported_degrees_requires_power_of_two():
    with pytest.raises(ValueError):
        supported_degrees(6)


def test_index_bytes_accounting():
    cfg = ReplicationConfig(8, 2)  # 2 chunks, 4 replicas each
    per_chunk = {0: 100, 1: 200}
    assert cfg.total_index_bytes(per_chunk) == (100 + 200) * 4
    full = ReplicationConfig(8, 1)
    assert full.total_index_bytes({0: 300}) == 300 * 8
    none = ReplicationConfig(8, 8)
    assert none.total_index_bytes({c: 10 for c in range(8)}) == 80


def test_more_replication_more_space():
    per_chunk_series = {c: 100 for c in range(8)}
    sizes = []
    for cfg in supported_degrees(8):
        per = {c: 800 // cfg.k for c in range(cfg.k)}
        sizes.append(cfg.total_data_series(per))
    assert sizes == sorted(sizes, reverse=True)  # FULL largest … EQ smallest

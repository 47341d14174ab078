"""Scheduling policy tests (paper §3.1 example included)."""
import numpy as np
import pytest

from repro.scheduling.schedulers import (
    ALL_POLICIES,
    DYNAMIC,
    POLICIES,
    PREDICT_DN,
    PREDICT_ST,
    PREDICT_ST_UNSORTED,
    STATIC,
    WORK_STEAL,
    WORK_STEAL_PREDICT,
    dynamic_order,
    static_assignment,
)


def test_policy_registry_complete():
    assert set(ALL_POLICIES) == set(POLICIES)
    assert POLICIES[WORK_STEAL].steal and POLICIES[WORK_STEAL_PREDICT].steal
    assert not POLICIES[STATIC].steal


@pytest.mark.parametrize("name", [STATIC, PREDICT_ST, PREDICT_ST_UNSORTED])
@pytest.mark.parametrize("n_nodes", [1, 2, 4, 7])
def test_static_assignment_partitions_queries(name, n_nodes):
    preds = np.arange(1.0, 21.0)
    buckets = static_assignment(POLICIES[name], 20, n_nodes, preds)
    flat = sorted(i for b in buckets for i in b)
    assert flat == list(range(20))
    assert len(buckets) == n_nodes


def test_static_contiguous_split():
    buckets = static_assignment(POLICIES[STATIC], 10, 3, None)
    assert buckets == [[0, 1, 2, 3], [4, 5, 6, 7], [8, 9]]


def test_paper_example_unsorted_static_prediction():
    """Section 3.1 worked example: ES={100,50,200,250,80}, two nodes →
    sn1 gets {q1,q4}, sn2 gets {q2,q3,q5} (0-indexed here)."""
    preds = np.array([100.0, 50.0, 200.0, 250.0, 80.0])
    buckets = static_assignment(POLICIES[PREDICT_ST_UNSORTED], 5, 2, preds)
    assert buckets == [[0, 3], [1, 2, 4]]


def test_paper_example_sorted_static_prediction():
    """Sorted variant: sn1 gets {q4,q5}, sn2 gets {q3,q1,q2}."""
    preds = np.array([100.0, 50.0, 200.0, 250.0, 80.0])
    buckets = static_assignment(POLICIES[PREDICT_ST], 5, 2, preds)
    assert buckets == [[3, 4], [2, 0, 1]]


def test_predicted_assignment_balances_loads():
    rng = np.random.default_rng(0)
    preds = rng.random(100) * 100
    buckets = static_assignment(POLICIES[PREDICT_ST], 100, 4, preds)
    loads = [preds[b].sum() for b in buckets]
    naive = static_assignment(POLICIES[STATIC], 100, 4, None)
    naive_loads = [preds[b].sum() for b in naive]
    assert max(loads) - min(loads) <= max(naive_loads) - min(naive_loads)


def test_dynamic_order_original_vs_sorted():
    preds = np.array([1.0, 5.0, 3.0])
    assert dynamic_order(POLICIES[DYNAMIC], 3, None) == [0, 1, 2]
    assert dynamic_order(POLICIES[PREDICT_DN], 3, preds) == [1, 2, 0]


def test_dynamic_order_tie_break_stable():
    preds = np.array([2.0, 2.0, 1.0])
    assert dynamic_order(POLICIES[PREDICT_DN], 3, preds) == [0, 1, 2]


def test_wrong_policy_kind_raises():
    with pytest.raises(ValueError):
        static_assignment(POLICIES[DYNAMIC], 5, 2, None)
    with pytest.raises(ValueError):
        dynamic_order(POLICIES[STATIC], 5, None)


def test_prediction_required():
    with pytest.raises(ValueError):
        static_assignment(POLICIES[PREDICT_ST], 5, 2, None)
    with pytest.raises(ValueError):
        dynamic_order(POLICIES[PREDICT_DN], 5, None)


def test_empty_batch():
    assert static_assignment(POLICIES[STATIC], 0, 3, None) == [[], [], []]
    assert dynamic_order(POLICIES[DYNAMIC], 0, None) == []

"""Query scheduling policies (paper §2, §3.1, evaluated in Fig 10).

Static policies pre-assign the batch to nodes; dynamic policies define a
pull order served by a coordinator. Prediction-based variants use the
linear BSF→cost estimates. Work-stealing is orthogonal and handled by
the simulator (WORK-STEAL = DYNAMIC + stealing, WORK-STEAL-PREDICT =
PREDICT-DN + stealing).
"""
from dataclasses import dataclass

import numpy as np

STATIC = "STATIC"
DYNAMIC = "DYNAMIC"
PREDICT_ST_UNSORTED = "PREDICT-ST-UNSORTED"
PREDICT_ST = "PREDICT-ST"
PREDICT_DN = "PREDICT-DN"
WORK_STEAL = "WORK-STEAL"
WORK_STEAL_PREDICT = "WORK-STEAL-PREDICT"

ALL_POLICIES = [
    STATIC,
    DYNAMIC,
    PREDICT_ST_UNSORTED,
    PREDICT_ST,
    PREDICT_DN,
    WORK_STEAL,
    WORK_STEAL_PREDICT,
]


@dataclass(frozen=True)
class Policy:
    name: str
    dynamic: bool  # coordinator-served pull order vs pre-assignment
    predicted: bool  # uses per-query cost estimates
    sort: bool  # sorts by decreasing estimate first
    steal: bool  # enables work stealing in the simulator


POLICIES: dict[str, Policy] = {
    STATIC: Policy(STATIC, dynamic=False, predicted=False, sort=False, steal=False),
    DYNAMIC: Policy(DYNAMIC, dynamic=True, predicted=False, sort=False, steal=False),
    PREDICT_ST_UNSORTED: Policy(
        PREDICT_ST_UNSORTED, dynamic=False, predicted=True, sort=False, steal=False
    ),
    PREDICT_ST: Policy(PREDICT_ST, dynamic=False, predicted=True, sort=True, steal=False),
    PREDICT_DN: Policy(PREDICT_DN, dynamic=True, predicted=True, sort=True, steal=False),
    WORK_STEAL: Policy(WORK_STEAL, dynamic=True, predicted=False, sort=False, steal=True),
    WORK_STEAL_PREDICT: Policy(
        WORK_STEAL_PREDICT, dynamic=True, predicted=True, sort=True, steal=True
    ),
}


def static_assignment(
    policy: Policy, n_queries: int, n_nodes: int, predictions: np.ndarray | None
) -> list[list[int]]:
    """Per-node query index lists for a static policy.

    STATIC: contiguous equal-count split. PREDICT-ST(-UNSORTED): greedy
    least-loaded assignment by estimated cost (paper's load variables),
    over the original or estimate-sorted order."""
    if policy.dynamic:
        raise ValueError(f"{policy.name} is not a static policy")
    idx = list(range(n_queries))
    if not policy.predicted:
        per = -(-n_queries // n_nodes) if n_queries else 0
        return [idx[i * per : (i + 1) * per] for i in range(n_nodes)]
    if predictions is None:
        raise ValueError(f"{policy.name} needs predictions")
    order = (
        sorted(idx, key=lambda i: (-predictions[i], i)) if policy.sort else idx
    )
    loads = np.zeros(n_nodes)
    buckets: list[list[int]] = [[] for _ in range(n_nodes)]
    for i in order:
        node = int(np.argmin(loads))
        buckets[node].append(i)
        loads[node] += predictions[i]
    return buckets


def dynamic_order(
    policy: Policy, n_queries: int, predictions: np.ndarray | None
) -> list[int]:
    """Coordinator serving order for a dynamic policy."""
    if not policy.dynamic:
        raise ValueError(f"{policy.name} is not a dynamic policy")
    idx = list(range(n_queries))
    if policy.sort:
        if predictions is None:
            raise ValueError(f"{policy.name} needs predictions")
        idx.sort(key=lambda i: (-predictions[i], i))
    return idx

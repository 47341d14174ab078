"""DMESSI baselines (paper §5 "Algorithms").

DMESSI runs an independent MESSI index in each system node over its
disjoint chunk: no BSF sharing, MESSI's priority-queue discipline
(unsorted queue array, no size threshold), coordinator merges partial
answers at the end. DMESSI-SW-BSF additionally shares BSF values
system-wide (here: the global initial k-BSF seed from the approximate
pass). Both run over an EQUALLY-SPLIT chunking — every node answers
every query, so the makespan is the slowest chunk.
"""
import numpy as np
from pyspark.sql import DataFrame

from ..distributed.engine import DistResult, distributed_search


def dmessi_search(
    chunked_df: DataFrame, queries: np.ndarray, **kwargs
) -> DistResult:
    """Independent MESSI per node, local-only BSFs."""
    return distributed_search(
        chunked_df, queries, share_bsf=False, algorithm="messi", **kwargs
    )


def dmessi_swbsf_search(
    chunked_df: DataFrame, queries: np.ndarray, **kwargs
) -> DistResult:
    """MESSI per node with system-wide BSF sharing."""
    return distributed_search(
        chunked_df, queries, share_bsf=True, algorithm="messi", **kwargs
    )

"""Z-normalisation and Piecewise Aggregate Approximation (PAA).

Data series similarity search conventionally operates on z-normalised
series; all generators in this repo emit normalised series so the index,
the brute-force oracle, and the Spark engine agree on the metric space.
"""
import numpy as np


def znorm(x: np.ndarray, eps: float = 1e-8) -> np.ndarray:
    """Z-normalise along the last axis. Constant series map to zeros."""
    x = np.asarray(x, dtype=np.float64)
    mu = x.mean(axis=-1, keepdims=True)
    sd = x.std(axis=-1, keepdims=True)
    return (x - mu) / np.maximum(sd, eps)


def paa(x: np.ndarray, w: int) -> np.ndarray:
    """PAA of series along the last axis into ``w`` equal segments.

    Requires the series length to be divisible by ``w`` (enforced), which
    keeps the standard MINDIST lower bound exact.
    """
    x = np.asarray(x, dtype=np.float64)
    n = x.shape[-1]
    if n % w != 0:
        raise ValueError(f"series length {n} not divisible by w={w}")
    return x.reshape(*x.shape[:-1], w, n // w).mean(axis=-1)

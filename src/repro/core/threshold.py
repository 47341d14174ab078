"""Priority-queue size threshold TH prediction (paper Fig 6).

The paper observes a sigmoid-shaped correlation between a query's *initial
BSF* and the median size of the priority queues produced while answering
it, fits ``f(Z) = m + (M - m) / (1 + b·exp(-c(Z - d)))``, and sets
``TH = f(initial_bsf) / division_factor``.

SciPy is unavailable, so the fit is a grid search over the nonlinear
parameters ``(c, d)`` (with ``b`` absorbed into ``d``) combined with a
closed-form linear least-squares solve for ``(m, M - m)`` — exact for the
linear part, dense enough on the nonlinear part for the prediction use.
"""
from dataclasses import dataclass

import numpy as np


@dataclass
class SigmoidFit:
    m: float
    M: float
    b: float
    c: float
    d: float
    rmse: float

    def __call__(self, z: np.ndarray) -> np.ndarray:
        z = np.asarray(z, dtype=np.float64)
        return self.m + (self.M - self.m) / (1.0 + self.b * np.exp(-self.c * (z - self.d)))


def fit_sigmoid(z: np.ndarray, y: np.ndarray, *, n_grid: int = 40) -> SigmoidFit:
    """Least-squares sigmoid fit of ``y ≈ f(z)`` (b fixed to 1)."""
    z = np.asarray(z, dtype=np.float64)
    y = np.asarray(y, dtype=np.float64)
    if len(z) < 3:
        raise ValueError("need at least 3 points to fit the sigmoid")
    span = max(z.max() - z.min(), 1e-9)
    c_grid = np.geomspace(0.1 / span, 50.0 / span, n_grid)
    d_grid = np.linspace(z.min(), z.max(), n_grid)
    best = None
    for c in c_grid:
        for d in d_grid:
            s = 1.0 / (1.0 + np.exp(-c * (z - d)))
            a_mat = np.column_stack([np.ones_like(s), s])
            coef, *_ = np.linalg.lstsq(a_mat, y, rcond=None)
            resid = a_mat @ coef - y
            rmse = float(np.sqrt(np.mean(resid**2)))
            if best is None or rmse < best[0]:
                best = (rmse, float(coef[0]), float(coef[0] + coef[1]), float(c), float(d))
    rmse, m, big_m, c, d = best
    return SigmoidFit(m=m, M=big_m, b=1.0, c=c, d=d, rmse=rmse)


def fit_threshold_model(
    initial_bsfs: np.ndarray, median_pq_sizes: np.ndarray
) -> SigmoidFit:
    """Fit the TH model from per-query (initial BSF, median PQ size) pairs."""
    return fit_sigmoid(initial_bsfs, median_pq_sizes)


def predict_threshold(
    fit: SigmoidFit, initial_bsf: float, *, division_factor: float = 16.0, floor: int = 4
) -> int:
    """TH for one query: fitted median PQ size divided by the tuned factor
    (16 for Seismic in the paper), floored to keep queues non-degenerate."""
    return max(floor, int(round(float(fit(initial_bsf)) / division_factor)))

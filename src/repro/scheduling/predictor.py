"""Execution-time prediction from the initial BSF (paper §3.1, Fig 4).

The paper observes that queries with a high *initial BSF* (the approximate
answer) tend to have high execution times, and fits a linear regression
per dataset. Same here: fit on a training query batch's
``(initial_bsf, measured cost)`` pairs, predict for the scheduling batch.
"""
from dataclasses import dataclass

import numpy as np


@dataclass
class LinearPredictor:
    slope: float
    intercept: float
    r2: float

    def predict(self, initial_bsf: np.ndarray) -> np.ndarray:
        z = np.asarray(initial_bsf, dtype=np.float64)
        return np.maximum(1e-9, self.slope * z + self.intercept)


def fit_predictor(initial_bsfs: np.ndarray, costs: np.ndarray) -> LinearPredictor:
    """Least-squares line cost ≈ a·bsf + b, with the fit's R²."""
    z = np.asarray(initial_bsfs, dtype=np.float64)
    y = np.asarray(costs, dtype=np.float64)
    if len(z) < 2:
        raise ValueError("need at least 2 training queries")
    slope, intercept = np.polyfit(z, y, 1)
    pred = slope * z + intercept
    ss_res = float(np.sum((y - pred) ** 2))
    ss_tot = float(np.sum((y - y.mean()) ** 2))
    r2 = 1.0 - ss_res / ss_tot if ss_tot > 0 else 0.0
    return LinearPredictor(slope=float(slope), intercept=float(intercept), r2=r2)

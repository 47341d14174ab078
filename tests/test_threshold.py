"""Sigmoid TH-model tests (paper Fig 6)."""
import numpy as np
import pytest

from repro.core.index import build_index
from repro.core.search import exact_search
from repro.core.threshold import fit_sigmoid, fit_threshold_model, predict_threshold
from repro.synth_data import clustered_walks_np, make_queries_np


def test_fit_recovers_synthetic_sigmoid():
    rng = np.random.default_rng(0)
    z = np.linspace(0, 10, 80)
    true = 5 + 95 / (1 + np.exp(-1.2 * (z - 5)))
    fit = fit_sigmoid(z, true + rng.normal(0, 1.0, len(z)))
    assert fit.rmse < 3.0
    pred = fit(z)
    assert pred[0] < 20 and pred[-1] > 80


def test_fit_monotone_output_for_monotone_data():
    z = np.linspace(0, 1, 50)
    y = 10 + 40 / (1 + np.exp(-12 * (z - 0.5)))
    fit = fit_sigmoid(z, y)
    p = fit(np.linspace(0, 1, 20))
    assert np.all(np.diff(p) >= -1e-6)


def test_fit_requires_points():
    with pytest.raises(ValueError):
        fit_sigmoid(np.array([1.0, 2.0]), np.array([1.0, 2.0]))


def test_predict_threshold_divides_and_floors():
    fit = fit_sigmoid(np.linspace(0, 1, 10), np.full(10, 160.0))
    assert predict_threshold(fit, 0.5, division_factor=16) == 10
    assert predict_threshold(fit, 0.5, division_factor=1000) == 4  # floor


def test_threshold_model_on_measured_pq_sizes():
    """End-to-end: fit on (initial BSF, median PQ size) from real searches;
    the model must predict within the observed range."""
    data = clustered_walks_np(400, 64, seed=3)
    index = build_index(np.arange(400), data, leaf_capacity=16)
    queries, _ = make_queries_np(data, 25, seed=4)
    bsfs, medians = [], []
    for q in queries:
        st = exact_search(index, q, pq_threshold=None)
        if st.pq_sizes:
            bsfs.append(st.approx_bsf)
            medians.append(float(np.median(st.pq_sizes)))
    fit = fit_threshold_model(np.array(bsfs), np.array(medians))
    preds = fit(np.array(bsfs))
    assert preds.min() >= min(medians) - np.ptp(medians)
    assert preds.max() <= max(medians) + np.ptp(medians)


def test_larger_division_factor_smaller_threshold():
    fit = fit_sigmoid(np.linspace(0, 1, 10), np.linspace(100, 400, 10))
    t4 = predict_threshold(fit, 0.8, division_factor=4)
    t16 = predict_threshold(fit, 0.8, division_factor=16)
    assert t4 >= t16

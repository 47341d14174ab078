"""Linear BSF→cost predictor tests (paper Fig 4)."""
import numpy as np
import pytest

from repro.core.index import build_index
from repro.core.search import exact_search
from repro.scheduling.predictor import fit_predictor
from repro.synth_data import clustered_walks_np, make_queries_np


def test_fit_exact_line():
    z = np.linspace(1, 10, 20)
    p = fit_predictor(z, 3 * z + 5)
    assert p.slope == pytest.approx(3.0)
    assert p.intercept == pytest.approx(5.0)
    assert p.r2 == pytest.approx(1.0)


def test_predictions_clipped_positive():
    p = fit_predictor(np.array([0.0, 1.0]), np.array([-5.0, -4.0]))
    assert np.all(p.predict(np.array([0.0, 10.0])) > 0)


def test_fit_needs_two_points():
    with pytest.raises(ValueError):
        fit_predictor(np.array([1.0]), np.array([1.0]))


def test_noise_reduces_r2():
    rng = np.random.default_rng(0)
    z = np.linspace(0, 1, 100)
    clean = fit_predictor(z, 2 * z)
    noisy = fit_predictor(z, 2 * z + rng.normal(0, 0.5, 100))
    assert noisy.r2 < clean.r2


def test_bsf_correlates_with_measured_cost():
    """The paper's core scheduling observation: initial BSF predicts cost.
    Verified on real measured searches over the seismic-like dataset."""
    data = clustered_walks_np(1000, 64, seed=6)
    index = build_index(np.arange(1000), data, leaf_capacity=32)
    queries, _ = make_queries_np(data, 60, seed=7, hard_frac=0.25)
    bsfs, costs = [], []
    for q in queries:
        st = exact_search(index, q)
        bsfs.append(st.approx_bsf)
        costs.append(st.total_cost)
    p = fit_predictor(np.array(bsfs), np.array(costs))
    assert p.slope > 0  # higher initial BSF ⇒ more work
    assert p.r2 > 0.3


def test_predictor_ranks_hard_above_easy():
    p = fit_predictor(np.array([1.0, 2.0, 3.0]), np.array([10.0, 20.0, 30.0]))
    preds = p.predict(np.array([1.5, 2.9]))
    assert preds[1] > preds[0]

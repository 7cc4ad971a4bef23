"""MaxError and Precision@k (paper §4 Metrics)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro import metrics


def test_max_error_basic():
    a = np.array([0.1, 0.5, 0.9])
    b = np.array([0.1, 0.4, 1.0])
    assert metrics.max_error(a, b) == pytest.approx(0.1)


def test_max_error_zero_on_equal():
    v = np.random.default_rng(0).random(50)
    assert metrics.max_error(v, v.copy()) == 0.0


def test_max_error_shape_mismatch():
    with pytest.raises(ValueError):
        metrics.max_error(np.ones(3), np.ones(4))


def test_top_k_excludes_and_breaks_ties_by_id():
    scores = np.array([0.9, 0.5, 0.5, 0.1])
    assert metrics.top_k(scores, 2, exclude=0).tolist() == [1, 2]
    assert metrics.top_k(scores, 3, exclude=1).tolist() == [0, 2, 3]


def test_precision_perfect_and_disjoint():
    truth = np.array([1.0, 0.9, 0.8, 0.7, 0.0, 0.0])
    est_good = truth.copy()
    assert metrics.precision_at_k(est_good, truth, 3, source=0) == 1.0
    est_bad = truth[::-1].copy()
    assert metrics.precision_at_k(est_bad, truth, 2, source=0) == 0.0


def test_precision_partial_overlap():
    truth = np.array([1.0, 0.9, 0.8, 0.7, 0.6])
    est = np.array([1.0, 0.9, 0.6, 0.7, 0.8])  # same top-4 set {1,2,3,4}
    assert metrics.precision_at_k(est, truth, 2, source=0) == 0.5
    assert metrics.precision_at_k(est, truth, 4, source=0) == 1.0


def test_precision_k_clipped_to_n_minus_one():
    truth = np.array([1.0, 0.5, 0.4])
    assert metrics.precision_at_k(truth, truth, 100, source=0) == 1.0


def test_precision_invariant_to_monotone_rescale():
    rng = np.random.default_rng(1)
    truth = rng.random(40)
    est = 0.5 * truth + 0.1  # same ranking
    assert metrics.precision_at_k(est, truth, 10, source=3) == 1.0


@given(st.integers(min_value=0, max_value=10**6))
@settings(max_examples=20, deadline=None)
def test_precision_self_is_always_one(seed):
    v = np.random.default_rng(seed).random(20)
    assert metrics.precision_at_k(v, v.copy(), 5, source=0) == 1.0


@given(st.integers(min_value=0, max_value=10**6))
@settings(max_examples=20, deadline=None)
def test_precision_in_unit_interval(seed):
    rng = np.random.default_rng(seed)
    a, b = rng.random(15), rng.random(15)
    p = metrics.precision_at_k(a, b, 5, source=2)
    assert 0.0 <= p <= 1.0

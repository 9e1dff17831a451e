"""Aesthetic metric tests (ND, ULCV, AR, rescale)."""
import math

import numpy as np
import pytest

from repro.metrics import (
    all_metrics,
    ar_score,
    edge_lengths,
    nd_score,
    rescale_layout,
    ulcv_score,
)


def test_rescale_zero_mean_unit_max():
    X = np.array([[0.0, 0.0], [4.0, 0.0], [2.0, 2.0]])
    Xn = rescale_layout(X)
    np.testing.assert_allclose(Xn.mean(axis=0), [0, 0], atol=1e-12)
    assert np.abs(Xn).max() == pytest.approx(1.0)


def test_rescale_degenerate_all_same():
    X = np.ones((3, 2))
    assert np.isfinite(rescale_layout(X)).all()


def test_nd_two_points():
    X = np.array([[0.0, 0.0], [2.0, 0.0]])
    assert nd_score(X) == pytest.approx(0.25)


def test_nd_triangle():
    X = np.array([[0.0, 0.0], [1.0, 0.0], [0.0, 1.0]])
    assert nd_score(X) == pytest.approx(1 + 1 + 0.5)


def test_nd_overlap_infinite():
    X = np.array([[0.0, 0.0], [0.0, 0.0], [1.0, 1.0]])
    assert nd_score(X) == float("inf")


def test_nd_single_point():
    assert nd_score(np.zeros((1, 2))) == 0.0


def test_edge_lengths():
    X = np.array([[0.0, 0.0], [3.0, 4.0]])
    ls = edge_lengths(X, np.array([0]), np.array([1]))
    assert ls[0] == pytest.approx(5.0)


def test_ulcv_uniform_edges_zero():
    X = np.array([[0.0, 0.0], [1.0, 0.0], [1.0, 1.0], [0.0, 1.0]])
    u = np.array([0, 1, 2, 3])
    v = np.array([1, 2, 3, 0])
    assert ulcv_score(X, u, v) == pytest.approx(0.0)


def test_ulcv_skewed_positive():
    X = np.array([[0.0, 0.0], [1.0, 0.0], [10.0, 0.0]])
    assert ulcv_score(X, np.array([0, 1]), np.array([1, 2])) > 0.5


def test_ulcv_no_edges_nan():
    assert math.isnan(ulcv_score(np.zeros((2, 2)), np.array([], int), np.array([], int)))


def test_ulcv_degenerate_nan():
    X = np.zeros((3, 2))
    assert math.isnan(ulcv_score(X, np.array([0]), np.array([1])))


def test_ar_perfect_cross_zero():
    """Degree-4 node with neighbors at exact right angles: zero deviation."""
    X = np.array([[0.0, 0.0], [1.0, 0.0], [0.0, 1.0], [-1.0, 0.0], [0.0, -1.0]])
    u = np.zeros(4, dtype=int)
    v = np.arange(1, 5)
    # leaves have degree 1 (skipped); center has perfect 90-degree gaps
    assert ar_score(X, u, v) == pytest.approx(0.0, abs=1e-9)


def test_ar_collinear_worse_than_spread():
    X_bad = np.array([[0.0, 0.0], [1.0, 0.01], [1.0, -0.01]])
    X_good = np.array([[0.0, 0.0], [1.0, 0.0], [-1.0, 0.0]])
    u = np.array([0, 0])
    v = np.array([1, 2])
    assert ar_score(X_bad, u, v) > ar_score(X_good, u, v)


def test_ar_zero_length_edge_nan():
    X = np.zeros((3, 2))
    X[2] = [1, 0]
    assert math.isnan(ar_score(X, np.array([0, 0]), np.array([1, 2])))


def test_all_metrics_keys(twego):
    rng = np.random.default_rng(0)
    X = rng.random((twego.n, 2))
    s, d = twego.edge_array()
    und = s < d
    m = all_metrics(X, s[und], d[und])
    assert set(m) == {"ND", "ULCV", "AR"}
    assert np.isfinite(m["ND"])

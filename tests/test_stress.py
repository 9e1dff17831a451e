"""Stress majorization tests (Eq. 7-10)."""
import numpy as np
import pytest

from repro.layout.stress import stress_loss, stress_majorization


def _dist_matrix(points):
    diff = points[:, None, :] - points[None, :, :]
    return np.sqrt((diff**2).sum(-1))


def test_recovers_planar_config():
    """Distances of points in the plane embed with ~zero stress."""
    rng = np.random.default_rng(0)
    P = rng.random((12, 2)) * 5
    D = _dist_matrix(P)
    X = stress_majorization(D, seed=1, max_iter=500)
    assert stress_loss(X, D) < 1e-3


def test_distances_reproduced_up_to_rigid_motion():
    P = np.array([[0.0, 0.0], [3.0, 0.0], [0.0, 4.0]])
    D = _dist_matrix(P)
    X = stress_majorization(D, seed=0, max_iter=500)
    np.testing.assert_allclose(_dist_matrix(X), D, atol=1e-3)


def test_loss_monotone_improvement():
    rng = np.random.default_rng(2)
    P = rng.random((15, 2))
    D = _dist_matrix(P)
    X0 = rng.random((15, 2))
    l0 = stress_loss(X0, D)
    X = stress_majorization(D, init=X0, max_iter=50)
    assert stress_loss(X, D) < l0


def test_deterministic_in_seed():
    D = _dist_matrix(np.random.default_rng(1).random((8, 2)))
    X1 = stress_majorization(D, seed=5)
    X2 = stress_majorization(D, seed=5)
    np.testing.assert_allclose(X1, X2)


def test_single_point():
    assert stress_majorization(np.zeros((1, 1))).shape == (1, 2)


def test_two_points_exact():
    D = np.array([[0.0, 7.0], [7.0, 0.0]])
    X = stress_majorization(D, seed=0, max_iter=300)
    assert np.linalg.norm(X[0] - X[1]) == pytest.approx(7.0, abs=1e-4)


def test_output_shape():
    D = _dist_matrix(np.random.default_rng(3).random((9, 2)))
    assert stress_majorization(D, seed=0).shape == (9, 2)


def test_zero_offdiag_treated_as_unconstrained():
    D = np.array(
        [[0.0, 1.0, 0.0], [1.0, 0.0, 1.0], [0.0, 1.0, 0.0]]
    )
    X = stress_majorization(D, seed=0, max_iter=200)
    assert np.isfinite(X).all()


def test_square_embeds():
    """Unit square distances (with diagonals) reproduce a square."""
    P = np.array([[0, 0], [1, 0], [1, 1], [0, 1]], dtype=float)
    D = _dist_matrix(P)
    X = stress_majorization(D, seed=2, max_iter=500)
    np.testing.assert_allclose(np.sort(_dist_matrix(X).ravel()), np.sort(D.ravel()), atol=1e-3)

"""Force-directed layout tests (FR, LinLog, ForceAtlas2)."""
import numpy as np
import pytest

from repro.graphs.csr import CSRGraph
from repro.layout.force import forceatlas2, fruchterman_reingold, linlog


@pytest.fixture(scope="module")
def barbell():
    """Two triangles joined by one edge — clusters must separate."""
    u = np.array([0, 0, 1, 3, 3, 4, 2])
    v = np.array([1, 2, 2, 4, 5, 5, 3])
    return CSRGraph.from_undirected(6, u, v)


@pytest.mark.parametrize("fn", [fruchterman_reingold, linlog, forceatlas2])
def test_shape_and_finite(fn, twego):
    X = fn(twego, seed=0, n_iter=60)
    assert X.shape == (twego.n, 2)
    assert np.isfinite(X).all()


@pytest.mark.parametrize("fn", [fruchterman_reingold, linlog, forceatlas2])
def test_deterministic(fn, barbell):
    X1 = fn(barbell, seed=4, n_iter=50)
    X2 = fn(barbell, seed=4, n_iter=50)
    np.testing.assert_allclose(X1, X2)


@pytest.mark.parametrize("fn", [fruchterman_reingold, linlog, forceatlas2])
def test_clusters_separate(fn, barbell):
    X = fn(barbell, seed=0, n_iter=300)
    c1, c2 = X[:3].mean(axis=0), X[3:].mean(axis=0)
    intra = max(
        np.linalg.norm(X[:3] - c1, axis=1).max(),
        np.linalg.norm(X[3:] - c2, axis=1).max(),
    )
    assert np.linalg.norm(c1 - c2) > intra


def test_fr_no_overlap(twego):
    X = fruchterman_reingold(twego, seed=0, n_iter=200)
    d2 = ((X[:, None] - X[None, :]) ** 2).sum(-1)
    iu = np.triu_indices(twego.n, k=1)
    assert d2[iu].min() > 1e-8


def test_edges_shorter_than_nonedges_on_average(barbell):
    X = fruchterman_reingold(barbell, seed=1, n_iter=300)
    s, d = barbell.edge_array()
    und = s < d
    e_len = np.linalg.norm(X[s[und]] - X[d[und]], axis=1).mean()
    diff = X[:, None] - X[None, :]
    dist = np.sqrt((diff**2).sum(-1))
    iu = np.triu_indices(barbell.n, k=1)
    assert e_len < dist[iu].mean()

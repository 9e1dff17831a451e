"""OpenOrd [52] — thin multi-level wrapper.

In every *table* of the paper OpenOrd's quality column is merged with FR
("OpenOrd/FR": OpenOrd applies FR to draw each supergraph, §7.2.1), so the
quality harness reuses :func:`fruchterman_reingold` for that column. This
module provides the multi-level procedure itself — layout of the whole
graph first, then hierarchical clustering of the 2-D layout — used by the
end-to-end efficiency jobs; its five-stage annealing schedule is modelled
by the FR temperature schedule (DESIGN.md §1 row 18).
"""
from __future__ import annotations

import numpy as np

from repro.graphs.csr import CSRGraph
from repro.layout.force import fruchterman_reingold


def openord_layout(g: CSRGraph, *, seed: int = 0, n_iter: int = 300) -> np.ndarray:
    """Single-level OpenOrd drawing = FR with annealing (paper treats the
    two as one method in all quality tables)."""
    return fruchterman_reingold(g, seed=seed, n_iter=n_iter)


def openord_cluster_layout(
    g: CSRGraph, k: int, *, seed: int = 0, n_iter: int = 200
) -> tuple[np.ndarray, np.ndarray]:
    """OpenOrd preprocessing: full-graph layout, then k-means-style
    clustering of the 2-D positions (OpenOrd clusters *in layout space*,
    which is why its preprocessing scales with a whole-graph drawing —
    the Fig. 13 cost the paper contrasts with PPRviz). Returns
    (positions, cluster labels)."""
    X = fruchterman_reingold(g, seed=seed, n_iter=n_iter)
    rng = np.random.default_rng(seed)
    n_clusters = max(1, g.n // max(1, k))
    centers = X[rng.choice(g.n, size=min(n_clusters, g.n), replace=False)]
    labels = np.zeros(g.n, dtype=np.int64)
    for _ in range(10):
        d2 = ((X[:, None, :] - centers[None, :, :]) ** 2).sum(-1)
        labels = d2.argmin(axis=1)
        for c in range(len(centers)):
            pts = X[labels == c]
            if len(pts):
                centers[c] = pts.mean(axis=0)
    return X, labels

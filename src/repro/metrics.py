"""Aesthetic criteria: ND (Def. 2.1), ULCV (Def. 2.2), AR (Appendix A.5).

Layouts are first normalized to a common scale ("we follow NetworkX and
normalize each layout to the same scale", §7.1): center at the origin and
scale so the maximum absolute coordinate is 1 (networkx.rescale_layout).

* ND — sum over node pairs of 1/d^2; coincident nodes give inf.
* ULCV — std/mean of edge lengths; undefined (nan) for a degenerate layout
  whose edges all have length 0 (the paper's "-" entries).
* AR — angular resolution deviation: for each node with degree >= 2 the
  incident edges ideally spread 2*pi/deg apart; the score sums the absolute
  deviations of consecutive incident-edge angles from that ideal over all
  nodes (smaller = better, matching Table 11's direction). The paper cites
  [72] without a formula; this is the standard formulation.
"""
from __future__ import annotations

import numpy as np


def rescale_layout(X: np.ndarray) -> np.ndarray:
    """NetworkX-style normalization: zero-mean, max-abs-coordinate 1."""
    X = np.asarray(X, dtype=np.float64)
    X = X - X.mean(axis=0, keepdims=True)
    s = np.abs(X).max()
    return X / s if s > 0 else X


def nd_score(X: np.ndarray) -> float:
    """Node distribution ND(X) = sum_{i<j} 1/||X_i - X_j||^2."""
    X = np.asarray(X, dtype=np.float64)
    n = len(X)
    if n < 2:
        return 0.0
    d2 = ((X[:, None, :] - X[None, :, :]) ** 2).sum(-1)
    iu = np.triu_indices(n, k=1)
    vals = d2[iu]
    # exact or near-machine-precision coincidence = node overlap = inf
    # (catches PMDS's shared-pivot collapse and eigenvector twin nodes)
    if (vals < 1e-16).any():
        return float("inf")
    return float((1.0 / vals).sum())


def edge_lengths(X: np.ndarray, u: np.ndarray, v: np.ndarray) -> np.ndarray:
    return np.linalg.norm(X[u] - X[v], axis=1)


def ulcv_score(X: np.ndarray, u: np.ndarray, v: np.ndarray) -> float:
    """Uniform length coefficient of variation: std/mean of edge lengths."""
    ls = edge_lengths(X, u, v)
    if len(ls) == 0:
        return float("nan")
    mu = ls.mean()
    if mu == 0:
        return float("nan")
    return float(ls.std() / mu)


def ar_score(X: np.ndarray, u: np.ndarray, v: np.ndarray) -> float:
    """Angular-resolution deviation (smaller = better; nan if degenerate).

    For each endpoint, sort the angles of its incident edges and sum
    |gap - 2 pi / deg| over consecutive gaps (including wrap-around).
    Zero-length edges make the angle undefined -> nan ("-" in Table 11).
    """
    X = np.asarray(X, dtype=np.float64)
    n = len(X)
    adj: list[list[int]] = [[] for _ in range(n)]
    for a, b in zip(u.tolist(), v.tolist()):
        adj[a].append(b)
        adj[b].append(a)
    total = 0.0
    for i in range(n):
        nbrs = adj[i]
        if len(nbrs) < 2:
            continue
        vecs = X[np.asarray(nbrs)] - X[i]
        norms = np.linalg.norm(vecs, axis=1)
        if (norms == 0).any():
            return float("nan")
        ang = np.sort(np.arctan2(vecs[:, 1], vecs[:, 0]))
        gaps = np.diff(np.concatenate([ang, [ang[0] + 2 * np.pi]]))
        ideal = 2 * np.pi / len(nbrs)
        total += float(np.abs(gaps - ideal).sum())
    return total


def all_metrics(X: np.ndarray, u: np.ndarray, v: np.ndarray) -> dict[str, float]:
    """ND/ULCV/AR of a normalized copy of X over undirected edges (u, v)."""
    Xn = rescale_layout(X)
    return {
        "ND": nd_score(Xn),
        "ULCV": ulcv_score(Xn, u, v),
        "AR": ar_score(Xn, u, v),
    }

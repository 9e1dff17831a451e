"""PDist — the paper's node distance measure (Definition 3.1, Eq. (1))
and level-l DPPR (Definition 3.4, Eq. (2)).

Delta[i, j] = min( max( 1 - ln( pi_d(i,j) + pi_d(j,i) ), 2 ), 2 ln n )

where pi_d(i, j) = pi(i, j) * d(i) is degree-normalized PPR. The log is
natural; the truncation bounds [2, 2 ln n] preclude node overlap (lower)
and blank space (upper), per §3.1.
"""
from __future__ import annotations

import numpy as np


def pdist_from_dppr(z: np.ndarray, n: int) -> np.ndarray:
    """Eq. (1) transform of the *symmetrized* DPPR z = pi_d(i,j)+pi_d(j,i).

    z may be any shape; zeros map to the upper bound 2 ln n. ``n`` is the
    node count of the *underlying graph* (the truncation scale), not the
    number of items being laid out.
    """
    z = np.asarray(z, dtype=np.float64)
    upper = 2.0 * np.log(max(n, 2))
    with np.errstate(divide="ignore"):
        raw = 1.0 - np.log(np.where(z > 0, z, np.nan))
    raw = np.where(np.isnan(raw), upper, raw)
    return np.minimum(np.maximum(raw, 2.0), upper)


def pdist_matrix(dppr: np.ndarray, n: int) -> np.ndarray:
    """PDist matrix from a (possibly asymmetric) DPPR matrix.

    Symmetrizes with dppr + dppr.T (Def. 3.1), applies Eq. (1), and zeroes
    the diagonal (self-distance is not part of the definition; the stress
    embedding only consumes i < j entries).
    """
    z = dppr + dppr.T
    out = pdist_from_dppr(z, n)
    np.fill_diagonal(out, 0.0)
    return out


def level_dppr_exact(dppr_leaf: np.ndarray, leaf_sets: list[np.ndarray]) -> np.ndarray:
    """Exact level-l DPPR (Eq. (2)) from the full leaf DPPR matrix.

    Ground truth for Tau-Push accuracy tests and the PI variant:
    pi_d(V_i, V_j) = mean over F(V_i) x F(V_j) of pi_d(s, t).
    """
    k = len(leaf_sets)
    out = np.zeros((k, k))
    for i, fi in enumerate(leaf_sets):
        for j, fj in enumerate(leaf_sets):
            out[i, j] = dppr_leaf[np.ix_(fi, fj)].mean()
    return out


def approx_pdist_error_bounds(theta: float, sigma: float) -> tuple[float, float]:
    """Lemma 3.6: (eps, delta) ensuring a (theta, sigma)-approximate PDist.

    delta = e^(1-sigma)/2, eps = 1 - (1/e^2)^theta.
    """
    delta = np.exp(1.0 - sigma) / 2.0
    eps = 1.0 - np.exp(-2.0 * theta)
    return eps, delta

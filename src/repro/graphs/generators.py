"""Deterministic synthetic graph generators.

Substitutes for the 12 public graphs in paper Table 3 (no network access in
this container — see DESIGN.md §5.1). Three families:

* :func:`ego_graph` — a dense ego cluster plus satellite cliques, some
  disconnected (TwEgo / FbEgo analogs; reproduces the multi-component
  structure the paper's Fig. 2/9 case studies rely on).
* :func:`sbm` — stochastic block model (Wiki-ii / Physician / FilmTrust /
  SciNet analogs: clear community structure at the paper's exact n).
* :func:`chung_lu_community` — power-law (Chung–Lu) degree sequence with
  planted communities (Amazon…Twitter analogs at reduced scale; preserves
  the degree/DPR skew that drives Tau-Push's filter-refinement behaviour).

All generators return unique *undirected* edges ``(u, v), u < v`` with no
self-loops and no isolated nodes, deterministic in ``seed``.
"""
from __future__ import annotations

import numpy as np


def _dedup(u: np.ndarray, v: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Canonicalize to u<v, drop self-loops and duplicates."""
    lo = np.minimum(u, v)
    hi = np.maximum(u, v)
    keep = lo != hi
    lo, hi = lo[keep], hi[keep]
    key = lo * np.int64(1) * (hi.max() + 1 if len(hi) else 1) + hi
    _, idx = np.unique(key, return_index=True)
    return lo[idx], hi[idx]


def _attach_isolated(n: int, u: np.ndarray, v: np.ndarray, rng: np.random.Generator):
    """Give every isolated node one edge so degrees are all >= 1."""
    deg = np.zeros(n, dtype=np.int64)
    np.add.at(deg, u, 1)
    np.add.at(deg, v, 1)
    iso = np.flatnonzero(deg == 0)
    if len(iso):
        partners = rng.integers(0, n, len(iso))
        partners = np.where(partners == iso, (iso + 1) % n, partners)
        u = np.concatenate([u, np.minimum(iso, partners)])
        v = np.concatenate([v, np.maximum(iso, partners)])
        u, v = _dedup(u, v)
    return u, v


def ego_graph(
    n_core: int,
    cliques: tuple[int, ...],
    *,
    p_core: float = 0.35,
    seed: int = 0,
) -> tuple[int, np.ndarray, np.ndarray]:
    """Ego-network analog: one dense core cluster + satellite cliques.

    The ego (node 0) is connected to every core node; core nodes link with
    probability ``p_core``. Each entry of ``cliques`` adds a complete clique
    *disconnected* from the core (the paper's FbEgo contains 2-cliques in
    separate components, which is what breaks SimRank there).

    Returns ``(n, u, v)`` undirected edges.
    """
    rng = np.random.default_rng(seed)
    edges_u, edges_v = [], []
    # ego spokes
    edges_u.append(np.zeros(n_core - 1, dtype=np.int64))
    edges_v.append(np.arange(1, n_core, dtype=np.int64))
    # core density
    iu, iv = np.triu_indices(n_core - 1, k=1)
    iu, iv = iu + 1, iv + 1
    mask = rng.random(len(iu)) < p_core
    edges_u.append(iu[mask].astype(np.int64))
    edges_v.append(iv[mask].astype(np.int64))
    nxt = n_core
    for c in cliques:
        ids = np.arange(nxt, nxt + c, dtype=np.int64)
        cu, cv = np.triu_indices(c, k=1)
        edges_u.append(ids[cu])
        edges_v.append(ids[cv])
        nxt += c
    u = np.concatenate(edges_u)
    v = np.concatenate(edges_v)
    u, v = _dedup(u, v)
    return nxt, u, v


def sbm(
    sizes: list[int],
    p_in: float,
    p_out: float,
    *,
    seed: int = 0,
) -> tuple[int, np.ndarray, np.ndarray]:
    """Stochastic block model with given community sizes.

    Intra-community pairs connect with ``p_in``; inter with ``p_out``.
    Sampled sparsely (binomial count + pair sampling) so it scales past the
    dense n^2 regime. Returns ``(n, u, v)`` undirected edges.
    """
    rng = np.random.default_rng(seed)
    n = int(sum(sizes))
    bounds = np.concatenate([[0], np.cumsum(sizes)]).astype(np.int64)
    us, vs = [], []
    for ci in range(len(sizes)):
        lo, hi = bounds[ci], bounds[ci + 1]
        sz = hi - lo
        n_pairs = sz * (sz - 1) // 2
        cnt = rng.binomial(n_pairs, p_in)
        if cnt:
            a = rng.integers(lo, hi, cnt * 2)
            b = rng.integers(lo, hi, cnt * 2)
            us.append(a)
            vs.append(b)
        for cj in range(ci + 1, len(sizes)):
            lo2, hi2 = bounds[cj], bounds[cj + 1]
            cnt = rng.binomial(sz * (hi2 - lo2), p_out)
            if cnt:
                us.append(rng.integers(lo, hi, cnt))
                vs.append(rng.integers(lo2, hi2, cnt))
    u = np.concatenate(us) if us else np.empty(0, dtype=np.int64)
    v = np.concatenate(vs) if vs else np.empty(0, dtype=np.int64)
    u, v = _dedup(u.astype(np.int64), v.astype(np.int64))
    u, v = _attach_isolated(n, u, v, rng)
    return n, u, v


def chung_lu_community(
    n: int,
    target_m: int,
    *,
    exponent: float = 2.2,
    n_comm: int = 0,
    intra_frac: float = 0.7,
    seed: int = 0,
) -> tuple[int, np.ndarray, np.ndarray]:
    """Power-law graph with planted communities (large-graph analog).

    Node weights follow ``w_i ~ i^{-1/(exponent-1)}`` (Chung–Lu), so degrees
    follow a power law with the given ``exponent`` (paper App. A.4 assumes
    b in [2,3]; b=2 on Twitter). ``intra_frac`` of the arcs are sampled
    within ``n_comm`` random communities, the rest globally, giving the
    modular structure Louvain+ needs. Returns ``(n, u, v)`` undirected
    unique edges (count is slightly below ``target_m`` after dedup).
    """
    rng = np.random.default_rng(seed)
    ranks = np.arange(1, n + 1, dtype=np.float64)
    w = ranks ** (-1.0 / (exponent - 1.0))
    p_global = w / w.sum()
    if n_comm <= 1:
        n_comm, intra_frac = 1, 0.0
    comm = rng.integers(0, n_comm, n)
    us, vs = [], []
    n_intra = int(target_m * intra_frac)
    if n_intra:
        # sample intra edges community-by-community, proportional to mass
        masses = np.array([p_global[comm == c].sum() for c in range(n_comm)])
        masses = masses / masses.sum()
        quota = rng.multinomial(n_intra, masses)
        for c in range(n_comm):
            members = np.flatnonzero(comm == c)
            if len(members) < 2 or quota[c] == 0:
                continue
            pc = p_global[members] / p_global[members].sum()
            us.append(members[rng.choice(len(members), quota[c], p=pc)])
            vs.append(members[rng.choice(len(members), quota[c], p=pc)])
    n_glob = target_m - n_intra
    if n_glob > 0:
        us.append(rng.choice(n, n_glob, p=p_global))
        vs.append(rng.choice(n, n_glob, p=p_global))
    u = np.concatenate(us).astype(np.int64)
    v = np.concatenate(vs).astype(np.int64)
    u, v = _dedup(u, v)
    u, v = _attach_isolated(n, u, v, rng)
    return n, u, v

"""Quality grid — Tables 4 (ND), 5 (ULCV) and 11 (AR).

Runs PPRviz and the 11 competitor layouts on the 6 small graphs and scores
every layout with the three aesthetic metrics after NetworkX-style
normalization (§7.1). The OpenOrd quality column is 'OpenOrd/FR' (§7.2.1:
OpenOrd draws each supergraph with FR, so the two share one column).
"""
from __future__ import annotations

from collections.abc import Callable

import numpy as np
import pandas as pd

from repro.graphs.csr import CSRGraph
from repro.graphs.datasets import SMALL_GRAPHS, Dataset, load_dataset
from repro.layout import embedding as emb
from repro.layout.force import forceatlas2, fruchterman_reingold, linlog
from repro.layout.mds import cmds, pmds
from repro.layout.simrank import simrank_pdist
from repro.layout.stress import stress_majorization
from repro.metrics import all_metrics
from repro.pprviz import single_level_layout


def _simrank_layout(g: CSRGraph, *, seed: int = 0) -> np.ndarray:
    return stress_majorization(simrank_pdist(g), seed=seed)


LAYOUT_METHODS: dict[str, Callable[..., np.ndarray]] = {
    "PPRviz": lambda g, seed: single_level_layout(g, seed=seed),
    "OpenOrd/FR": lambda g, seed: fruchterman_reingold(g, seed=seed),
    "LinLog": lambda g, seed: linlog(g, seed=seed),
    "ForceAtlas": lambda g, seed: forceatlas2(g, seed=seed),
    "CMDS": lambda g, seed: cmds(g, seed=seed),
    "PMDS": lambda g, seed: pmds(g, seed=seed),
    "GFactor": lambda g, seed: emb.gfactor(g, seed=seed),
    "SDNE": lambda g, seed: emb.sdne_lite(g, seed=seed),
    "LapEig": lambda g, seed: emb.lap_eig(g, seed=seed),
    "LLE": lambda g, seed: emb.lle(g, seed=seed),
    "Node2vec": lambda g, seed: emb.node2vec_lite(g, seed=seed),
    "SimRank": lambda g, seed: _simrank_layout(g, seed=seed),
}


def layout_for(method: str, d: Dataset, *, seed: int = 0) -> np.ndarray:
    """Compute one method's normalized-scale-free layout of a dataset."""
    return LAYOUT_METHODS[method](d.csr(), seed)


def quality_grid(
    graphs: list[str] | None = None,
    methods: list[str] | None = None,
    *,
    seed: int = 0,
) -> pd.DataFrame:
    """Long-form frame (graph, method, ND, ULCV, AR) for the quality tables."""
    graphs = graphs or SMALL_GRAPHS
    methods = methods or list(LAYOUT_METHODS)
    rows = []
    for gname in graphs:
        d = load_dataset(gname)
        for m in methods:
            X = layout_for(m, d, seed=seed)
            scores = all_metrics(X, d.u, d.v)
            rows.append({"graph": gname, "method": m, **scores})
    return pd.DataFrame(rows)


def pivot_metric(grid: pd.DataFrame, metric: str) -> pd.DataFrame:
    """Graphs x methods pivot of one metric (a table in the paper's shape)."""
    return grid.pivot(index="graph", columns="method", values=metric)

"""Quality-grid harness tests (Tables 4/5/11 machinery) on small graphs."""
import numpy as np
import pytest

from repro.experiments.quality import (
    LAYOUT_METHODS,
    layout_for,
    pivot_metric,
    quality_grid,
)
from repro.graphs.datasets import load_dataset


def test_twelve_methods_registered():
    assert len(LAYOUT_METHODS) == 12
    assert "PPRviz" in LAYOUT_METHODS and "OpenOrd/FR" in LAYOUT_METHODS


@pytest.fixture(scope="module")
def grid():
    # two smallest graphs, a representative method subset: fast but end-to-end
    return quality_grid(
        graphs=["TwEgo", "FbEgo"],
        methods=["PPRviz", "OpenOrd/FR", "CMDS", "SimRank", "LapEig"],
        seed=0,
    )


def test_grid_shape(grid):
    assert len(grid) == 2 * 5
    assert {"graph", "method", "ND", "ULCV", "AR"} <= set(grid.columns)


def test_pivot(grid):
    p = pivot_metric(grid, "ND")
    assert p.shape == (2, 5)
    assert "PPRviz" in p.columns


def test_pprviz_competitive_nd(grid):
    """Table 4 shape on the ego graphs: PPRviz within the top-2 finite ND."""
    for gname in ("TwEgo", "FbEgo"):
        sub = grid[grid.graph == gname].set_index("method")["ND"]
        rank = sub.rank().loc["PPRviz"]
        assert rank <= 3


def test_pprviz_near_best_ulcv(grid):
    """Table 5 shape: PPRviz at or within 25% of the best ULCV (the full
    6-graph grid in bench_table5 asserts outright wins on most graphs)."""
    for gname in ("TwEgo", "FbEgo"):
        sub = grid[grid.graph == gname].set_index("method")["ULCV"]
        assert sub["PPRviz"] <= 1.25 * sub.min(), sub.to_dict()


def test_layout_for_returns_positions():
    d = load_dataset("TwEgo")
    X = layout_for("PPRviz", d, seed=0)
    assert X.shape == (d.n, 2)
    assert np.isfinite(X).all()


def test_seeds_reproducible():
    d = load_dataset("TwEgo")
    X1 = layout_for("OpenOrd/FR", d, seed=1)
    X2 = layout_for("OpenOrd/FR", d, seed=1)
    np.testing.assert_allclose(X1, X2)

"""Dataset registry tests: sizes, ordering, conversions."""
import numpy as np
import pytest

from repro.graphs.datasets import (
    DATASETS,
    LARGE_GRAPHS,
    SMALL_GRAPHS,
    VARIANT_GRAPHS,
    load_dataset,
    stats_table,
)


def test_twelve_datasets():
    assert len(DATASETS) == 12
    assert len(SMALL_GRAPHS) == 6 and len(LARGE_GRAPHS) == 6
    assert set(VARIANT_GRAPHS) <= set(LARGE_GRAPHS)


@pytest.mark.parametrize("name", SMALL_GRAPHS)
def test_small_graphs_match_paper_n(name):
    d = load_dataset(name)
    _, paper_n, paper_m, _ = DATASETS[name]
    assert d.n == paper_n
    # edge counts within 30% of the paper's
    assert abs(d.m_undirected - paper_m) / paper_m < 0.30


def test_size_ordering_preserved():
    """The paper's relative ordering by edge count must carry over."""
    ms = [load_dataset(n).m_undirected for n in LARGE_GRAPHS]
    paper_ms = [DATASETS[n][2] for n in LARGE_GRAPHS]
    assert np.argsort(ms).tolist() == np.argsort(paper_ms).tolist()


def test_load_cached():
    assert load_dataset("TwEgo") is load_dataset("TwEgo")


def test_csr_roundtrip():
    d = load_dataset("TwEgo")
    g = d.csr()
    assert g.n == d.n
    assert g.m == d.m == 2 * d.m_undirected


def test_edge_pandas_both_directions():
    d = load_dataset("TwEgo")
    pdf = d.edge_pandas()
    assert len(pdf) == d.m
    fwd = set(zip(pdf.src[: d.m_undirected], pdf.dst[: d.m_undirected]))
    bwd = set(zip(pdf.dst[d.m_undirected :], pdf.src[d.m_undirected :]))
    assert fwd == bwd


def test_no_isolated_nodes_small():
    for name in SMALL_GRAPHS:
        g = load_dataset(name).csr()
        assert (g.out_deg >= 1).all(), name


def test_stats_table_shape():
    t = stats_table()
    assert len(t) == 12
    assert {"dataset", "n", "m_undirected", "paper_n", "paper_m"} <= set(t.columns)


def test_skew_ordering_twitter_most_skewed():
    """Twitter analog must be the most degree-skewed large graph."""

    def gini_like(name):
        deg = np.sort(load_dataset(name).csr().out_deg)
        return deg.max() / deg.mean()

    assert gini_like("Twitter") > gini_like("Amazon")

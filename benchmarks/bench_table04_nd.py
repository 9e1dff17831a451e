"""Table 4 benchmark — ND over 6 small graphs x 12 methods.

The benchmarked unit is the full quality grid computation (all layouts +
metrics); Tables 5/11 reuse the cached grid.
"""
from benchmarks._cache import print_table, quality_grid_cached
from repro.experiments.quality import pivot_metric


def bench_table4_nd(benchmark):
    grid = benchmark.pedantic(quality_grid_cached, rounds=1, iterations=1)
    table = pivot_metric(grid, "ND")
    print_table("Table 4 (ND) — measured", table)
    # PPRviz within top-2 finite ND on most graphs (paper: best on 4/6)
    ranks = table.rank(axis=1)["PPRviz"]
    assert (ranks <= 3).mean() >= 0.5

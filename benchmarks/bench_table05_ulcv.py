"""Table 5 benchmark — ULCV over 6 small graphs x 12 methods."""
from benchmarks._cache import print_table, quality_grid_cached
from repro.experiments.quality import pivot_metric


def bench_table5_ulcv(benchmark):
    grid = quality_grid_cached()
    table = benchmark.pedantic(
        lambda: pivot_metric(grid, "ULCV"), rounds=1, iterations=1
    )
    print_table("Table 5 (ULCV) — measured", table)
    # paper: PPRviz always best in ULCV; require best on most graphs here
    best = table.idxmin(axis=1)
    assert (best == "PPRviz").mean() >= 0.5, best.to_dict()

"""Table 11 benchmark — AR (angular resolution) over the quality grid."""
from benchmarks._cache import print_table, quality_grid_cached
from repro.experiments.quality import pivot_metric


def bench_table11_ar(benchmark):
    grid = quality_grid_cached()
    table = benchmark.pedantic(
        lambda: pivot_metric(grid, "AR"), rounds=1, iterations=1
    )
    print_table("Table 11 (AR) — measured", table)
    assert table.shape[1] == 12

"""Table 8 benchmark — response time of the 7 variants, 4 largest graphs."""
from benchmarks._cache import print_table
from repro.experiments.tables import table8


def bench_table8_response(benchmark):
    df = benchmark.pedantic(lambda: table8(n_paths=3), rounds=1, iterations=1)
    print_table("Table 8 (response time, s; NaN = '-') — measured", df)
    # paper shape: every per-leaf variant exceeds the budget everywhere,
    # every grouped variant responds sub-second on average
    for v in ("PI", "FORA", "FORA+", "ResAcc"):
        assert df[v].isna().all(), v
    for v in ("Tau-Push", "GFRA", "GFP(taumax)"):
        assert df[v].notna().all(), v

"""Table 10 benchmark — index size (MiB) of the variants."""
from benchmarks._cache import print_table
from repro.experiments.tables import table10


def bench_table10_index(benchmark):
    df = benchmark.pedantic(lambda: table10(), rounds=1, iterations=1)
    print_table("Table 10 (index size, MiB) — measured", df)
    # paper shape: PI = ResAcc < Tau-Push ~ GFP(taumax) < FORA+ < FORA = GFRA
    assert (df["PI"] == df["ResAcc"]).all()
    assert (df["Tau-Push"] < df["FORA"]).all()
    assert (df["FORA+"] < df["FORA"]).all()
    assert (df["GFRA"] == df["FORA"]).all()

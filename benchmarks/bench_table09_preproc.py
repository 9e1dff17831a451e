"""Table 9 benchmark — preprocessing time of the variants."""
from benchmarks._cache import print_table
from repro.experiments.tables import table9


def bench_table9_preproc(benchmark):
    df = benchmark.pedantic(lambda: table9(), rounds=1, iterations=1)
    print_table("Table 9 (preprocessing time, s) — measured", df)
    # paper shape: PI/ResAcc cheapest (hierarchy only); Tau-Push adds the
    # DPR + GBP index on top
    assert (df["PI"] <= df["Tau-Push"]).all()
    assert (df["PI"] == df["ResAcc"]).all()

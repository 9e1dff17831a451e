"""Reproduction of "Effective and Efficient PageRank-based Positioning
for Graph Visualization" (PPRviz / PDist / Tau-Push, SIGMOD 2023).

See DESIGN.md for the system map and EXPERIMENTS.md for paper-vs-measured
results. Subpackages: ``graphs`` (datasets + substrate), ``hierarchy``
(Louvain+), ``pprlib`` (PPR computation library), ``core`` (the paper's
contribution), ``layout`` (embedding + baselines), ``experiments``
(per-table harnesses).
"""

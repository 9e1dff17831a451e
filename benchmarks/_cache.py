"""Shared, compute-once state for the table benchmarks.

The quality grid (Tables 4/5/11) and the prepared efficiency graphs
(Tables 7-10) are expensive; benchmarks in different files reuse them
through these module-level caches so one ``pytest benchmarks/`` run builds
each input exactly once.
"""
from __future__ import annotations

from functools import lru_cache
from pathlib import Path


@lru_cache(maxsize=1)
def quality_grid_cached():
    from repro.experiments.quality import quality_grid

    return quality_grid(seed=0)


RESULTS_PATH = Path(__file__).with_name("measured_tables.txt")


def print_table(title: str, df) -> None:
    """Emit a measured table to stdout AND benchmarks/measured_tables.txt
    (pytest captures stdout by default, so the file is the durable copy
    EXPERIMENTS.md quotes)."""
    block = f"\n=== {title} ===\n{df.to_string()}\n"
    print(block, end="")
    with RESULTS_PATH.open("a") as f:
        f.write(block)

"""Spark DataFrame graph operations.

The DataFrame (src, dst) arc list is the canonical distributed graph
representation; every aggregate here has a plain-SQL equivalent so tests can
oracle-check it against DuckDB on the same input (see tests/test_spark_graph).

Functions take and return DataFrames so they compose as jobs.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, functions as F


def out_degrees(edges: DataFrame) -> DataFrame:
    """(node, out_deg) from a directed (src, dst) arc list."""
    return edges.groupBy(F.col("src").alias("node")).agg(
        F.count("*").alias("out_deg")
    )


def in_degrees(edges: DataFrame) -> DataFrame:
    """(node, in_deg) from a directed (src, dst) arc list."""
    return edges.groupBy(F.col("dst").alias("node")).agg(
        F.count("*").alias("in_deg")
    )


def reverse(edges: DataFrame) -> DataFrame:
    """Reverse every arc (GBP traverses the transposed graph)."""
    return edges.select(
        F.col("dst").alias("src"), F.col("src").alias("dst")
    )


def supernode_edges(edges: DataFrame, membership: DataFrame) -> DataFrame:
    """Weighted level-(l+1) supergraph arcs from leaf arcs.

    ``membership`` is (node, label): the supernode label of each leaf at
    the target level. Output is (src_label, dst_label, weight) where weight
    counts leaf arcs between the two supernodes — exactly the high-level
    graph of paper §2.2 (an edge V_i→V_j exists iff some leaf arc crosses).
    """
    s = membership.select(
        F.col("node").alias("src"), F.col("label").alias("src_label")
    )
    d = membership.select(
        F.col("node").alias("dst"), F.col("label").alias("dst_label")
    )
    return (
        edges.join(s, "src")
        .join(d, "dst")
        .groupBy("src_label", "dst_label")
        .agg(F.count("*").alias("weight"))
    )


def level_dppr(pair_dppr: DataFrame, membership: DataFrame) -> DataFrame:
    """Level-l DPPR (Eq. 2) from leaf-pair DPPR values.

    ``pair_dppr`` is (src, dst, dppr) over leaf pairs; ``membership`` maps
    (node, label). Output (src_label, dst_label, dppr) averages pair DPPR
    over |F(V_i)|*|F(V_j)| — including the zero pairs absent from
    ``pair_dppr``, which is why this divides by the full block size rather
    than using avg().
    """
    sizes = membership.groupBy("label").agg(F.count("*").alias("sz"))
    s = membership.select(
        F.col("node").alias("src"), F.col("label").alias("src_label")
    )
    d = membership.select(
        F.col("node").alias("dst"), F.col("label").alias("dst_label")
    )
    summed = (
        pair_dppr.join(s, "src")
        .join(d, "dst")
        .groupBy("src_label", "dst_label")
        .agg(F.sum("dppr").alias("sum_dppr"))
    )
    return (
        summed.join(
            sizes.select(F.col("label").alias("src_label"), F.col("sz").alias("src_sz")),
            "src_label",
        )
        .join(
            sizes.select(F.col("label").alias("dst_label"), F.col("sz").alias("dst_sz")),
            "dst_label",
        )
        .select(
            "src_label",
            "dst_label",
            (F.col("sum_dppr") / (F.col("src_sz") * F.col("dst_sz"))).alias("dppr"),
        )
    )

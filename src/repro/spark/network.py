"""Whole-network DataFrame layer: schema, edge table, Table-4 stats.

A temporal interaction network lives in a Spark DataFrame with columns
``(src: long, dst: long, ts: long, qty: double)`` — one row per
interaction (Definition 1: an edge is the *sequence* of its rows).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

INTERACTION_COLS = ["src", "dst", "ts", "qty"]


def edges_df(interactions: DataFrame) -> DataFrame:
    """Distinct directed edges ``(u, v)`` of the network."""
    return (
        interactions.select(
            F.col("src").alias("u"), F.col("dst").alias("v")
        ).distinct()
    )


def dataset_stats(interactions: DataFrame) -> DataFrame:
    """One-row frame with the paper's Table-4 columns.

    ``#nodes`` counts vertices incident to at least one interaction,
    ``avg_flow`` is the mean interaction quantity (the paper's "avg.
    flow" column reports the average transferred amount).
    """
    nodes = (
        interactions.select(F.col("src").alias("n"))
        .union(interactions.select(F.col("dst").alias("n")))
        .distinct()
        .count()
    )
    edges = edges_df(interactions).count()
    agg = interactions.agg(
        F.count("*").alias("n_interactions"), F.avg("qty").alias("avg_flow")
    ).collect()[0]
    spark = interactions.sparkSession
    return spark.createDataFrame(
        [(nodes, edges, int(agg["n_interactions"]), float(agg["avg_flow"]))],
        "n_nodes long, n_edges long, n_interactions long, avg_flow double",
    )

"""Degree ordering (DEG) — paper Table 4 "a straightforward parallel sort".

Rank vertices by ascending degree (ties by vertex ID for determinism).
Used as the cheap preprocessing baseline in Figs. 4/5/6.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.graph import Graph


def degree_order(graph: Graph) -> DataFrame:
    """(vertex, rank) with rank 0..n-1 ascending by (degree, vertex)."""
    w = Window.orderBy(F.col("deg").asc(), F.col("vertex").asc())
    return (
        graph.degrees()
        .withColumn("rank", F.row_number().over(w) - 1)
        .select("vertex", F.col("rank").cast("long"))
    )


def identity_order(graph: Graph) -> DataFrame:
    """(vertex, rank=vertex-position) — the 'no reordering' baseline."""
    w = Window.orderBy(F.col("vertex").asc())
    return (
        graph.adjacency().select("vertex")
        .withColumn("rank", F.row_number().over(w) - 1)
        .select("vertex", F.col("rank").cast("long"))
    )

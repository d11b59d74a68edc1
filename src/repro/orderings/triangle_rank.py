"""Triangle-count ranking (paper Table 4, Vertex Ordering row 2).

Rank vertices by their per-vertex triangle participation (ascending,
ties by vertex ID) — a clustering-coefficient-flavoured ordering built
directly on the set-intersection triangle kernel (5+ modularity).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.graph import Graph
from repro.mining.triangles import triangle_counts_per_vertex


def triangle_count_order(graph: Graph) -> DataFrame:
    """(vertex, rank) ascending by (triangle count, vertex)."""
    w = Window.orderBy(F.col("triangles").asc(), F.col("vertex").asc())
    return (
        triangle_counts_per_vertex(graph)
        .withColumn("rank", F.row_number().over(w) - 1)
        .select("vertex", F.col("rank").cast("long"))
    )

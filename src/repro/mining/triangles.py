"""Triangle counting via set intersection (paper Fig. 2 stage-5 example).

The canonical set-centric formulation: orient edges by a (degree)
ordering, then for every directed edge (u, v) add |N+(u) ∩ N+(v)|.
Orientation makes every triangle counted exactly once and bounds the
out-degree, the same optimization Table 4's "degree reordering" row is
about. Everything stays in Catalyst: explode + join + array_intersect.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core import sets
from repro.core.graph import Graph


def _nbrs_for(adj: DataFrame, col: str, out: str) -> DataFrame:
    return adj.select(F.col("vertex").alias(col), F.col("nbrs").alias(out))


def triangle_count(graph: Graph) -> int:
    """Total number of triangles, counted once each.

    Orients each canonical edge from lower (degree, id) to higher and
    intersects *full* neighbourhoods of its endpoints restricted to
    higher-ordered vertices — equivalently |N+(u) ∩ N+(v)| summed over
    oriented edges.
    """
    per_edge = _per_edge_common(graph)
    # each triangle has exactly 3 edges; every edge's common-neighbour
    # count tallies that triangle once per edge → divide by 3.
    row = per_edge.agg(F.sum("common").alias("s")).first()
    return int(row["s"] or 0) // 3


def _per_edge_common(graph: Graph) -> DataFrame:
    """(src, dst, common=|N(src) ∩ N(dst)|) for every canonical edge."""
    adj = graph.adjacency()
    return (
        graph.edges
        .join(_nbrs_for(adj, "src", "nbrs_src"), "src")
        .join(_nbrs_for(adj, "dst", "nbrs_dst"), "dst")
        .select("src", "dst",
                sets.intersect_count(F.col("nbrs_src"), F.col("nbrs_dst"))
                .alias("common"))
    )


def triangle_counts_per_vertex(graph: Graph) -> DataFrame:
    """(vertex, triangles) — triangle participation per vertex.

    Each triangle through v has exactly two edges incident to v, and
    each such edge's common-neighbour count includes that triangle once,
    so per-vertex count = Σ_{e ∋ v} common(e) / 2. Vertices in no
    triangle (including isolated ones) appear with 0.
    """
    per_edge = _per_edge_common(graph)
    both_ends = per_edge.select(
        F.explode(F.array("src", "dst")).alias("vertex"), "common"
    )
    counts = both_ends.groupBy("vertex").agg(
        (F.sum("common") / 2).cast("long").alias("triangles")
    )
    return (
        graph.adjacency().select("vertex")
        .join(counts, "vertex", "left")
        .select("vertex", F.coalesce("triangles", F.lit(0)).alias("triangles"))
    )

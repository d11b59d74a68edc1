"""k-clique-star listing (paper §6.6).

A k-clique-star is a k-clique plus the non-empty set of "star" vertices
adjacent to *all* clique members. The paper's observation: each star
vertex forms a (k+1)-clique with the k-clique — so the set-algebra
formulation is: the star of a k-clique K is  ⋂_{v∈K} N(v) ∖ K.

Implementation stays in Catalyst: list k-cliques (Alg. 7 kernel),
explode members, join adjacency, reduce the collected neighbourhoods
with ``array_intersect`` (an aggregate over the Set interface), and
subtract the members.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.graph import Graph
from repro.mining.kclique import kclique_list


def kclique_stars(graph: Graph, k: int, order: str = "dgr") -> DataFrame:
    """(members array<long>, star array<long>) for k-cliques with star ≠ ∅."""
    if k < 3:
        raise ValueError("k-clique-stars need k >= 3")
    cliques = kclique_list(graph, k, order=order).withColumn(
        "cid", F.monotonically_increasing_id()
    )
    adj = graph.adjacency()
    member_nbrs = (
        cliques.select("cid", "members", F.explode("members").alias("vertex"))
        .join(adj.select("vertex", "nbrs"), "vertex")
        .groupBy("cid")
        .agg(
            F.first("members").alias("members"),
            F.collect_list("nbrs").alias("nbr_sets"),
        )
    )
    star = member_nbrs.select(
        "members",
        F.array_sort(
            F.array_except(
                # fold ∩ over the k collected neighbourhood sets
                F.aggregate(
                    F.expr("slice(nbr_sets, 2, size(nbr_sets) - 1)"),
                    F.element_at("nbr_sets", 1),
                    lambda acc, x: F.array_intersect(acc, x),
                ),
                "members",
            )
        ).alias("star"),
    )
    return star.where(F.size("star") > 0)


def kclique_star_count(graph: Graph, k: int, order: str = "dgr") -> int:
    """Number of k-cliques that have at least one star vertex."""
    return kclique_stars(graph, k, order=order).count()

"""Exact degeneracy ordering (DGR) + k-core decomposition (paper §6.1).

Parallel peeling: repeatedly remove *all* vertices whose degree in the
remaining induced subgraph is ≤ the current minimum level k. Removing a
whole batch keeps the ordering a valid degeneracy ordering (every batch
member has ≤ k ≤ d remaining neighbours, however the batch is ordered
internally) and each vertex's removal level is exactly its core number.

This is the Θ(n)-round-worst-case scheme the paper contrasts with ADG's
O(log n) rounds; the round count is surfaced through a
``WorkDepthRecorder`` so Tables 5/6 can be validated empirically.

Each round is one Spark job over the remaining-degrees DataFrame;
``localCheckpoint`` truncates the lineage so plans do not grow linearly
with rounds.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.graph import Graph
from repro.core.work_depth import WorkDepthRecorder


def _remaining_degrees(sym_edges: DataFrame, remaining: DataFrame) -> DataFrame:
    """Degrees of ``remaining`` vertices inside their induced subgraph."""
    e = (
        sym_edges.join(remaining.withColumnRenamed("vertex", "src"), "src")
        .join(remaining.withColumnRenamed("vertex", "dst"), "dst")
    )
    deg = e.groupBy(F.col("src").alias("vertex")).agg(F.count("*").alias("deg"))
    return (
        remaining.join(deg, "vertex", "left")
        .select("vertex", F.coalesce("deg", F.lit(0)).alias("deg"))
    )


def core_decomposition(
    graph: Graph, recorder: WorkDepthRecorder | None = None
) -> DataFrame:
    """(vertex, rank, core) — degeneracy ordering plus core numbers.

    ``rank`` is the peeling position (0-based, batch members ordered by
    vertex ID); ``core`` is the exact k-core number. The graph
    degeneracy is ``max(core)``.
    """
    rec = recorder or WorkDepthRecorder()
    sym = graph.symmetric_edges().localCheckpoint(eager=True)
    remaining = graph.adjacency().select("vertex").localCheckpoint(eager=True)
    out_batches: list[DataFrame] = []
    k = 0
    next_rank = 0
    spark = graph.edges.sparkSession
    while True:
        degs = _remaining_degrees(sym, remaining)
        degs = degs.localCheckpoint(eager=True)
        min_deg = degs.agg(F.min("deg")).first()[0]
        if min_deg is None:
            break
        k = max(k, int(min_deg))
        batch = degs.where(F.col("deg") <= k).select("vertex")
        w = Window.orderBy(F.col("vertex").asc())
        batch_ranked = (
            batch.withColumn("rank", F.row_number().over(w) - 1 + F.lit(next_rank))
            .withColumn("core", F.lit(k))
            .select("vertex", F.col("rank").cast("long"), F.col("core").cast("long"))
            .localCheckpoint(eager=True)
        )
        n_removed = batch_ranked.count()
        rec.round()
        rec.touch(n_removed)
        out_batches.append(batch_ranked)
        next_rank += n_removed
        remaining = (
            remaining.join(batch_ranked.select("vertex"), "vertex", "left_anti")
            .localCheckpoint(eager=True)
        )
    if not out_batches:
        return spark.createDataFrame([], "vertex long, rank long, core long")
    out = out_batches[0]
    for b in out_batches[1:]:
        out = out.unionByName(b)
    return out.localCheckpoint(eager=True)


def degeneracy_order(
    graph: Graph, recorder: WorkDepthRecorder | None = None
) -> DataFrame:
    """(vertex, rank) degeneracy ordering — preprocessing-stage signature."""
    return core_decomposition(graph, recorder).select("vertex", "rank")


def degeneracy(graph: Graph) -> int:
    """The graph degeneracy d = max core number."""
    row = core_decomposition(graph).agg(F.max("core")).first()
    return int(row[0] or 0)


def kcore(graph: Graph, k: int) -> DataFrame:
    """Vertices of the k-core (max subgraph with all degrees ≥ k)."""
    return core_decomposition(graph).where(F.col("core") >= k).select("vertex")

"""Set-centric graph representation (paper §5.3, §2.3).

A graph is two DataFrames:

* ``edges``   — canonical undirected edge list, columns ``src < dst``,
  deduplicated, self-loop free. The "loaded graph" of pipeline stage 1.
* ``adjacency()`` — one row per vertex with its neighbourhood as a
  *sorted array column* (``vertex``, ``nbrs``, ``deg``). This is the
  CSR/SetGraph analog of Listing 2: one Set per neighbourhood; all
  graph accesses (degree check, N(v) load, edge-exists) go through it.

Orientation by a vertex ordering (``oriented``) produces out-neighbour
sets N+(v) = {u ∈ N(v) : η(v) < η(u)} — the preprocessing step both
k-clique listing (Alg. 7 line 9) and BK's outer split (Alg. 6 line 13)
rely on.

All methods return DataFrames so downstream algorithms stay in Catalyst
until they must drop into a per-root Python kernel.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


class Graph:
    """Undirected graph over long vertex IDs, backed by Spark DataFrames."""

    def __init__(self, edges: DataFrame):
        """``edges`` must have long columns ``src``/``dst``; canonicalised here."""
        e = edges.select(
            F.least("src", "dst").cast("long").alias("src"),
            F.greatest("src", "dst").cast("long").alias("dst"),
        ).where(F.col("src") != F.col("dst")).dropDuplicates(["src", "dst"])
        self.edges = e
        self._adj: DataFrame | None = None

    @classmethod
    def from_pandas(cls, spark: SparkSession, pdf: pd.DataFrame) -> "Graph":
        return cls(spark.createDataFrame(pdf[["src", "dst"]]))

    # -- pipeline stage 2: graph accesses --------------------------------

    def symmetric_edges(self) -> DataFrame:
        """Both directions of every edge — the scan most accesses start from."""
        e = self.edges
        return e.unionByName(e.select(F.col("dst").alias("src"),
                                      F.col("src").alias("dst")))

    def adjacency(self) -> DataFrame:
        """(vertex, nbrs sorted array, deg). Cached: every algorithm reuses it."""
        if self._adj is None:
            self._adj = (
                self.symmetric_edges()
                .groupBy(F.col("src").alias("vertex"))
                .agg(F.array_sort(F.collect_list("dst")).alias("nbrs"))
                .withColumn("deg", F.size("nbrs"))
                .cache()
            )
        return self._adj

    def degrees(self) -> DataFrame:
        return self.adjacency().select("vertex", "deg")

    def num_vertices(self) -> int:
        return self.adjacency().count()

    def num_edges(self) -> int:
        return self.edges.count()

    def has_edge(self, u: int, v: int) -> bool:
        a, b = (u, v) if u < v else (v, u)
        return (
            self.edges.where((F.col("src") == a) & (F.col("dst") == b)).limit(1).count()
            > 0
        )

    # -- pipeline stage 3: preprocessing hooks ---------------------------

    def oriented(self, order: DataFrame) -> DataFrame:
        """Out-adjacency under a vertex ordering.

        ``order`` has columns (vertex, rank); an edge points from lower
        to higher rank (ties broken by vertex ID so the orientation is
        total and acyclic). Returns (vertex, rank, out_nbrs sorted by
        *rank* position irrelevant — stored sorted by ID) including
        rank-sink vertices with empty out_nbrs.
        """
        e = self.symmetric_edges()
        ranked = (
            e.join(order.withColumnRenamed("vertex", "src")
                        .withColumnRenamed("rank", "src_rank"), "src")
            .join(order.withColumnRenamed("vertex", "dst")
                        .withColumnRenamed("rank", "dst_rank"), "dst")
        )
        fwd = ranked.where(
            (F.col("src_rank") < F.col("dst_rank"))
            | ((F.col("src_rank") == F.col("dst_rank")) & (F.col("src") < F.col("dst")))
        )
        out = fwd.groupBy(F.col("src").alias("vertex")).agg(
            F.array_sort(F.collect_list("dst")).alias("out_nbrs")
        )
        return (
            order.join(out, "vertex", "left")
            .select(
                "vertex",
                "rank",
                F.coalesce("out_nbrs", F.array().cast("array<long>")).alias("out_nbrs"),
            )
        )

    def induced(self, vertices: DataFrame) -> "Graph":
        """Induced subgraph G[S]; ``vertices`` has a ``vertex`` column."""
        v = vertices.select("vertex").distinct()
        e = (
            self.edges.join(v.withColumnRenamed("vertex", "src"), "src")
            .join(v.withColumnRenamed("vertex", "dst"), "dst")
        )
        return Graph(e)

    # -- dataset statistics (Table 7 columns) ----------------------------

    def stats(self, spark: SparkSession) -> dict:
        """n, m, m/n, max degree, T, T/n, max triangles/vertex (T-skew)."""
        from repro.mining.triangles import triangle_counts_per_vertex

        n = self.num_vertices()
        m = self.num_edges()
        dmax = self.degrees().agg(F.max("deg")).first()[0]
        per_v = triangle_counts_per_vertex(self)
        agg = per_v.agg(
            F.sum("triangles").alias("sum_t"), F.max("triangles").alias("max_t")
        ).first()
        total_t = int(agg["sum_t"] or 0) // 3  # each triangle counted at 3 corners
        return {
            "n": n,
            "m": m,
            "m_over_n": m / n if n else 0.0,
            "max_deg": int(dmax or 0),
            "T": total_t,
            "T_over_n": total_t / n if n else 0.0,
            "T_max_per_vertex": int(agg["max_t"] or 0),
        }

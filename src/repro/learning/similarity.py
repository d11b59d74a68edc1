"""Vertex similarity measures (paper §6.5, Table 4 Graph Learning).

All seven GMS measures, each a set-algebra expression over the two
neighbourhood arrays (5+ modularity — the ∩/∪ go through
``repro.core.sets``):

  jaccard                |N(u) ∩ N(v)| / |N(u) ∪ N(v)|
  overlap                |N(u) ∩ N(v)| / min(|N(u)|, |N(v)|)
  common_neighbors       |N(u) ∩ N(v)|
  total_neighbors        |N(u) ∪ N(v)|
  preferential_attachment|N(u)| · |N(v)|
  adamic_adar            Σ_{w ∈ N(u) ∩ N(v)} 1 / log |N(w)|
  resource_allocation    Σ_{w ∈ N(u) ∩ N(v)} 1 / |N(w)|

The two ∩ algorithms of §6.5 (merge vs galloping binary search) are
exposed for benchmarking through ``intersect_impl``: "merge" uses the
Catalyst ``array_intersect``; "galloping" runs a pandas UDF doing
``np.searchsorted`` of the smaller array into the larger one.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.functions import pandas_udf
from pyspark.sql.types import LongType

from repro.core import sets
from repro.core.graph import Graph

MEASURES = (
    "jaccard",
    "overlap",
    "common_neighbors",
    "total_neighbors",
    "preferential_attachment",
    "adamic_adar",
    "resource_allocation",
)


@pandas_udf(LongType())
def _galloping_count(a: pd.Series, b: pd.Series) -> pd.Series:
    """|A ∩ B| by binary-searching the smaller sorted array in the larger."""
    out = np.empty(len(a), dtype=np.int64)
    for i, (xs, ys) in enumerate(zip(a, b)):
        xs = np.asarray(xs, dtype=np.int64)
        ys = np.asarray(ys, dtype=np.int64)
        if xs.size > ys.size:
            xs, ys = ys, xs
        if xs.size == 0:
            out[i] = 0
            continue
        pos = np.searchsorted(ys, xs)
        pos[pos == ys.size] = ys.size - 1
        out[i] = int((ys[pos] == xs).sum())
    return pd.Series(out)


def _with_nbrs(graph: Graph, pairs: DataFrame) -> DataFrame:
    adj = graph.adjacency()
    return (
        pairs.join(adj.select(F.col("vertex").alias("u"),
                              F.col("nbrs").alias("nu")), "u", "left")
        .join(adj.select(F.col("vertex").alias("v"),
                         F.col("nbrs").alias("nv")), "v", "left")
        .select(
            "u", "v",
            F.coalesce("nu", F.array().cast("array<long>")).alias("nu"),
            F.coalesce("nv", F.array().cast("array<long>")).alias("nv"),
        )
    )


def similarity(
    graph: Graph,
    pairs: DataFrame,
    measures: tuple[str, ...] = MEASURES,
    intersect_impl: str = "merge",
) -> DataFrame:
    """Scores for each (u, v) pair row; one output column per measure."""
    unknown = set(measures) - set(MEASURES)
    if unknown:
        raise ValueError(f"unknown measures {sorted(unknown)}")
    if intersect_impl not in ("merge", "galloping"):
        raise ValueError("intersect_impl must be 'merge' or 'galloping'")
    df = _with_nbrs(graph, pairs)
    if intersect_impl == "merge":
        common = sets.intersect_count(F.col("nu"), F.col("nv"))
    else:
        common = _galloping_count(F.col("nu"), F.col("nv"))
    df = df.withColumn("cn", common)
    cols = [F.col("u"), F.col("v")]
    if "common_neighbors" in measures:
        cols.append(F.col("cn").cast("double").alias("common_neighbors"))
    if "jaccard" in measures:
        un = sets.union_count(F.col("nu"), F.col("nv"))
        cols.append(
            F.when(un > 0, F.col("cn") / un).otherwise(0.0).alias("jaccard")
        )
    if "overlap" in measures:
        mn = F.least(sets.cardinality(F.col("nu")), sets.cardinality(F.col("nv")))
        cols.append(
            F.when(mn > 0, F.col("cn") / mn).otherwise(0.0).alias("overlap")
        )
    if "total_neighbors" in measures:
        cols.append(
            sets.union_count(F.col("nu"), F.col("nv")).cast("double")
            .alias("total_neighbors")
        )
    if "preferential_attachment" in measures:
        cols.append(
            (sets.cardinality(F.col("nu")) * sets.cardinality(F.col("nv")))
            .cast("double").alias("preferential_attachment")
        )
    need_weighted = {"adamic_adar", "resource_allocation"} & set(measures)
    out = df.select(*cols)
    if need_weighted:
        deg = graph.degrees().select(F.col("vertex").alias("w"),
                                     F.col("deg").alias("w_deg"))
        commons = (
            df.select("u", "v",
                      F.explode(sets.intersect(F.col("nu"), F.col("nv"))).alias("w"))
            .join(deg, "w")
        )
        aggs = []
        if "adamic_adar" in measures:
            aggs.append(
                F.sum(
                    F.when(F.col("w_deg") > 1, 1.0 / F.log("w_deg")).otherwise(0.0)
                ).alias("adamic_adar")
            )
        if "resource_allocation" in measures:
            aggs.append(F.sum(1.0 / F.col("w_deg")).alias("resource_allocation"))
        weighted = commons.groupBy("u", "v").agg(*aggs)
        out = out.join(weighted, ["u", "v"], "left")
        for m in ("adamic_adar", "resource_allocation"):
            if m in measures:
                out = out.withColumn(m, F.coalesce(F.col(m), F.lit(0.0)))
    return out

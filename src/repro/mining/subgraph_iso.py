"""Subgraph isomorphism — VF2-style backtracking with GMS enhancements
(paper §6.4, Fig. 7).

The target graph is "shared memory" in the paper's setting, so it is
broadcast (adjacency + labels) to all Spark tasks; the search tree is
parallelised over root assignments of the first query vertex(es).

Baseline (``optimized=False``) ≈ parallel VF3-Light: label-filtered
candidates, pairwise adjacency feasibility checks, node-parallel roots.

GMS enhancements (each a Fig. 7 ablation knob):
* ``work_split=2`` — roots are *pairs* of assignments for the first two
  plan vertices → many more, smaller tasks; Spark's scheduler then
  plays the role of the paper's lock-free work-stealing queue.
* ``optimized=True`` — (a) per-query-vertex candidate sets precomputed
  once (label + degree filter; the paper's "precompute scheme"), and
  (b) candidate generation by *intersecting neighbour sets* of already
  placed vertices with numpy sorted-array intersections (the
  vectorised/"SIMD" binary-search analog) instead of scanning
  label-candidates and checking adjacency pairwise.

Both induced and non-induced matching are supported (§A): induced
additionally requires query non-edges to map to target non-edges.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.graph import Graph


def _plan(query_edges: pd.DataFrame, query_labels: pd.DataFrame) -> tuple[list[int], dict]:
    """Connected search order: max-degree first, then max placed-connectivity."""
    qadj: dict[int, set[int]] = {int(v): set() for v in query_labels["vertex"]}
    for s, d in query_edges[["src", "dst"]].itertuples(index=False, name=None):
        qadj[int(s)].add(int(d))
        qadj[int(d)].add(int(s))
    verts = sorted(qadj)
    first = max(verts, key=lambda v: (len(qadj[v]), -v))
    order = [first]
    rest = [v for v in verts if v != first]
    while rest:
        nxt = max(rest, key=lambda v: (len(qadj[v] & set(order)), len(qadj[v]), -v))
        order.append(nxt)
        rest.remove(nxt)
    return order, qadj


def _search(order, qadj, qlab, tadj, tlab, tdeg, cand_sets, assignment,
            induced, optimized):
    """Complete a partial assignment (dict q→t); returns #completions."""
    depth = len(assignment)
    if depth == len(order):
        return 1
    q = order[depth]
    placed_nbrs = [p for p in order[:depth] if p in qadj[q]]
    placed_non = [p for p in order[:depth] if p not in qadj[q]]
    used = set(assignment.values())

    if optimized and placed_nbrs:
        # set-algebra candidate generation: ∩ of neighbour arrays of the
        # already-placed neighbours, then intersect the precomputed
        # label/degree candidate set (numpy merge intersections).
        cand = tadj[assignment[placed_nbrs[0]]]
        for p in placed_nbrs[1:]:
            cand = np.intersect1d(cand, tadj[assignment[p]], assume_unique=True)
        cand = np.intersect1d(cand, cand_sets[q], assume_unique=True)
    else:
        cand = cand_sets[q]

    total = 0
    for t in cand:
        t = int(t)
        if t in used:
            continue
        if not optimized or not placed_nbrs:
            # VF2-style pairwise feasibility on query edges
            if any(not _adjacent(tadj, assignment[p], t) for p in placed_nbrs):
                continue
        if induced and any(_adjacent(tadj, assignment[p], t) for p in placed_non):
            continue
        assignment[q] = t
        total += _search(order, qadj, qlab, tadj, tlab, tdeg, cand_sets,
                         assignment, induced, optimized)
        del assignment[q]
    return total


def _adjacent(tadj: dict[int, np.ndarray], a: int, b: int) -> bool:
    arr = tadj[a]
    i = np.searchsorted(arr, b)
    return bool(i < arr.size and arr[i] == b)


def si_count(
    spark: SparkSession,
    target: Graph,
    target_labels: pd.DataFrame,
    query_edges: pd.DataFrame,
    query_labels: pd.DataFrame,
    induced: bool = True,
    optimized: bool = False,
    work_split: int = 1,
    num_partitions: int | None = None,
) -> int:
    """Number of label-respecting embeddings of the query in the target."""
    if work_split not in (1, 2):
        raise ValueError("work_split must be 1 or 2")
    order, qadj = _plan(query_edges, query_labels)
    qlab = {int(v): int(l) for v, l in
            query_labels[["vertex", "label"]].itertuples(index=False, name=None)}
    # collect + broadcast the target (the paper's shared-memory graph)
    adj_rows = target.adjacency().collect()
    tadj = {int(r["vertex"]): np.asarray(r["nbrs"], dtype=np.int64) for r in adj_rows}
    tlab = {int(v): int(l) for v, l in
            target_labels[["vertex", "label"]].itertuples(index=False, name=None)}
    # label-only vertices (degree 0) still valid assignment targets
    for v in tlab:
        tadj.setdefault(v, np.empty(0, dtype=np.int64))
    tdeg = {v: int(a.size) for v, a in tadj.items()}

    # precomputed candidate sets per query vertex: label match, and with
    # the optimisation also the degree lower bound
    cand_sets = {}
    all_vs = np.asarray(sorted(tadj), dtype=np.int64)
    for q in order:
        mask = [t for t in all_vs
                if tlab.get(int(t), -1) == qlab[q]
                and (not optimized or tdeg[int(t)] >= len(qadj[q]))]
        cand_sets[q] = np.asarray(mask, dtype=np.int64)

    # build root prefixes of length ``work_split``
    q0 = order[0]
    prefixes: list[tuple[int, ...]] = [(int(t),) for t in cand_sets[q0]]
    if work_split == 2 and len(order) > 1:
        q1 = order[1]
        ext = []
        for (t0,) in prefixes:
            for t1 in cand_sets[q1]:
                t1 = int(t1)
                if t1 == t0:
                    continue
                adj_ok = _adjacent(tadj, t0, t1)
                if q1 in qadj[q0]:
                    if not adj_ok:
                        continue
                elif induced and adj_ok:
                    continue
                ext.append((t0, t1))
        prefixes = ext
    if not prefixes:
        return 0

    bc = spark.sparkContext.broadcast(
        dict(order=order, qadj=qadj, qlab=qlab, tadj=tadj, tlab=tlab,
             tdeg=tdeg, cand_sets=cand_sets, induced=induced,
             optimized=optimized)
    )
    n_part = num_partitions or min(len(prefixes), 64)
    rdd = spark.sparkContext.parallelize(prefixes, n_part)

    def run(prefix: tuple[int, ...]) -> int:
        s = bc.value
        assignment = {s["order"][i]: t for i, t in enumerate(prefix)}
        return _search(s["order"], s["qadj"], s["qlab"], s["tadj"], s["tlab"],
                       s["tdeg"], s["cand_sets"], assignment,
                       s["induced"], s["optimized"])

    # The kernel is a per-root backtracking task — the mapInPandas-style
    # boundary with a scalar count per root; RDD map keeps the prefix
    # tuples without schema ceremony (documented in DESIGN.md layering).
    return int(rdd.map(run).sum())

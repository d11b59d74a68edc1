"""Tests for DEG / DGR / ADG / triangle-rank orderings and k-cores.

Covers the correctness claims the paper's §6.1/§7 rely on:
exact core numbers (vs networkx), the degeneracy-ordering invariant
(≤ d later neighbours), the ADG (2+ε) approximation property, and the
O(log n)-vs-Θ(rounds) depth separation (Lemma 7.1 / Table 5).
"""
import math

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.graph import Graph
from repro.core.work_depth import WorkDepthRecorder
from repro.graphs import generators as gen
from repro.graphs.reference import ref_core_numbers, ref_degeneracy
from repro.orderings.adg import adg_order
from repro.orderings.degeneracy import (
    core_decomposition,
    degeneracy,
    degeneracy_order,
    kcore,
)
from repro.orderings.degree import degree_order, identity_order
from repro.orderings.triangle_rank import triangle_count_order


def _order_map(df):
    return {r["vertex"]: r["rank"] for r in df.collect()}


def _check_is_permutation(order, n):
    assert len(order) == n
    assert sorted(order.values()) == list(range(n))


def _later_neighbour_bound(pdf, order):
    """max over v of #neighbours ranked after v."""
    adj = {}
    for s, d in pdf.itertuples(index=False, name=None):
        adj.setdefault(s, set()).add(d)
        adj.setdefault(d, set()).add(s)
    return max(
        sum(1 for u in nbrs if order[u] > order[v]) for v, nbrs in adj.items()
    )


@pytest.fixture(scope="module")
def ba_graph(spark):
    pdf = gen.barabasi_albert(150, 3, seed=1)
    return pdf, Graph.from_pandas(spark, pdf)


# ---------------- degree / identity / triangle orders ---------------------

def test_degree_order_is_permutation(ba_graph):
    pdf, g = ba_graph
    order = _order_map(degree_order(g))
    _check_is_permutation(order, g.num_vertices())


def test_degree_order_sorted_by_degree(ba_graph):
    pdf, g = ba_graph
    degs = {r["vertex"]: r["deg"] for r in g.degrees().collect()}
    order = _order_map(degree_order(g))
    by_rank = sorted(order, key=order.get)
    dseq = [degs[v] for v in by_rank]
    assert dseq == sorted(dseq)


def test_identity_order(ba_graph):
    _, g = ba_graph
    order = _order_map(identity_order(g))
    by_rank = sorted(order, key=order.get)
    assert by_rank == sorted(by_rank)


def test_triangle_order_is_permutation(spark):
    pdf = gen.erdos_renyi(60, 0.12, seed=9)
    g = Graph.from_pandas(spark, pdf)
    order = _order_map(triangle_count_order(g))
    _check_is_permutation(order, g.num_vertices())


# ---------------- exact degeneracy / cores --------------------------------

@pytest.mark.parametrize("seed", [2, 3])
def test_core_numbers_match_networkx(spark, seed):
    pdf = gen.erdos_renyi(80, 0.08, seed=seed)
    g = Graph.from_pandas(spark, pdf)
    got = {r["vertex"]: r["core"] for r in core_decomposition(g).collect()}
    assert got == ref_core_numbers(pdf)


def test_core_numbers_planted_clique(spark):
    pdf = gen.planted_cliques(2, 6, 50, 60, seed=4)
    g = Graph.from_pandas(spark, pdf)
    got = {r["vertex"]: r["core"] for r in core_decomposition(g).collect()}
    assert got == ref_core_numbers(pdf)


def test_degeneracy_value(spark):
    pdf = gen.barabasi_albert(100, 3, seed=5)
    assert degeneracy(Graph.from_pandas(spark, pdf)) == ref_degeneracy(pdf)


def test_degeneracy_order_invariant(ba_graph):
    """Each vertex has ≤ d neighbours later in the DGR order."""
    pdf, g = ba_graph
    order = _order_map(degeneracy_order(g))
    _check_is_permutation(order, g.num_vertices())
    assert _later_neighbour_bound(pdf, order) <= ref_degeneracy(pdf)


def test_kcore_matches_networkx(spark):
    import networkx as nx

    pdf = gen.erdos_renyi(70, 0.1, seed=6)
    g = Graph.from_pandas(spark, pdf)
    for k in (2, 3):
        got = {r["vertex"] for r in kcore(g, k).collect()}
        from repro.graphs.reference import nx_graph

        expected = set(nx.k_core(nx_graph(pdf), k).nodes())
        assert got == expected


def test_empty_graph_core_decomposition(spark):
    g = Graph(spark.createDataFrame([], "src long, dst long"))
    assert core_decomposition(g).count() == 0
    assert degeneracy(g) == 0


# ---------------- ADG (Algorithm 5) ---------------------------------------

@pytest.mark.parametrize("eps", [0.01, 0.1, 0.5])
def test_adg_is_permutation(spark, eps):
    pdf = gen.erdos_renyi(80, 0.08, seed=7)
    g = Graph.from_pandas(spark, pdf)
    order = _order_map(adg_order(g, epsilon=eps))
    _check_is_permutation(order, g.num_vertices())


@pytest.mark.parametrize("eps", [0.1, 0.5])
def test_adg_approximation_property(spark, eps):
    """(2+ε)-approx: ≤ (2+2ε)·d neighbours ranked later, for every vertex.

    The threshold (1+ε)·avg_half with avg_half ≤ d gives the 2(1+ε)d
    bound of Besta et al. [24] cited by the paper.
    """
    pdf = gen.barabasi_albert(120, 4, seed=8)
    g = Graph.from_pandas(spark, pdf)
    order = _order_map(adg_order(g, epsilon=eps))
    d = ref_degeneracy(pdf)
    assert _later_neighbour_bound(pdf, order) <= math.ceil((2 + 2 * eps) * d)


def test_adg_rejects_negative_epsilon(spark):
    pdf = gen.erdos_renyi(20, 0.2, seed=1)
    with pytest.raises(ValueError):
        adg_order(Graph.from_pandas(spark, pdf), epsilon=-0.5)


def test_adg_fewer_rounds_than_exact_peeling(spark):
    """Lemma 7.1 empirically: ADG rounds ~ O(log n) ≤ peeling rounds."""
    pdf = gen.barabasi_albert(200, 3, seed=9)
    g = Graph.from_pandas(spark, pdf)
    rec_adg, rec_dgr = WorkDepthRecorder(), WorkDepthRecorder()
    adg_order(g, epsilon=0.1, recorder=rec_adg)
    degeneracy_order(g, recorder=rec_dgr)
    assert rec_adg.iterations <= rec_dgr.iterations
    assert rec_adg.iterations <= 4 * math.ceil(math.log2(g.num_vertices()) + 1)


def test_adg_work_proxy_linear(spark):
    """ADG touches each vertex exactly once across batches (O(m+n) work)."""
    pdf = gen.erdos_renyi(100, 0.06, seed=10)
    g = Graph.from_pandas(spark, pdf)
    rec = WorkDepthRecorder()
    adg_order(g, epsilon=0.1, recorder=rec)
    assert rec.set_elements_touched == g.num_vertices()

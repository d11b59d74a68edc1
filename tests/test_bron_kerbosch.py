"""Bron–Kerbosch maximal clique listing vs networkx + brute-force oracles.

Every GMS knob combination (ordering × set representation × subgraph
optimisation) must produce the identical set of maximal cliques — the
paper's core modularity claim ("different set representations do not
impact the formulations").
"""
import pandas as pd
import pytest

from repro.core.graph import Graph
from repro.graphs import generators as gen
from repro.graphs.reference import brute_maximal_cliques, ref_maximal_cliques
from repro.mining.bron_kerbosch import bk_count, bk_maximal_cliques, resolve_order


def _cliques(df):
    return {frozenset(r["clique"]) for r in df.collect()}


@pytest.fixture(scope="module")
def er_graph(spark):
    pdf = gen.erdos_renyi(60, 0.12, seed=21)
    return pdf, Graph.from_pandas(spark, pdf)


@pytest.fixture(scope="module")
def planted_graph(spark):
    pdf = gen.planted_cliques(3, 6, 50, 80, seed=22)
    return pdf, Graph.from_pandas(spark, pdf)


def test_single_triangle(spark):
    pdf = pd.DataFrame({"src": [0, 1, 0], "dst": [1, 2, 2]})
    got = _cliques(bk_maximal_cliques(Graph.from_pandas(spark, pdf)))
    assert got == {frozenset({0, 1, 2})}


def test_path_graph_maximal_edges(spark):
    pdf = pd.DataFrame({"src": [0, 1, 2], "dst": [1, 2, 3]})
    got = _cliques(bk_maximal_cliques(Graph.from_pandas(spark, pdf)))
    assert got == {frozenset({0, 1}), frozenset({1, 2}), frozenset({2, 3})}


def test_matches_brute_force_tiny(spark):
    pdf = gen.erdos_renyi(12, 0.4, seed=23)
    g = Graph.from_pandas(spark, pdf)
    assert _cliques(bk_maximal_cliques(g)) == brute_maximal_cliques(pdf)


@pytest.mark.parametrize("order", ["none", "deg", "dgr", "adg"])
def test_all_orderings_match_networkx(er_graph, order):
    pdf, g = er_graph
    got = _cliques(bk_maximal_cliques(g, order=order))
    assert got == ref_maximal_cliques(pdf)


@pytest.mark.parametrize("set_repr", ["sorted", "bitmap", "hash"])
def test_all_set_reprs_match_networkx(er_graph, set_repr):
    pdf, g = er_graph
    got = _cliques(bk_maximal_cliques(g, order="adg", set_repr=set_repr))
    assert got == ref_maximal_cliques(pdf)


@pytest.mark.parametrize("subgraph_opt", [False, True])
def test_subgraph_opt_invariant(planted_graph, subgraph_opt):
    pdf, g = planted_graph
    got = _cliques(bk_maximal_cliques(g, order="adg", subgraph_opt=subgraph_opt))
    assert got == ref_maximal_cliques(pdf)


def test_adg_s_full_variant(planted_graph):
    """BK-GMS-ADG-S: ADG order + subgraph opt + bitmap sets (the paper's best)."""
    pdf, g = planted_graph
    got = _cliques(
        bk_maximal_cliques(g, order="adg", set_repr="bitmap", subgraph_opt=True)
    )
    assert got == ref_maximal_cliques(pdf)


def test_each_clique_reported_once(er_graph):
    pdf, g = er_graph
    rows = bk_maximal_cliques(g, order="dgr").collect()
    cliques = [frozenset(r["clique"]) for r in rows]
    assert len(cliques) == len(set(cliques))


def test_root_is_min_ranked_member(er_graph):
    """Each clique is emitted at exactly one root, which belongs to it."""
    pdf, g = er_graph
    for r in bk_maximal_cliques(g, order="dgr").collect():
        assert r["root"] in r["clique"]


def test_bk_count(planted_graph):
    pdf, g = planted_graph
    assert bk_count(g, order="adg") == len(ref_maximal_cliques(pdf))


def test_unknown_order_rejected(er_graph):
    _, g = er_graph
    with pytest.raises(ValueError):
        bk_maximal_cliques(g, order="best").collect()


def test_custom_order_dataframe(er_graph):
    """resolve_order passes explicit (vertex, rank) DataFrames through."""
    pdf, g = er_graph
    from repro.orderings.degree import degree_order

    od = degree_order(g)
    assert resolve_order(g, od) is od
    got = _cliques(bk_maximal_cliques(g, order=od))
    assert got == ref_maximal_cliques(pdf)


def test_dense_block_single_clique(spark):
    """A complete K6 yields exactly one maximal clique."""
    import itertools

    edges = list(itertools.combinations(range(6), 2))
    pdf = pd.DataFrame(edges, columns=["src", "dst"])
    got = _cliques(bk_maximal_cliques(Graph.from_pandas(spark, pdf)))
    assert got == {frozenset(range(6))}


def test_caveman_graph_all_variants_agree(spark):
    pdf = gen.caveman(3, 15, 0.4, 10, seed=24)
    g = Graph.from_pandas(spark, pdf)
    expected = ref_maximal_cliques(pdf)
    for order in ("none", "adg"):
        for sg in (False, True):
            got = _cliques(bk_maximal_cliques(g, order=order, subgraph_opt=sg))
            assert got == expected, (order, sg)

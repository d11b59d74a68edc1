"""k-clique counting/listing vs brute-force oracle (paper Alg. 7)."""
import pandas as pd
import pytest
from itertools import combinations

from repro.core.graph import Graph
from repro.core.work_depth import WorkDepthRecorder
from repro.graphs import generators as gen
from repro.graphs.reference import ref_kclique_count
from repro.mining.kclique import kclique_count, kclique_list


@pytest.fixture(scope="module")
def er_graph(spark):
    pdf = gen.erdos_renyi(50, 0.15, seed=31)
    return pdf, Graph.from_pandas(spark, pdf)


@pytest.fixture(scope="module")
def planted_graph(spark):
    pdf = gen.planted_cliques(3, 6, 40, 60, seed=32)
    return pdf, Graph.from_pandas(spark, pdf)


def test_k1_is_n(er_graph):
    pdf, g = er_graph
    assert kclique_count(g, 1) == g.num_vertices()


def test_k2_is_m(er_graph):
    pdf, g = er_graph
    assert kclique_count(g, 2) == g.num_edges()


def test_k3_is_triangles(er_graph):
    pdf, g = er_graph
    from repro.mining.triangles import triangle_count

    assert kclique_count(g, 3) == triangle_count(g)


@pytest.mark.parametrize("k", [3, 4, 5])
@pytest.mark.parametrize("strategy", ["node", "edge"])
def test_counts_match_bruteforce(er_graph, k, strategy):
    pdf, g = er_graph
    assert kclique_count(g, k, strategy=strategy) == ref_kclique_count(pdf, k)


@pytest.mark.parametrize("order", ["none", "deg", "dgr", "adg"])
def test_order_invariance(planted_graph, order):
    """Any total order orientation counts each clique exactly once."""
    pdf, g = planted_graph
    assert kclique_count(g, 4, order=order) == ref_kclique_count(pdf, 4)


def test_k6_on_planted(planted_graph):
    pdf, g = planted_graph
    assert kclique_count(g, 6, order="dgr") == ref_kclique_count(pdf, 6)


def test_zero_cliques_on_road(spark):
    pdf = gen.grid_road(8, 8)
    g = Graph.from_pandas(spark, pdf)
    assert kclique_count(g, 3) == 0
    assert kclique_count(g, 4) == 0


def test_listing_members(spark):
    # K4 on {0..3} plus pendant: exactly one 4-clique, four triangles
    edges = list(combinations(range(4), 2)) + [(3, 4)]
    pdf = pd.DataFrame(edges, columns=["src", "dst"])
    g = Graph.from_pandas(spark, pdf)
    rows = kclique_list(g, 4).collect()
    assert [r["members"] for r in rows] == [[0, 1, 2, 3]]
    tri = sorted(tuple(r["members"]) for r in kclique_list(g, 3).collect())
    assert tri == sorted(map(tuple, combinations(range(4), 3)))


def test_listing_matches_count(planted_graph):
    pdf, g = planted_graph
    assert kclique_list(g, 4).count() == kclique_count(g, 4)
    # listed cliques are distinct and really cliques
    rows = [tuple(r["members"]) for r in kclique_list(g, 4).collect()]
    assert len(rows) == len(set(rows))
    import networkx as nx

    from repro.graphs.reference import nx_graph

    nxg = nx_graph(pdf)
    for mem in rows[:50]:
        assert all(nxg.has_edge(a, b) for a, b in combinations(mem, 2))


def test_invalid_args(er_graph):
    _, g = er_graph
    with pytest.raises(ValueError):
        kclique_count(g, 0)
    with pytest.raises(ValueError):
        kclique_count(g, 4, strategy="hyper")
    with pytest.raises(ValueError):
        kclique_list(g, 2)


def test_recorder_tracks_levels(er_graph):
    pdf, g = er_graph
    rec = WorkDepthRecorder()
    kclique_count(g, 5, recorder=rec)
    # levels: grow 3→4 plus the final count round (edge strategy starts at 2)
    assert rec.iterations == 3
    assert rec.set_elements_touched > 0

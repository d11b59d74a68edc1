"""Tests for the set-centric Graph representation (repro.core.graph)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.graph import Graph
from repro.graphs import generators as gen
from repro.graphs.reference import nx_graph


@pytest.fixture(scope="module")
def tri_graph(spark):
    # triangle 0-1-2 plus a pendant 3 and an isolated-ish edge 4-5
    pdf = pd.DataFrame({"src": [0, 1, 0, 2, 4], "dst": [1, 2, 2, 3, 5]})
    return Graph.from_pandas(spark, pdf)


def test_canonicalisation_dedup_selfloops(spark):
    pdf = pd.DataFrame(
        {"src": [1, 2, 2, 3, 1], "dst": [2, 1, 2, 3, 2]}  # dup both ways + loops
    )
    g = Graph.from_pandas(spark, pdf)
    rows = sorted(tuple(r) for r in g.edges.collect())
    assert rows == [(1, 2)]


def test_counts(tri_graph):
    assert tri_graph.num_vertices() == 6
    assert tri_graph.num_edges() == 5


def test_adjacency_sorted_arrays(tri_graph):
    adj = {r["vertex"]: r["nbrs"] for r in tri_graph.adjacency().collect()}
    assert adj[0] == [1, 2]
    assert adj[2] == [0, 1, 3]
    assert adj[5] == [4]
    for nbrs in adj.values():
        assert nbrs == sorted(nbrs)


def test_degrees_match_duckdb(spark, tri_graph):
    from repro.oracle import assert_equivalent

    pdf = tri_graph.edges.toPandas()
    deg = tri_graph.degrees().select(
        F.col("vertex").cast("long"), F.col("deg").cast("long")
    )
    assert_equivalent(
        deg,
        """
        SELECT vertex, count(*)::BIGINT AS deg FROM (
          SELECT src AS vertex FROM e UNION ALL SELECT dst FROM e
        ) GROUP BY vertex
        """,
        e=pdf,
    )


def test_has_edge(tri_graph):
    assert tri_graph.has_edge(0, 1)
    assert tri_graph.has_edge(1, 0)
    assert not tri_graph.has_edge(0, 3)


def test_symmetric_edges_double(tri_graph):
    assert tri_graph.symmetric_edges().count() == 2 * tri_graph.num_edges()


def test_oriented_by_identity_order(tri_graph):
    from repro.orderings.degree import identity_order

    out = {r["vertex"]: r["out_nbrs"]
           for r in tri_graph.oriented(identity_order(tri_graph)).collect()}
    assert out[0] == [1, 2]
    assert out[1] == [2]
    assert out[2] == [3]
    assert out[3] == []
    # every edge appears exactly once across out-neighbourhoods
    assert sum(len(v) for v in out.values()) == tri_graph.num_edges()


def test_oriented_includes_sinks_with_empty_sets(tri_graph):
    from repro.orderings.degree import degree_order

    out = tri_graph.oriented(degree_order(tri_graph))
    assert out.count() == tri_graph.num_vertices()
    assert sum(len(r["out_nbrs"]) for r in out.collect()) == tri_graph.num_edges()


def test_induced_subgraph(tri_graph, spark):
    sub = tri_graph.induced(spark.createDataFrame(pd.DataFrame({"vertex": [0, 1, 2]})))
    rows = sorted(tuple(r) for r in sub.edges.collect())
    assert rows == [(0, 1), (0, 2), (1, 2)]


def test_stats_on_known_graph(tri_graph, spark):
    s = tri_graph.stats(spark)
    assert s["n"] == 6 and s["m"] == 5
    assert s["T"] == 1
    assert s["max_deg"] == 3
    assert s["T_max_per_vertex"] == 1
    assert s["m_over_n"] == pytest.approx(5 / 6)


def test_stats_match_networkx_on_random_graph(spark):
    pdf = gen.erdos_renyi(120, 0.08, seed=13)
    g = Graph.from_pandas(spark, pdf)
    s = g.stats(spark)
    nxg = nx_graph(pdf)
    assert s["n"] == nxg.number_of_nodes()
    assert s["m"] == nxg.number_of_edges()
    import networkx as nx

    assert s["T"] == sum(nx.triangles(nxg).values()) // 3
    assert s["max_deg"] == max(d for _, d in nxg.degree())

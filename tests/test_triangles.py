"""Triangle counting vs networkx and DuckDB oracles."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.graph import Graph
from repro.graphs import generators as gen
from repro.graphs.reference import ref_triangle_count, ref_triangles_per_vertex
from repro.mining.triangles import triangle_count, triangle_counts_per_vertex


@pytest.mark.parametrize(
    "pdf,expected",
    [
        (pd.DataFrame({"src": [0, 1, 0], "dst": [1, 2, 2]}), 1),  # one triangle
        (pd.DataFrame({"src": [0, 1, 2], "dst": [1, 2, 3]}), 0),  # path
        (pd.DataFrame({"src": [0, 0, 0, 1, 1, 2], "dst": [1, 2, 3, 2, 3, 3]}), 4),  # K4
    ],
)
def test_triangle_count_small(spark, pdf, expected):
    assert triangle_count(Graph.from_pandas(spark, pdf)) == expected


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_triangle_count_matches_networkx_er(spark, seed):
    pdf = gen.erdos_renyi(90, 0.1, seed=seed)
    assert triangle_count(Graph.from_pandas(spark, pdf)) == ref_triangle_count(pdf)


def test_triangle_count_matches_networkx_planted(spark):
    pdf = gen.planted_cliques(3, 5, 60, 100, seed=4)
    assert triangle_count(Graph.from_pandas(spark, pdf)) == ref_triangle_count(pdf)


def test_per_vertex_matches_networkx(spark):
    pdf = gen.erdos_renyi(70, 0.12, seed=5)
    g = Graph.from_pandas(spark, pdf)
    got = {r["vertex"]: r["triangles"]
           for r in triangle_counts_per_vertex(g).collect()}
    assert got == ref_triangles_per_vertex(pdf)


def test_per_vertex_zero_for_triangle_free(spark):
    pdf = gen.grid_road(6, 6)
    g = Graph.from_pandas(spark, pdf)
    vals = [r["triangles"] for r in triangle_counts_per_vertex(g).collect()]
    assert set(vals) == {0}


def test_triangle_count_matches_duckdb(spark):
    """Relational triangle count: 3-way self-join on canonical edges."""
    from repro.oracle import assert_equivalent

    pdf = gen.erdos_renyi(60, 0.15, seed=6)
    g = Graph.from_pandas(spark, pdf)
    got = spark.createDataFrame([(triangle_count(g),)], "t long")
    assert_equivalent(
        got,
        """
        SELECT count(*)::BIGINT AS t
        FROM e a JOIN e b ON a.dst = b.src JOIN e c
          ON c.src = a.src AND c.dst = b.dst
        """,
        e=pdf,
    )

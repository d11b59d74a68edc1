"""Vertex similarity vs networkx + DuckDB oracles (paper §6.5)."""
import math

import networkx as nx
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.graph import Graph
from repro.graphs import generators as gen
from repro.graphs.reference import nx_graph, ref_jaccard
from repro.learning.similarity import MEASURES, similarity


@pytest.fixture(scope="module")
def sim_fixture(spark):
    pdf = gen.erdos_renyi(50, 0.15, seed=51)
    g = Graph.from_pandas(spark, pdf)
    pairs_pdf = pdf.head(40).rename(columns={"src": "u", "dst": "v"})
    pairs = spark.createDataFrame(pairs_pdf)
    return pdf, g, pairs_pdf, pairs


def _scores(df, measure):
    return {(r["u"], r["v"]): r[measure] for r in df.collect()}


def test_jaccard_matches_reference(sim_fixture):
    pdf, g, pairs_pdf, pairs = sim_fixture
    got = _scores(similarity(g, pairs, measures=("jaccard",)), "jaccard")
    want = ref_jaccard(pdf, list(pairs_pdf.itertuples(index=False, name=None)))
    for k, v in want.items():
        assert got[k] == pytest.approx(v)


def test_common_neighbors_matches_duckdb(spark, sim_fixture):
    from repro.oracle import assert_equivalent

    pdf, g, pairs_pdf, pairs = sim_fixture
    got = similarity(g, pairs, measures=("common_neighbors",)).select(
        "u", "v", F.col("common_neighbors").cast("long").alias("cn")
    )
    assert_equivalent(
        got,
        """
        WITH sym AS (
          SELECT src AS a, dst AS b FROM e
          UNION ALL SELECT dst, src FROM e
        )
        SELECT p.u AS u, p.v AS v,
               (SELECT count(*) FROM sym x JOIN sym y
                 ON x.b = y.b AND x.a = p.u AND y.a = p.v)::BIGINT AS cn
        FROM p
        """,
        e=pdf,
        p=pairs_pdf,
    )


def test_adamic_adar_matches_networkx(sim_fixture):
    pdf, g, pairs_pdf, pairs = sim_fixture
    got = _scores(similarity(g, pairs, measures=("adamic_adar",)), "adamic_adar")
    nxg = nx_graph(pdf)
    for u, v, p in nx.adamic_adar_index(
        nxg, list(pairs_pdf.itertuples(index=False, name=None))
    ):
        assert got[(u, v)] == pytest.approx(p)


def test_resource_allocation_matches_networkx(sim_fixture):
    pdf, g, pairs_pdf, pairs = sim_fixture
    got = _scores(
        similarity(g, pairs, measures=("resource_allocation",)),
        "resource_allocation",
    )
    nxg = nx_graph(pdf)
    for u, v, p in nx.resource_allocation_index(
        nxg, list(pairs_pdf.itertuples(index=False, name=None))
    ):
        assert got[(u, v)] == pytest.approx(p)


def test_preferential_attachment_matches_networkx(sim_fixture):
    pdf, g, pairs_pdf, pairs = sim_fixture
    got = _scores(
        similarity(g, pairs, measures=("preferential_attachment",)),
        "preferential_attachment",
    )
    nxg = nx_graph(pdf)
    for u, v, p in nx.preferential_attachment(
        nxg, list(pairs_pdf.itertuples(index=False, name=None))
    ):
        assert got[(u, v)] == pytest.approx(p)


def test_overlap_and_total(sim_fixture):
    pdf, g, pairs_pdf, pairs = sim_fixture
    df = similarity(g, pairs, measures=("overlap", "total_neighbors",
                                        "common_neighbors"))
    nxg = nx_graph(pdf)
    for r in df.collect():
        nu, nv = set(nxg[r["u"]]), set(nxg[r["v"]])
        assert r["total_neighbors"] == len(nu | nv)
        want_ov = len(nu & nv) / min(len(nu), len(nv)) if min(len(nu), len(nv)) else 0
        assert r["overlap"] == pytest.approx(want_ov)
        assert r["common_neighbors"] == len(nu & nv)


def test_galloping_equals_merge(sim_fixture):
    """§6.5's two ∩ algorithms must agree on every score (5+ modularity)."""
    pdf, g, pairs_pdf, pairs = sim_fixture
    a = _scores(similarity(g, pairs, measures=("jaccard",),
                           intersect_impl="merge"), "jaccard")
    b = _scores(similarity(g, pairs, measures=("jaccard",),
                           intersect_impl="galloping"), "jaccard")
    assert set(a) == set(b)
    for k in a:
        assert a[k] == pytest.approx(b[k])


def test_all_measures_one_call(sim_fixture):
    pdf, g, pairs_pdf, pairs = sim_fixture
    df = similarity(g, pairs)
    assert set(df.columns) == {"u", "v", *MEASURES}
    assert df.count() == len(pairs_pdf)


def test_unknown_measure_rejected(sim_fixture):
    _, g, _, pairs = sim_fixture
    with pytest.raises(ValueError):
        similarity(g, pairs, measures=("cosine",))
    with pytest.raises(ValueError):
        similarity(g, pairs, intersect_impl="simd")


def test_pairs_with_unknown_vertices(spark, sim_fixture):
    """Pairs referencing vertices absent from the graph score 0, not crash."""
    _, g, _, _ = sim_fixture
    pairs = spark.createDataFrame(pd.DataFrame({"u": [999], "v": [998]}))
    row = similarity(g, pairs, measures=("jaccard", "adamic_adar")).first()
    assert row["jaccard"] == 0.0
    assert row["adamic_adar"] == 0.0

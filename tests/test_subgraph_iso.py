"""Subgraph isomorphism vs the networkx GraphMatcher oracle (paper §6.4)."""
import pandas as pd
import pytest

from repro.core.graph import Graph
from repro.graphs import generators as gen
from repro.graphs.reference import ref_subgraph_iso_count
from repro.mining.subgraph_iso import si_count


def _triangle_query(label=(0, 0, 0)):
    qe = pd.DataFrame({"src": [0, 1, 0], "dst": [1, 2, 2]})
    ql = pd.DataFrame({"vertex": [0, 1, 2], "label": list(label)})
    return qe, ql


def _path_query(label=(0, 0, 0)):
    qe = pd.DataFrame({"src": [0, 1], "dst": [1, 2]})
    ql = pd.DataFrame({"vertex": [0, 1, 2], "label": list(label)})
    return qe, ql


@pytest.fixture(scope="module")
def labeled_target(spark):
    edges, labels = gen.labeled_erdos_renyi(40, 0.15, 2, seed=41)
    return edges, labels, Graph.from_pandas(spark, edges)


@pytest.mark.parametrize("induced", [True, False])
@pytest.mark.parametrize("optimized", [False, True])
def test_triangle_query_matches_networkx(spark, labeled_target, induced, optimized):
    edges, labels, g = labeled_target
    qe, ql = _triangle_query()
    got = si_count(spark, g, labels, qe, ql, induced=induced, optimized=optimized)
    want = ref_subgraph_iso_count(edges, labels, qe, ql, induced=induced)
    assert got == want


@pytest.mark.parametrize("induced", [True, False])
def test_path_query_matches_networkx(spark, labeled_target, induced):
    edges, labels, g = labeled_target
    qe, ql = _path_query()
    got = si_count(spark, g, labels, qe, ql, induced=induced, optimized=True)
    want = ref_subgraph_iso_count(edges, labels, qe, ql, induced=induced)
    assert got == want


def test_labels_restrict_matches(spark, labeled_target):
    edges, labels, g = labeled_target
    qe, ql = _triangle_query(label=(0, 1, 0))
    got = si_count(spark, g, labels, qe, ql, induced=True, optimized=True)
    want = ref_subgraph_iso_count(edges, labels, qe, ql, induced=True)
    assert got == want


@pytest.mark.parametrize("work_split", [1, 2])
def test_work_split_invariant(spark, labeled_target, work_split):
    """Work splitting changes parallel decomposition, never the count."""
    edges, labels, g = labeled_target
    qe, ql = _triangle_query()
    got = si_count(spark, g, labels, qe, ql, induced=True, optimized=True,
                   work_split=work_split)
    want = ref_subgraph_iso_count(edges, labels, qe, ql, induced=True)
    assert got == want


def test_square_query(spark, labeled_target):
    edges, labels, g = labeled_target
    qe = pd.DataFrame({"src": [0, 1, 2, 0], "dst": [1, 2, 3, 3]})
    ql = pd.DataFrame({"vertex": [0, 1, 2, 3], "label": [0, 0, 0, 0]})
    for induced in (True, False):
        got = si_count(spark, g, labels, qe, ql, induced=induced, optimized=True)
        want = ref_subgraph_iso_count(edges, labels, qe, ql, induced=induced)
        assert got == want


def test_no_match_when_label_absent(spark, labeled_target):
    edges, labels, g = labeled_target
    qe, ql = _triangle_query(label=(7, 7, 7))  # label 7 never appears
    assert si_count(spark, g, labels, qe, ql) == 0


def test_work_split_validation(spark, labeled_target):
    edges, labels, g = labeled_target
    qe, ql = _triangle_query()
    with pytest.raises(ValueError):
        si_count(spark, g, labels, qe, ql, work_split=3)


def test_single_vertex_query(spark, labeled_target):
    edges, labels, g = labeled_target
    qe = pd.DataFrame({"src": pd.Series([], dtype="int64"),
                       "dst": pd.Series([], dtype="int64")})
    ql = pd.DataFrame({"vertex": [0], "label": [1]})
    got = si_count(spark, g, labels, qe, ql)
    assert got == int((labels["label"] == 1).sum())

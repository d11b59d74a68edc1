"""Unit tests for the GMS Set interface (repro.core.sets), both layers."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import sets
from repro.core.sets import BitmapSet, HashSet, SortedSet, make_set_factory

REPRS = ["sorted", "bitmap", "hash"]
UNIVERSE = 64


def _mk(repr_name, items):
    return make_set_factory(repr_name, UNIVERSE)(items)


# ---------- Layer 2: kernel-side set representations ----------------------

@pytest.mark.parametrize("repr_name", REPRS)
class TestSetRepr:
    def test_roundtrip(self, repr_name):
        s = _mk(repr_name, [5, 1, 3, 3])
        assert s.to_list() == [1, 3, 5]

    def test_empty(self, repr_name):
        s = _mk(repr_name, [])
        assert s.to_list() == []
        assert s.cardinality() == 0
        assert not s

    def test_intersect(self, repr_name):
        a = _mk(repr_name, [1, 2, 3, 10])
        b = _mk(repr_name, [2, 10, 40])
        assert a.intersect(b).to_list() == [2, 10]

    def test_intersect_count(self, repr_name):
        a = _mk(repr_name, [1, 2, 3, 10])
        b = _mk(repr_name, [2, 10, 40])
        assert a.intersect_count(b) == 2

    def test_diff(self, repr_name):
        a = _mk(repr_name, [1, 2, 3, 10])
        b = _mk(repr_name, [2, 10, 40])
        assert a.diff(b).to_list() == [1, 3]

    def test_union(self, repr_name):
        a = _mk(repr_name, [1, 3])
        b = _mk(repr_name, [2, 3])
        assert a.union(b).to_list() == [1, 2, 3]

    def test_add_remove(self, repr_name):
        s = _mk(repr_name, [1, 2])
        assert s.add(5).to_list() == [1, 2, 5]
        assert s.remove(1).to_list() == [2]
        # add/remove return new sets (persistent style used by BK kernels)
        assert s.to_list() == [1, 2]

    def test_contains(self, repr_name):
        s = _mk(repr_name, [1, 7, 33])
        assert s.contains(7)
        assert not s.contains(8)

    def test_cardinality(self, repr_name):
        assert _mk(repr_name, range(0, 40, 3)).cardinality() == 14

    def test_iter(self, repr_name):
        assert list(_mk(repr_name, [9, 4])) == [4, 9]

    def test_eq(self, repr_name):
        assert _mk(repr_name, [1, 2]) == _mk(repr_name, [2, 1])
        assert _mk(repr_name, [1]) != _mk(repr_name, [2])

    def test_nbytes_positive(self, repr_name):
        assert _mk(repr_name, [1, 2, 3]).nbytes() > 0

    def test_randomised_against_python_sets(self, repr_name):
        g = np.random.default_rng(7)
        for _ in range(25):
            xa = set(g.integers(0, UNIVERSE, 12).tolist())
            xb = set(g.integers(0, UNIVERSE, 12).tolist())
            a, b = _mk(repr_name, xa), _mk(repr_name, xb)
            assert a.intersect(b).to_list() == sorted(xa & xb)
            assert a.diff(b).to_list() == sorted(xa - xb)
            assert a.union(b).to_list() == sorted(xa | xb)
            assert a.intersect_count(b) == len(xa & xb)


def test_cross_representation_agreement():
    """Same logical ops across all three representations (5+ modularity)."""
    items_a, items_b = [0, 5, 9, 63], [5, 9, 17]
    results = []
    for r in REPRS:
        a, b = _mk(r, items_a), _mk(r, items_b)
        results.append(
            (a.intersect(b).to_list(), a.diff(b).to_list(), a.union(b).to_list())
        )
    assert results[0] == results[1] == results[2]


def test_bitmap_popcount_large_words():
    s = BitmapSet(range(0, 130, 2), n=130)
    assert s.cardinality() == 65
    assert s.contains(128)
    assert not s.contains(127)


def test_make_set_factory_rejects_unknown():
    with pytest.raises(ValueError):
        make_set_factory("roaring", 10)


def test_sortedset_wraps_numpy():
    s = SortedSet(np.array([3, 1, 2, 2]))
    assert s.to_list() == [1, 2, 3]


def test_hashset_tolist_sorted():
    assert HashSet([9, 2, 5]).to_list() == [2, 5, 9]


# ---------- Layer 1: Catalyst array set algebra ---------------------------

@pytest.fixture(scope="module")
def pairs_df(spark):
    pdf = pd.DataFrame(
        {
            "a": [[1, 2, 3], [1], [], [4, 5]],
            "b": [[2, 3, 4], [2], [1], [4, 5]],
        }
    )
    return spark.createDataFrame(pdf)


def test_catalyst_intersect(pairs_df):
    got = [r[0] for r in pairs_df.select(sets.intersect(F.col("a"), F.col("b"))).collect()]
    assert got == [[2, 3], [], [], [4, 5]]


def test_catalyst_intersect_count(pairs_df):
    got = [r[0] for r in pairs_df.select(sets.intersect_count(F.col("a"), F.col("b"))).collect()]
    assert got == [2, 0, 0, 2]


def test_catalyst_diff(pairs_df):
    got = [r[0] for r in pairs_df.select(sets.diff(F.col("a"), F.col("b"))).collect()]
    assert got == [[1], [1], [], []]


def test_catalyst_union(pairs_df):
    got = [r[0] for r in pairs_df.select(sets.union(F.col("a"), F.col("b"))).collect()]
    assert got == [[1, 2, 3, 4], [1, 2], [1], [4, 5]]


def test_catalyst_union_count(pairs_df):
    got = [r[0] for r in pairs_df.select(sets.union_count(F.col("a"), F.col("b"))).collect()]
    assert got == [4, 2, 1, 2]


def test_catalyst_cardinality(pairs_df):
    got = [r[0] for r in pairs_df.select(sets.cardinality(F.col("a"))).collect()]
    assert got == [3, 1, 0, 2]


def test_catalyst_contains(pairs_df):
    got = [r[0] for r in pairs_df.select(sets.contains(F.col("a"), F.lit(1))).collect()]
    assert got == [True, True, False, False]


def test_catalyst_matches_duckdb_oracle(spark):
    """Set-intersection cardinality cross-checked relationally in DuckDB."""
    from repro.oracle import assert_equivalent

    left = pd.DataFrame({"pid": [1, 1, 2, 3], "x": [10, 20, 10, 30]})
    right = pd.DataFrame({"pid": [1, 2, 2, 3], "x": [10, 10, 40, 31]})
    ldf = (
        spark.createDataFrame(left)
        .groupBy("pid").agg(F.collect_list("x").alias("xs"))
    )
    rdf = (
        spark.createDataFrame(right)
        .groupBy("pid").agg(F.collect_list("x").alias("xs"))
    )
    joined = ldf.join(rdf.withColumnRenamed("xs", "ys"), "pid").select(
        "pid", sets.intersect_count(F.col("xs"), F.col("ys")).alias("n_common")
    )
    assert_equivalent(
        joined,
        """
        SELECT p.pid AS pid,
               (SELECT count(*) FROM (
                  SELECT DISTINCT x FROM lt WHERE lt.pid = p.pid
                  INTERSECT
                  SELECT DISTINCT x FROM rt WHERE rt.pid = p.pid)) AS n_common
        FROM (SELECT DISTINCT pid FROM lt
              INTERSECT SELECT DISTINCT pid FROM rt) p
        """,
        lt=left,
        rt=right,
    )

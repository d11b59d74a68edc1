"""Benchmark: Tables 5/6 empirical work/depth-bound validation."""
import math

from benchmarks._jobs import load_job

table5 = load_job("table5_bounds")


def test_bench_table5_bounds(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: table5.run(spark, sf=1.0, sizes=(200, 400, 800)),
        rounds=1, iterations=1,
    )
    assert len(rows) == 3
    for r in rows:
        # Lemma 7.1 depth: rounds within a small multiple of log2 n
        assert r["ADG_rounds"] <= 4 * (r["log2(n)"] + 1)
        assert r["ADG_rounds"] <= r["DGR_rounds"]
        # O(m) work proxy: each vertex batched exactly once
        assert r["ADG_work_proxy"] == r["n"]
        # (2+eps) approximation quality
        assert r["max_later_nbrs"] <= math.ceil(r["(2+2eps)*d"])

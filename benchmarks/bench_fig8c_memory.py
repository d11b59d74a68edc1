"""Benchmark: Fig. 8c representation memory footprints."""
from benchmarks._jobs import load_job

fig8c = load_job("fig8c_memory")


def test_bench_fig8c_memory(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: fig8c.run(spark, sf=0.5), rounds=1, iterations=1
    )
    reps = [r for r in rows if "representation" in r]
    assert len(reps) == 3 * 5
    # Das baseline peak highest among array-style reps on every graph
    for gname in {r["graph"] for r in reps}:
        sub = {r["representation"]: r for r in reps if r["graph"] == gname}
        assert sub["DasBaseline"]["peak_MB"] >= sub["SortedSet"]["peak_MB"]

"""Benchmark: Fig. 7 subgraph isomorphism optimisation ablation."""
from benchmarks._jobs import load_job

fig7 = load_job("fig7_subgraph_iso")


def test_bench_fig7_subgraph_iso(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: fig7.run(spark, sf=1.0), rounds=1, iterations=1
    )
    abl = [r for r in rows if r["sweep"] == "ablation"]
    assert len(abl) == 4
    # every ablation variant finds the same embedding count
    assert len({r["patterns"] for r in abl}) == 1
    # optimised kernel beats the baseline (Fig. 7's 2.5x claim); allow a
    # noise margin — per-task kernels are short next to Spark overheads
    by = {r["variant"]: r for r in abl}
    assert (by["GMS precompute+vectorised"]["kernel_s"]
            <= by["VF3-Light(analog) baseline"]["kernel_s"] * 1.25)

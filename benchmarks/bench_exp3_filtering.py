"""Benchmark: Exp-3 — the filtering funnel (candidates -> filtered ->
embeddings) over one dataset's q2 workload."""
from repro.experiments.harness import filtering_stats
from repro.hyper.queries import QuerySetting


def test_bench_exp3_filtering(benchmark):
    s = benchmark.pedantic(
        filtering_stats,
        args=("WT", [QuerySetting("q2", 2, 2, 20)]),
        kwargs={"n_queries": 3, "scale": 1.0, "seed": 0},
        rounds=2,
        iterations=1,
    )
    assert s["candidates"] >= s["filtered"] >= s["embeddings"]

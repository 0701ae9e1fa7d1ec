"""Benchmark: Table IV — the completion-ratio harness (mini config).

Runs all five engines (HGMatch + CFL-H/DAF-H/CECI-H/RapidMatch) under
the operation budget on two contrasting datasets; asserts the paper's
headline: HGMatch completes everything.
"""
from repro.experiments.harness import completion_table, run_queries
from repro.hyper.queries import QuerySetting

SETTINGS = [QuerySetting("q2", 2, 2, 20)]


def test_bench_table4_completion(benchmark):
    def run():
        recs = []
        for ds in ("CH", "HB"):
            recs += run_queries(
                ds, SETTINGS, n_queries=2, budget=150_000, scale=0.5, seed=0
            )
        return completion_table(recs)

    tab = benchmark.pedantic(run, rounds=2, iterations=1)
    assert tab.loc["HGMatch", "Total"] == 100.0

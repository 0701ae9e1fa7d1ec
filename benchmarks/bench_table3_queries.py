"""Benchmark: Table III — random-walk query sampling, all settings."""
from repro.experiments.datasets import make_dataset
from repro.hyper.queries import TABLE3_SETTINGS, sample_queries


def test_bench_table3_sampling(benchmark):
    H = make_dataset("WT", scale=1.0, seed=0)

    def sample_all():
        return [
            sample_queries(H, s, 5, seed=1) for s in TABLE3_SETTINGS
        ]

    out = benchmark(sample_all)
    assert all(len(qs) == 5 for qs in out)

"""Benchmark: Table II — dataset statistics over the whole catalog."""
from repro.experiments.tables import table2_datasets


def test_bench_table2_stats(benchmark):
    tab = benchmark.pedantic(
        table2_datasets, kwargs={"scale": 0.3, "seed": 0}, rounds=2, iterations=1
    )
    assert len(tab) == 10

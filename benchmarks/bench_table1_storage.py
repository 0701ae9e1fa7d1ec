"""Benchmark: Table I — signature-partitioned storage construction.

Builds the partitioned hyperedge tables + inverted hyperedge index
(the offline stage behind Table I's layout) on a mid-size dataset.
"""
from repro.experiments.datasets import make_dataset
from repro.hyper.storage import SignatureStore


def test_bench_table1_store_build(benchmark):
    H = make_dataset("WT", scale=1.0, seed=0)
    store = benchmark(SignatureStore, H)
    assert store.build_report().n_partitions > 0

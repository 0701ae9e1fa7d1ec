"""Benchmark: Exp-1 — inverted-index build on the largest stand-in."""
from repro.experiments.datasets import make_dataset
from repro.hyper.storage import SignatureStore


def test_bench_exp1_index_build_ar(benchmark):
    H = make_dataset("AR", scale=1.0, seed=0)
    store = benchmark(SignatureStore, H)
    # Paper Exp-1: index size is within a small factor of graph size.
    assert 0.2 <= store.index_nbytes() / store.graph_nbytes() <= 1.2

"""Benchmark: Exp-2 — HGMatch vs the extended baselines, one query.

Two benchmarks on the same high-arity workload (house-bills stand-in):
the pytest-benchmark comparison table *is* the speedup readout. The
baseline benchmark runs under a budget (it would otherwise take hours,
which is the paper's point); the assertion pins the ordering.
"""
import pytest

from repro.baselines.backtrack import match_by_vertex
from repro.baselines.rapidmatch import rapidmatch
from repro.core.local_engine import hgmatch
from repro.experiments.datasets import make_dataset
from repro.hyper.queries import QuerySetting, sample_query
from repro.hyper.storage import SignatureStore

BUDGET = 150_000


@pytest.fixture(scope="module")
def workload():
    H = make_dataset("HB", scale=0.5, seed=0)
    store = SignatureStore(H)
    q = sample_query(H, QuerySetting("q2", 2, 5, 60), seed=1).query
    return H, store, q


def test_bench_exp2_hgmatch(benchmark, workload):
    H, store, q = workload
    r = benchmark(hgmatch, H, store, q)
    assert not r.timed_out


@pytest.mark.parametrize("strategy", ["cfl", "daf", "ceci"])
def test_bench_exp2_backtrack(benchmark, workload, strategy):
    H, store, q = workload
    r = benchmark.pedantic(
        match_by_vertex,
        args=(H, q),
        kwargs={"strategy": strategy, "budget": BUDGET},
        rounds=2,
        iterations=1,
    )
    hg = hgmatch(H, store, q)
    assert r.timed_out or r.stats["ops"] >= hg.stats["ops"]


def test_bench_exp2_rapidmatch(benchmark, workload):
    H, store, q = workload
    r = benchmark.pedantic(
        rapidmatch, args=(H, q), kwargs={"budget": BUDGET}, rounds=2, iterations=1
    )
    assert r.timed_out or r.tuple_count >= 0

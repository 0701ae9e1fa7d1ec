"""Benchmark: Exp-6 — stealing vs static partitioning at 20 workers.

Asserts the reproduced balance relation: dynamic stealing's
max/mean busy-time ratio beats the static NOSTL assignment.
"""
import pytest

from repro.core.order import compute_matching_order
from repro.core.plan import compile_plan
from repro.engine.scheduler import simulate_workstealing
from repro.engine.tasks import HGMatchTaskExecutor
from repro.experiments.datasets import make_dataset
from repro.experiments.harness import pick_heavy_queries
from repro.hyper.storage import SignatureStore


@pytest.fixture(scope="module")
def plan_store():
    H = make_dataset("SB", scale=0.6, seed=0)
    store = SignatureStore(H)
    _, q = pick_heavy_queries(H, store, n_pick=1, n_sample=6)[0]
    return compile_plan(q, compute_matching_order(q, store.card)), store


def test_bench_exp6_with_stealing(benchmark, plan_store):
    plan, store = plan_store
    sim = benchmark.pedantic(
        lambda: simulate_workstealing(HGMatchTaskExecutor(plan, store), 20),
        rounds=2,
        iterations=1,
    )
    nostl = simulate_workstealing(
        HGMatchTaskExecutor(plan, store), 20, steal=False, scatter_roots=True
    )
    assert sim.load_imbalance <= nostl.load_imbalance


def test_bench_exp6_no_stealing(benchmark, plan_store):
    plan, store = plan_store
    sim = benchmark.pedantic(
        lambda: simulate_workstealing(
            HGMatchTaskExecutor(plan, store), 20, steal=False, scatter_roots=True
        ),
        rounds=2,
        iterations=1,
    )
    assert sim.emitted > 0

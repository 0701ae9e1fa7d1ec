"""Benchmark: Exp-5 — task-based vs BFS scheduling on one heavy query.

Asserts the reproduced memory relation: BFS materialisation peaks far
above the bounded task queues on a result-heavy query.
"""
import pytest

from repro.core.order import compute_matching_order
from repro.core.plan import compile_plan
from repro.engine.scheduler import (
    simulate_bfs,
    simulate_workstealing,
    theorem_vi1_bound_bytes,
)
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


def test_bench_exp5_task_scheduler(benchmark, plan_store):
    plan, store = plan_store
    sim = benchmark.pedantic(
        lambda: simulate_workstealing(HGMatchTaskExecutor(plan, store), 20),
        rounds=2,
        iterations=1,
    )
    assert sim.peak_task_bytes <= theorem_vi1_bound_bytes(plan, store, 20)


def test_bench_exp5_bfs_scheduler(benchmark, plan_store):
    plan, store = plan_store
    bfs = benchmark.pedantic(
        lambda: simulate_bfs(HGMatchTaskExecutor(plan, store)),
        rounds=2,
        iterations=1,
    )
    task = simulate_workstealing(HGMatchTaskExecutor(plan, store), 20)
    assert bfs.peak_intermediate_bytes > task.peak_task_bytes

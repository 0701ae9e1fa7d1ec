"""Benchmark: Exp-4 — scheduler simulation at 1 vs 20 workers.

The benchmark timing measures the simulator itself; the *reproduced*
quantity (simulated makespan speedup) is asserted: near-linear scaling
to 20 workers on a heavy SB query.
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
    # Full-scale SB: the near-linear region needs enough total work
    # for 20 workers to amortise the task tree's sequential spine.
    H = make_dataset("SB", scale=1.0, seed=0)
    store = SignatureStore(H)
    _, q = pick_heavy_queries(H, store, n_pick=1, n_sample=6)[0]
    return compile_plan(q, compute_matching_order(q, store.card)), store


@pytest.mark.parametrize("workers", [1, 20])
def test_bench_exp4_simulate(benchmark, plan_store, workers):
    plan, store = plan_store

    def run():
        return simulate_workstealing(
            HGMatchTaskExecutor(plan, store), workers, numa_threshold=20
        )

    sim = benchmark.pedantic(run, rounds=2, iterations=1)
    if workers == 20:
        base = simulate_workstealing(HGMatchTaskExecutor(plan, store), 1)
        assert base.makespan / sim.makespan > 8  # near-linear region

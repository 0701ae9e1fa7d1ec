"""Tests for the task model + LIFO scheduler + work stealing
(paper Section VI, Theorem VI.1, Exps 4-6)."""
import pytest

from tests.helpers import small_instance
from repro.core.local_engine import hgmatch
from repro.core.order import compute_matching_order
from repro.core.plan import compile_plan
from repro.engine.scheduler import (
    simulate_bfs,
    simulate_workstealing,
    theorem_vi1_bound_bytes,
)
from repro.engine.tasks import HGMatchTaskExecutor, Task, TaskKind
from repro.experiments.datasets import make_dataset
from repro.hyper.model import fig1_data, fig1_query
from repro.hyper.queries import QuerySetting, sample_query
from repro.hyper.storage import SignatureStore


def make_executor(seed=None, *, fig1=False, dataset=None, scale=0.4, n_edges_q=3):
    if fig1:
        H, q = fig1_data(), fig1_query()
        store = SignatureStore(H)
    elif dataset is not None:
        H = make_dataset(dataset, scale=scale, seed=0)
        store = SignatureStore(H)
        q = sample_query(H, QuerySetting("q", n_edges_q, 2, 40), seed=3).query
    else:
        inst = small_instance(seed, n_edges_q=n_edges_q)
        if inst is None:
            return None
        H, store, q = inst
    plan = compile_plan(q, compute_matching_order(q, store.card))
    return H, store, q, plan


class TestTasks:
    def test_task_tree_fig1(self):
        H, store, q, plan = make_executor(fig1=True)
        ex = HGMatchTaskExecutor(plan, store)
        root = ex.root_task()
        assert root.kind is TaskKind.SCAN
        out = ex.execute(root)
        assert len(out.children) == 2  # partition {A,C} has e1, e2
        assert all(t.kind is TaskKind.EXPAND for t in out.children)

    def test_sink_counts(self):
        H, store, q, plan = make_executor(fig1=True)
        ex = HGMatchTaskExecutor(plan, store)
        out = ex.execute(Task(TaskKind.SINK, 3, (0, 2, 4)))
        assert out.emitted == 1 and not out.children

    def test_payload_bytes_grow_with_depth(self):
        t1 = Task(TaskKind.EXPAND, 1, (0,))
        t2 = Task(TaskKind.EXPAND, 2, (0, 1))
        assert t2.payload_nbytes(3.0) > t1.payload_nbytes(3.0)

    def test_costs_positive(self):
        H, store, q, plan = make_executor(fig1=True)
        ex = HGMatchTaskExecutor(plan, store)
        out = ex.execute(ex.root_task())
        assert out.cost > 0


class TestConservation:
    """The scheduler must never lose or duplicate work."""

    @pytest.mark.parametrize("p", [1, 2, 3, 8, 17])
    def test_emitted_independent_of_workers(self, p):
        H, store, q, plan = make_executor(fig1=True)
        expected = hgmatch(H, store, q).count
        ex = HGMatchTaskExecutor(plan, store)
        sim = simulate_workstealing(ex, p)
        assert sim.emitted == expected

    @pytest.mark.parametrize("seed", range(6))
    def test_emitted_matches_engine_random(self, seed):
        made = make_executor(seed)
        if made is None:
            pytest.skip("no instance")
        H, store, q, plan = made
        expected = hgmatch(H, store, q).count
        for p in (1, 4):
            sim = simulate_workstealing(HGMatchTaskExecutor(plan, store), p)
            assert sim.emitted == expected

    def test_seed_invariance_of_results(self):
        made = make_executor(dataset="SB", scale=0.3)
        H, store, q, plan = made
        counts = {
            simulate_workstealing(
                HGMatchTaskExecutor(plan, store), 6, seed=s
            ).emitted
            for s in range(3)
        }
        assert len(counts) == 1

    def test_bfs_agrees(self):
        made = make_executor(dataset="SB", scale=0.3)
        H, store, q, plan = made
        expected = hgmatch(H, store, q).count
        assert simulate_bfs(HGMatchTaskExecutor(plan, store)).emitted == expected


class TestVirtualTime:
    def test_single_worker_makespan_is_total_cost(self):
        made = make_executor(dataset="SB", scale=0.3)
        H, store, q, plan = made
        sim = simulate_workstealing(HGMatchTaskExecutor(plan, store), 1)
        assert sim.makespan == pytest.approx(sim.total_cost)
        assert sim.n_steals == 0

    def test_makespan_at_least_work_over_p(self):
        made = make_executor(dataset="SB", scale=0.3)
        H, store, q, plan = made
        for p in (2, 4, 8):
            sim = simulate_workstealing(HGMatchTaskExecutor(plan, store), p)
            assert sim.makespan >= sim.total_cost / p - 1e-9

    def test_speedup_increases_with_workers(self):
        made = make_executor(dataset="SB", scale=0.4)
        H, store, q, plan = made
        m1 = simulate_workstealing(HGMatchTaskExecutor(plan, store), 1).makespan
        m4 = simulate_workstealing(HGMatchTaskExecutor(plan, store), 4).makespan
        m8 = simulate_workstealing(HGMatchTaskExecutor(plan, store), 8).makespan
        assert m1 > m4 > m8

    def test_numa_penalty_slows_extra_workers(self):
        made = make_executor(dataset="SB", scale=0.4)
        H, store, q, plan = made
        fast = simulate_workstealing(
            HGMatchTaskExecutor(plan, store), 8, numa_threshold=None
        )
        slow = simulate_workstealing(
            HGMatchTaskExecutor(plan, store), 8, numa_threshold=2, numa_penalty=3.0
        )
        assert slow.makespan > fast.makespan

    def test_invalid_worker_count(self):
        made = make_executor(fig1=True)
        H, store, q, plan = made
        with pytest.raises(ValueError):
            simulate_workstealing(HGMatchTaskExecutor(plan, store), 0)


class TestMemoryBound:
    def test_peak_under_theorem_vi1(self):
        for ds in ("SB", "CH"):
            made = make_executor(dataset=ds, scale=0.3)
            H, store, q, plan = made
            for p in (1, 4, 20):
                sim = simulate_workstealing(HGMatchTaskExecutor(plan, store), p)
                assert sim.peak_task_bytes <= theorem_vi1_bound_bytes(plan, store, p)

    def test_bfs_exceeds_task_based_on_result_heavy_query(self):
        made = make_executor(dataset="SB", scale=0.5)
        H, store, q, plan = made
        sim = simulate_workstealing(HGMatchTaskExecutor(plan, store), 20)
        bfs = simulate_bfs(HGMatchTaskExecutor(plan, store))
        if bfs.emitted >= 500:  # memory gap appears with many results
            assert bfs.peak_intermediate_bytes > sim.peak_task_bytes

    def test_peak_positive(self):
        made = make_executor(fig1=True)
        H, store, q, plan = made
        sim = simulate_workstealing(HGMatchTaskExecutor(plan, store), 2)
        assert sim.peak_task_bytes > 0


class TestLoadBalancing:
    def test_stealing_beats_static_on_skewed_workload(self):
        made = make_executor(dataset="SB", scale=0.5)
        H, store, q, plan = made
        steal = simulate_workstealing(HGMatchTaskExecutor(plan, store), 8)
        nostl = simulate_workstealing(
            HGMatchTaskExecutor(plan, store), 8, steal=False, scatter_roots=True
        )
        assert steal.load_imbalance <= nostl.load_imbalance + 1e-9
        assert steal.emitted == nostl.emitted

    def test_stealing_near_perfect_balance(self):
        made = make_executor(dataset="SB", scale=0.5)
        H, store, q, plan = made
        sim = simulate_workstealing(HGMatchTaskExecutor(plan, store), 8)
        if sim.total_cost > 50_000:  # enough work to balance
            assert sim.load_imbalance < 1.25

    def test_steal_time_recorded(self):
        made = make_executor(dataset="SB", scale=0.4)
        H, store, q, plan = made
        sim = simulate_workstealing(HGMatchTaskExecutor(plan, store), 4)
        if sim.n_steals:
            assert sum(sim.steal_time) > 0

"""Exp-5 (Fig. 11): task-based scheduler memory vs BFS materialisation.

The 20 q3 queries on the SB stand-in (AR's scaled stand-in loses its
hub-driven result mass, so the heavy-task-tree shape is taken from SB;
see EXPERIMENTS.md) run under (a) the LIFO task-based
scheduler with 20 workers and (b) BFS level-wise materialisation; peak
live bytes are compared and checked against the Thm. VI.1 bound.

Run: ``spark-submit jobs/exp5_memory.py``.
"""
from repro.core.order import compute_matching_order
from repro.core.plan import compile_plan
from repro.engine.scheduler import (
    simulate_bfs,
    simulate_workstealing,
    theorem_vi1_bound_bytes,
)
from repro.engine.tasks import HGMatchTaskExecutor
from repro.experiments.datasets import make_dataset
from repro.hyper.queries import QuerySetting, sample_queries
from repro.hyper.storage import SignatureStore


def main() -> None:
    H = make_dataset("SB")
    store = SignatureStore(H)
    queries = sample_queries(H, QuerySetting("q3", 3, 10, 20), 20, seed=11)
    print("== Exp-5: peak scheduler memory, task-based (20 workers) vs BFS ==")
    print(f"{'q':>3} {'embeddings':>11} {'task_peak':>11} {'bfs_peak':>11} {'bound':>12} {'bfs/task':>8}")
    for i, sq in enumerate(queries):
        plan = compile_plan(sq.query, compute_matching_order(sq.query, store.card))
        ex = HGMatchTaskExecutor(plan, store)
        sim = simulate_workstealing(ex, 20)
        bfs = simulate_bfs(HGMatchTaskExecutor(plan, store))
        bound = theorem_vi1_bound_bytes(plan, store, 20)
        print(
            f"{i:>3} {sim.emitted:>11} {sim.peak_task_bytes:>11} {bfs.peak_intermediate_bytes:>11} "
            f"{bound:>12} {bfs.peak_intermediate_bytes / max(1, sim.peak_task_bytes):>8.1f}"
        )
        assert sim.peak_task_bytes <= bound, "Thm. VI.1 bound violated"
    print("paper shape: BFS memory grows with the embedding count; "
          "task-based stays flat (~4.8 GB constant on the real AR)")


if __name__ == "__main__":
    main()

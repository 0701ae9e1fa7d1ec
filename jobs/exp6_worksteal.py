"""Exp-6 (Fig. 12): per-worker load with and without work stealing.

One heavy q3 query on the SB stand-in (AR's scaled stand-in loses its
hub-driven result mass, so the heavy-task-tree shape is taken from SB;
see EXPERIMENTS.md), 20 workers: dynamic stealing vs
static assignment of the firstly matched hyperedges (HGMatch-NOSTL).

Run: ``spark-submit jobs/exp6_worksteal.py``.
"""
from repro.core.order import compute_matching_order
from repro.core.plan import compile_plan
from repro.engine.scheduler import simulate_workstealing
from repro.engine.tasks import HGMatchTaskExecutor
from repro.experiments.datasets import make_dataset
from repro.experiments.harness import pick_heavy_queries
from repro.hyper.storage import SignatureStore


def main() -> None:
    H = make_dataset("SB")
    store = SignatureStore(H)
    count, q = pick_heavy_queries(H, store, n_pick=2)[-1]  # q3^2
    plan = compile_plan(q, compute_matching_order(q, store.card))
    steal = simulate_workstealing(HGMatchTaskExecutor(plan, store), 20)
    nostl = simulate_workstealing(
        HGMatchTaskExecutor(plan, store), 20, steal=False, scatter_roots=True
    )
    print(f"== Exp-6: per-worker busy time, q3^2 ({count} embeddings), 20 workers ==")
    print(f"{'worker':>6} {'steal':>12} {'no-steal':>12}")
    for w, (a, b) in enumerate(zip(sorted(steal.busy), sorted(nostl.busy))):
        print(f"{w:>6} {a:>12.0f} {b:>12.0f}")
    print(f"imbalance (max/mean): steal={steal.load_imbalance:.3f} "
          f"no-steal={nostl.load_imbalance:.3f}; steals={steal.n_steals}")
    print("paper shape: near-perfect balance with stealing; visible skew "
          "(especially the last worker) without")


if __name__ == "__main__":
    main()

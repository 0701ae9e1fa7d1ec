"""Task-based LIFO scheduler + dynamic work stealing (Sections VI-B/C).

A discrete-event simulator over the real task tree: each worker owns a
deque used LIFO (newly spawned tasks go to the head; execution pops the
head), so memory stays bounded (Thm. VI.1). An idle worker steals half
of a random non-empty victim's deque *from the tail* — the oldest,
shallowest, hence largest-subtree tasks — which is the fine-grained
dynamic load balancing of Section VI-C.

Virtual time: executing a task advances its worker's clock by the
task's measured operation count (see :mod:`repro.engine.tasks`), plus a
configurable steal overhead per steal. Causality is respected: a task
cannot start before the virtual time its parent finished (its *ready
time*). The simulated makespan with p workers therefore reflects
genuine work distribution; Exp-4's speedups are
``makespan(1) / makespan(p)``. A configurable NUMA model (paper: knee
beyond 20 threads = one physical socket) multiplies task costs for
workers beyond ``numa_threshold`` — DESIGN.md substitution #7.

Memory accounting: the live byte total of queued task payloads is
maintained incrementally; its peak is the Thm. VI.1 quantity. The BFS
strawman (Exp-5) materialises every intermediate-result level instead.
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass, field

import numpy as np

from repro.engine.tasks import HGMatchTaskExecutor, Task


@dataclass
class SimResult:
    n_workers: int
    makespan: float
    busy: list[float]            # per-worker execution time (Exp-6)
    total_cost: float            # sum of task costs (sequential work)
    peak_task_bytes: int         # live task-queue memory peak (Exp-5)
    n_tasks: int
    n_steals: int
    emitted: int                 # embeddings counted by SINK tasks
    steal_time: list[float] = field(default_factory=list)

    @property
    def load_imbalance(self) -> float:
        """max busy / mean busy — 1.0 is perfect balance."""
        mean = sum(self.busy) / max(1, len(self.busy))
        return max(self.busy) / mean if mean > 0 else 1.0


def theorem_vi1_bound_bytes(plan, store, n_workers: int = 1) -> int:
    """The Thm. VI.1 memory bound, in bytes (8 bytes per vertex id):
    ``O(bar{a}_q x |E(q)|^2 x |E(H)|)`` per task queue."""
    aq = plan.q.avg_arity
    nq = plan.n_steps
    ne = max(1, store.H.n_edges)
    per_queue = int(8 * max(1.0, aq) * nq * nq * ne) + 8 * nq * ne
    return n_workers * per_queue


def simulate_workstealing(
    executor: HGMatchTaskExecutor,
    n_workers: int,
    *,
    steal: bool = True,
    seed: int = 0,
    steal_overhead: float = 8.0,
    numa_threshold: int | None = None,
    numa_penalty: float = 1.3,
    scatter_roots: bool = False,
) -> SimResult:
    """Run the full matching job on ``n_workers`` simulated workers.

    ``steal=False`` + ``scatter_roots=True`` reproduces the paper's
    'HGMatch-NOSTL' configuration (static assignment of the firstly
    matched hyperedges, Exp-6). With stealing, the root SCAN output
    stays on worker 0 and spreads purely by stealing.

    Queues hold ``(task, ready_time)`` pairs; ``ready_time`` is the
    spawning worker's clock when the task was pushed, and execution
    starts at ``max(worker clock, ready_time)``.
    """
    if n_workers < 1:
        raise ValueError("need at least one worker")
    rng = np.random.default_rng(seed)
    aq = executor.plan.q.avg_arity
    queues: list[deque[tuple[Task, float]]] = [deque() for _ in range(n_workers)]
    clocks = [0.0] * n_workers
    busy = [0.0] * n_workers
    steal_time = [0.0] * n_workers
    live_bytes = 0
    peak_bytes = 0
    n_tasks = 0
    n_steals = 0
    emitted = 0
    total_cost = 0.0

    def cost_multiplier(w: int) -> float:
        if numa_threshold is not None and w >= numa_threshold:
            return numa_penalty
        return 1.0

    def push(w: int, tasks: list[Task], ready: float) -> None:
        nonlocal live_bytes, peak_bytes
        for t in reversed(tasks):  # head-insert preserving child order
            queues[w].appendleft((t, ready))
            live_bytes += t.payload_nbytes(aq)
        peak_bytes = max(peak_bytes, live_bytes)

    # Seed: SCAN executes on worker 0; its children either stay (steal
    # mode) or are scattered round-robin (static NOSTL mode).
    root_out = executor.execute(executor.root_task())
    total_cost += root_out.cost
    busy[0] += root_out.cost
    clocks[0] += root_out.cost * cost_multiplier(0)
    n_tasks += 1
    if scatter_roots:
        for i, t in enumerate(root_out.children):
            queues[i % n_workers].append((t, clocks[0]))
            live_bytes += t.payload_nbytes(aq)
        peak_bytes = max(peak_bytes, live_bytes)
    else:
        push(0, root_out.children, clocks[0])

    while True:
        nonempty = [w for w in range(n_workers) if queues[w]]
        if not nonempty:
            break
        if steal:
            # Every idle worker steals half a victim's deque (tail end);
            # steal timing is reflected through task ready times and the
            # thief's own clock, so no clock gate is needed here.
            for w in range(n_workers):
                if queues[w]:
                    continue
                victims = [x for x in range(n_workers) if len(queues[x]) > 1]
                if not victims:
                    continue
                v = int(rng.choice(victims))
                take = len(queues[v]) // 2
                stolen = [queues[v].pop() for _ in range(take)]  # tail
                queues[w].extend(reversed(stolen))  # keep relative order
                # Causality of the stolen tasks is enforced by their
                # per-task ready times at execution; the thief only
                # pays the steal overhead here.
                clocks[w] += steal_overhead
                steal_time[w] += steal_overhead
                n_steals += 1
            nonempty = [w for w in range(n_workers) if queues[w]]
        # Next event: the worker able to *finish* soonest is a good
        # greedy proxy; we use the earliest (clock, ready) start.
        def start_time(w: int) -> float:
            return max(clocks[w], queues[w][0][1])

        w = min(nonempty, key=lambda x: (start_time(x), x))
        task, ready = queues[w].popleft()
        live_bytes -= task.payload_nbytes(aq)
        out = executor.execute(task)
        n_tasks += 1
        total_cost += out.cost
        busy[w] += out.cost
        clocks[w] = max(clocks[w], ready) + out.cost * cost_multiplier(w)
        emitted += out.emitted
        push(w, out.children, clocks[w])

    return SimResult(
        n_workers=n_workers,
        makespan=max(clocks),
        busy=busy,
        total_cost=total_cost,
        peak_task_bytes=peak_bytes,
        n_tasks=n_tasks,
        n_steals=n_steals,
        emitted=emitted,
        steal_time=steal_time,
    )


@dataclass
class BfsResult:
    peak_intermediate_bytes: int
    peak_intermediate_count: int
    total_cost: float
    emitted: int
    n_tasks: int


def simulate_bfs(executor: HGMatchTaskExecutor) -> BfsResult:
    """BFS-style scheduling strawman (Exp-5): materialise the entire
    intermediate-result frontier level by level, as PGX.ISO-style BFS
    engines do; memory peaks at the widest level."""
    aq = executor.plan.q.avg_arity
    frontier = [executor.root_task()]
    peak_bytes = sum(t.payload_nbytes(aq) for t in frontier)
    peak_count = len(frontier)
    total_cost = 0.0
    emitted = 0
    n_tasks = 0
    while frontier:
        nxt: list[Task] = []
        for t in frontier:
            out = executor.execute(t)
            n_tasks += 1
            total_cost += out.cost
            emitted += out.emitted
            nxt.extend(out.children)
        level_bytes = sum(t.payload_nbytes(aq) for t in nxt)
        peak_bytes = max(peak_bytes, level_bytes)
        peak_count = max(peak_count, len(nxt))
        frontier = nxt
    return BfsResult(peak_bytes, peak_count, total_cost, emitted, n_tasks)

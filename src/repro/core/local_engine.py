"""Sequential match-by-hyperedge engine (paper Alg. 2).

Executes a :class:`~repro.core.plan.CompiledPlan` with an explicit LIFO
stack — the single-thread specialisation of the task-based scheduler of
Section VI-B, so memory stays bounded (no level-wise materialisation)
and the traversal order matches what the parallel simulator replays.

The engine never recurses and never builds auxiliary runtime
structures; each expansion is Alg. 4 (set-operation candidate
generation) followed by Alg. 5 (profile validation), with operation
counting for budgets ("timeouts") and for Exp-3's filtering statistics:

- ``stats['candidates']`` — candidates emitted by Alg. 4
- ``stats['filtered']``   — survivors of the vertex-count check (Obs. V.5)
- ``stats['validated']``  — survivors of profile validation (= embeddings
  at the final step)
"""
from __future__ import annotations

from collections import Counter
from dataclasses import dataclass, field

from repro.core.candidates import generate_candidates
from repro.core.order import compute_matching_order
from repro.core.plan import CompiledPlan, compile_plan
from repro.core.validate import exact_embedding_exists, is_valid_embedding
from repro.hyper.model import Hypergraph
from repro.hyper.storage import SignatureStore


@dataclass
class MatchResult:
    """Outcome of one subhypergraph-matching run."""

    count: int
    phi: tuple[int, ...]
    stats: Counter = field(default_factory=Counter)
    timed_out: bool = False
    embeddings: list[tuple[int, ...]] | None = None  # aligned to phi


def expand_embedding(
    plan: CompiledPlan,
    store: SignatureStore,
    step_idx: int,
    m: tuple[int, ...],
    *,
    validation: str = "profile",
    stats: Counter | None = None,
) -> list[tuple[int, ...]]:
    """One EXPAND: all valid extensions of partial embedding ``m``
    (matched hyperedge ids of steps ``0..step_idx-1``) by step
    ``step_idx``. Shared by this engine and the task scheduler.
    """
    H = store.H
    step = plan.steps[step_idx]
    vsets = [H.edges[eid] for eid in m]
    out: list[tuple[int, ...]] = []
    for c in generate_candidates(step, vsets, store, stats):
        if c in m:  # distinct data hyperedges per embedding tuple
            continue
        new_vsets = vsets + [H.edges[c]]
        if validation == "profile":
            ok = is_valid_embedding(step, new_vsets, H, stats)
        elif validation == "exact":
            ok = exact_embedding_exists(plan, new_vsets, H)
            if stats is not None and ok:
                stats["filtered"] += 1
                stats["validated"] += 1
        else:
            raise ValueError(f"unknown validation mode {validation!r}")
        if ok:
            out.append(m + (c,))
    return out


def hgmatch(
    H: Hypergraph,
    store: SignatureStore,
    q: Hypergraph,
    *,
    phi: list[int] | None = None,
    validation: str = "profile",
    budget: int | None = None,
    collect: bool = False,
) -> MatchResult:
    """Find all embeddings of ``q`` in ``H`` (Alg. 2, DFS/LIFO form).

    Parameters
    ----------
    phi: optional explicit matching order; defaults to Alg. 3.
    validation: ``'profile'`` (paper) or ``'exact'`` (oracle mode).
    budget: operation budget standing in for the paper's wall-clock
        timeout; when exhausted the result is flagged ``timed_out``.
    collect: also return the embedding tuples (tests / case study);
        counting-only is the paper's measurement mode.
    """
    if phi is None:
        phi = compute_matching_order(q, store.card)
    plan = compile_plan(q, phi)
    stats: Counter = Counter()
    result = MatchResult(count=0, phi=tuple(phi), stats=stats)
    if collect:
        result.embeddings = []

    n = plan.n_steps
    first = plan.steps[0]
    # SCAN: every hyperedge in the partition S(phi[0]) starts a branch.
    roots = store.scan(first.sig)
    stats["ops"] += len(roots)
    stats["candidates"] += len(roots)
    stats["filtered"] += len(roots)
    stats["validated"] += len(roots)
    if n == 1:
        result.count = len(roots)
        if collect:
            result.embeddings = [(eid,) for eid in roots]
        return result

    stack: list[tuple[int, tuple[int, ...]]] = [(1, (eid,)) for eid in reversed(roots)]
    while stack:
        if budget is not None and stats["ops"] > budget:
            result.timed_out = True
            break
        step_idx, m = stack.pop()
        children = expand_embedding(
            plan, store, step_idx, m, validation=validation, stats=stats
        )
        if step_idx + 1 == n:
            result.count += len(children)
            if collect:
                result.embeddings.extend(children)
        else:
            # LIFO: most recently spawned scheduled first.
            stack.extend((step_idx + 1, child) for child in reversed(children))
    return result


def embeddings_in_query_edge_order(
    result: MatchResult,
) -> set[tuple[int, ...]] | None:
    """Re-align collected embeddings from phi order to query-edge order
    (position k holds the match of query hyperedge k) so counts and
    tuples are comparable across engines with different orders."""
    if result.embeddings is None:
        return None
    inv = {phi_e: i for i, phi_e in enumerate(result.phi)}
    n = len(result.phi)
    return {
        tuple(m[inv[k]] for k in range(n)) for m in result.embeddings
    }

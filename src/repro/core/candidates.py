"""Candidate hyperedge generation via set operations (paper Alg. 4).

Given a partial embedding (the matched data hyperedges of steps
``0..i-1``) and the compiled constants of step ``i``, produce the
candidate data hyperedges for ``phi[i]``:

1. collect ``V_n_incdt``: vertices of matched hyperedges whose query
   hyperedge is *not* adjacent to ``phi[i]`` (Obs. V.3) — set union;
2. for every deduplicated constraint ``(j, label, degree)``: filter the
   matched image of step ``j`` to ``V_incdt`` (label + partial-degree
   + non-incidence check; Obs. V.2-V.4) — set difference/filter, then
   union the posting lists ``he(v, S(phi[i]))`` over ``v in V_incdt``;
3. intersect all the per-constraint unions (Obs. V.1 is implicit: only
   the partition with signature ``S(phi[i])`` is ever touched).

Exactly the paper's difference / union / intersection pipeline, which
the Spark engine mirrors with explode + join + group-by-count.
"""
from __future__ import annotations

from collections import Counter
from typing import Sequence

from repro.core.plan import PlanStep
from repro.hyper.storage import SignatureStore


def generate_candidates(
    step: PlanStep,
    vsets: Sequence[frozenset[int]],
    store: SignatureStore,
    stats: Counter | None = None,
) -> list[int]:
    """Candidates for ``phi[step.i]`` given matched images ``vsets``.

    ``vsets[j]`` is the vertex set of the data hyperedge matched at
    step ``j`` (``j < step.i``). Returns candidate hyperedge ids in
    ascending order. ``stats`` (optional) accrues operation counts used
    for budgets and the scheduler simulator's cost model.
    """
    H = store.H
    ops = 0

    if not step.constraints:
        # Degenerate (only step 0 of a plan, or a disconnected query
        # which compute_matching_order rejects): whole partition.
        out = list(store.scan(step.sig))
        if stats is not None:
            stats["ops"] += len(out)
            stats["candidates"] += len(out)
        return out

    forbidden: set[int] = set()
    for j in step.non_adjacent:
        forbidden |= vsets[j]
        ops += len(vsets[j])

    # Partial-embedding degree d_{H_m}(v) for Obs. V.4.
    deg: Counter = Counter()
    for vs in vsets:
        deg.update(vs)
        ops += len(vs)

    result: set[int] | None = None
    for c in step.constraints:
        union: set[int] = set()
        for v in vsets[c.j]:
            ops += 1
            if v in forbidden:
                continue
            if H.label(v) != c.label or deg[v] != c.degree:
                continue
            post = store.he(v, step.sig)
            union.update(post)
            ops += len(post)
        if result is None:
            result = union
        else:
            result &= union
            ops += min(len(result), len(union))
        if not result:
            break
    assert result is not None
    if stats is not None:
        stats["ops"] += ops
        stats["candidates"] += len(result)
    return sorted(result)

"""Embedding validation (paper Alg. 5, Theorem V.2) + exact oracle.

``is_valid_embedding`` is the paper's backtracking-free check: the
cheap vertex-count test (Obs. V.5) followed by multiset equality of
vertex profiles (Def. V.3) between the newly matched query hyperedge
and the candidate data hyperedge.

Why this is exactly correct (sketch, expanding the paper's proof):
each vertex's profile only changes at steps where it lies in the newly
added hyperedge, so it is re-checked at every step where it changes —
in particular with its *final* profile at its last incidence step. A
counting argument over profile classes ``(label, S)`` with
``i* = max(S)`` shows the per-step multiset equalities determine the
multiset of final profiles on both sides; equal final-profile multisets
admit a within-class bijection, which maps ``phi[j]`` onto ``m[j]``
exactly for every ``j`` — i.e. a valid embedding. Conversely a valid
embedding induces profile-preserving correspondences at every step.
``exact_embedding_exists`` (a small backtracking bijection search) is
kept as an independent oracle; the test suite asserts the two always
agree.
"""
from __future__ import annotations

from collections import Counter
from typing import Sequence

from repro.core.plan import CompiledPlan, PlanStep
from repro.hyper.model import Hypergraph


def data_vertex_profiles(
    step: PlanStep,
    new_vsets: Sequence[frozenset[int]],
    H: Hypergraph,
) -> list[tuple[str, tuple[int, ...]]]:
    """Profiles ``P(v) = (l(v), steps whose matched hyperedge holds v)``
    for each vertex of the newly matched data hyperedge
    (``new_vsets[step.i]``), computed over ``new_vsets[0..i]``."""
    out = []
    for v in new_vsets[step.i]:
        incid = tuple(j for j in range(step.i + 1) if v in new_vsets[j])
        out.append((H.label(v), incid))
    return out


def is_valid_embedding(
    step: PlanStep,
    new_vsets: Sequence[frozenset[int]],
    H: Hypergraph,
    stats: Counter | None = None,
) -> bool:
    """Alg. 5: vertex-count check then profile-multiset equality.

    ``new_vsets`` holds the matched images of steps ``0..step.i``
    (candidate already appended). ``stats`` tracks how many embeddings
    survive each check (Exp-3's 'Filtered' vs 'Embeddings' series).
    """
    nv = len(frozenset().union(*new_vsets))
    if stats is not None:
        stats["ops"] += sum(len(vs) for vs in new_vsets)
    if nv != step.expected_vcount:
        return False
    if stats is not None:
        stats["filtered"] += 1  # passed the Obs. V.5 check
    got = sorted(data_vertex_profiles(step, new_vsets, H))
    if stats is not None:
        stats["ops"] += (step.i + 1) * len(new_vsets[step.i])
    if tuple(got) != step.expected_profiles:
        return False
    if stats is not None:
        stats["validated"] += 1
    return True


def exact_embedding_exists(
    plan: CompiledPlan,
    vsets: Sequence[frozenset[int]],
    H: Hypergraph,
    n_steps: int | None = None,
) -> bool:
    """Oracle: does a label-preserving bijection ``f: V(q') -> V(H_m)``
    with ``f(phi[j]) = m[j]`` (set-wise, all ``j < n_steps``) exist?

    Pure backtracking over query vertices — the thing HGMatch avoids at
    runtime; used in tests and available as a strict validation mode.
    """
    q = plan.q
    k = len(vsets) if n_steps is None else n_steps
    qverts = sorted({u for j in range(k) for u in q.edges[plan.phi[j]]})
    # Domain of u: intersection of matched images of u's incident steps,
    # minus union of matched images of non-incident steps.
    domains: dict[int, set[int]] = {}
    for u in qverts:
        inc = [j for j in range(k) if u in q.edges[plan.phi[j]]]
        dom: set[int] = set.intersection(*(set(vsets[j]) for j in inc))
        for j in range(k):
            if j not in inc:
                dom -= vsets[j]
        domains[u] = {v for v in dom if H.label(v) == q.label(u)}
    order = sorted(qverts, key=lambda u: len(domains[u]))
    used: set[int] = set()

    def rec(idx: int) -> bool:
        if idx == len(order):
            return True
        u = order[idx]
        for v in domains[u]:
            if v in used:
                continue
            used.add(v)
            if rec(idx + 1):
                used.discard(v)
                return True
            used.discard(v)
        return False

    # Vertex-count precondition: bijection needs equal totals.
    if len(qverts) != len(frozenset().union(*vsets[:k]) if k else frozenset()):
        return False
    return rec(0)

"""Execution-plan compilation: per-step constants of Algorithms 4 & 5.

Everything in candidate generation and validation that depends only on
the query hypergraph ``q`` and the matching order ``phi`` — adjacency
relations, partial-query vertex degrees, expected vertex counts and the
query-side vertex-profile multisets — is computed once here, driver
side. Both the sequential engine and the Spark dataflow engine execute
the same :class:`CompiledPlan`, which is also what makes the Spark
EXPAND step expressible as pure Catalyst expressions (all query-side
quantities become literals).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.hyper.model import Hypergraph, Signature


@dataclass(frozen=True)
class Constraint:
    """One intersection term of Alg. 4 (lines 3-6).

    ``f(e_q)`` must be incident to a vertex v drawn from the matched
    image of step ``j`` with label ``label`` and partial-embedding
    degree ``degree`` (Observations V.2-V.4).
    """

    j: int        # index into phi (a previously matched step)
    label: str    # l_q(u)
    degree: int   # d_{q'}(u): #steps j' < i whose hyperedge contains u


@dataclass(frozen=True)
class PlanStep:
    """Constants for matching ``phi[i]``."""

    i: int
    eq: int                       # query hyperedge id phi[i]
    sig: Signature                # S(phi[i]) — the partition to touch
    non_adjacent: tuple[int, ...]  # steps j < i with phi[j] not adjacent to phi[i]
    constraints: tuple[Constraint, ...]
    expected_vcount: int          # |V(q')| after this step (Obs. V.5)
    # Sorted query-side vertex-profile multiset for phi[i]'s vertices:
    # (label, ascending steps j <= i whose hyperedge contains u).
    expected_profiles: tuple[tuple[str, tuple[int, ...]], ...]


@dataclass(frozen=True)
class CompiledPlan:
    q: Hypergraph
    phi: tuple[int, ...]
    steps: tuple[PlanStep, ...]

    @property
    def n_steps(self) -> int:
        return len(self.steps)


def compile_plan(q: Hypergraph, phi: list[int] | tuple[int, ...]) -> CompiledPlan:
    """Compile per-step constants for query ``q`` under order ``phi``."""
    phi = tuple(phi)
    if sorted(phi) != list(range(q.n_edges)):
        raise ValueError(f"phi must be a permutation of 0..{q.n_edges - 1}, got {phi}")
    steps: list[PlanStep] = []
    covered: set[int] = set()
    for i, eq in enumerate(phi):
        e = q.edges[eq]
        non_adj = tuple(
            j for j in range(i) if not (q.edges[phi[j]] & e)
        )
        # Partial-query degree of u over phi[0..i-1].
        deg_qp = {u: sum(1 for j in range(i) if u in q.edges[phi[j]]) for u in e}
        cons: list[Constraint] = []
        seen: set[Constraint] = set()
        for j in range(i):
            shared = q.edges[phi[j]] & e
            for u in sorted(shared):
                c = Constraint(j=j, label=q.label(u), degree=deg_qp[u])
                if c not in seen:  # identical terms give identical sets
                    seen.add(c)
                    cons.append(c)
        new_covered = covered | e
        profiles = tuple(
            sorted(
                (
                    q.label(u),
                    tuple(j for j in range(i + 1) if u in q.edges[phi[j]]),
                )
                for u in e
            )
        )
        steps.append(
            PlanStep(
                i=i,
                eq=eq,
                sig=q.signature(eq),
                non_adjacent=non_adj,
                constraints=tuple(cons),
                expected_vcount=len(new_covered),
                expected_profiles=profiles,
            )
        )
        covered = new_covered
    return CompiledPlan(q=q, phi=phi, steps=tuple(steps))

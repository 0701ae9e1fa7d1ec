"""Exhaustive enumeration oracle for subhypergraph matching.

Semantics reference for every engine in the repo (tests assert all
engines agree with this): an embedding is a tuple assigning to each
query hyperedge a distinct data hyperedge of identical signature such
that a label-preserving bijection ``f : V(q) -> V(H_m)`` exists with
``f(e_qk)`` exactly equal to the matched hyperedge of ``k``. Only
usable on small instances (it enumerates the full signature-compatible
cross product).
"""
from __future__ import annotations

import itertools

from repro.hyper.model import Hypergraph


def _mapping_exists(q: Hypergraph, H: Hypergraph, tup: tuple[int, ...]) -> bool:
    vsets = [H.edges[eid] for eid in tup]
    qverts = sorted({u for e in q.edges for u in e})
    all_data = frozenset().union(*vsets)
    if len(qverts) != len(all_data):
        return False
    domains: dict[int, list[int]] = {}
    for u in qverts:
        inc = [k for k in range(q.n_edges) if u in q.edges[k]]
        dom = set.intersection(*(set(vsets[k]) for k in inc))
        for k in range(q.n_edges):
            if k not in inc:
                dom -= vsets[k]
        domains[u] = [v for v in dom if H.label(v) == q.label(u)]
    order = sorted(qverts, key=lambda u: len(domains[u]))
    used: set[int] = set()

    def rec(i: int) -> bool:
        if i == len(order):
            return True
        for v in domains[order[i]]:
            if v not in used:
                used.add(v)
                if rec(i + 1):
                    used.discard(v)
                    return True
                used.discard(v)
        return False

    return rec(0)


def brute_force(
    H: Hypergraph, q: Hypergraph, *, collect: bool = False
) -> tuple[int, set[tuple[int, ...]] | None]:
    """Count (and optionally collect) all embedding tuples, indexed in
    query-hyperedge order (position k = match of query hyperedge k)."""
    cand_per_edge = [
        [
            eid
            for eid in range(H.n_edges)
            if H.signature(eid) == q.signature(k)
        ]
        for k in range(q.n_edges)
    ]
    found: set[tuple[int, ...]] = set()
    for tup in itertools.product(*cand_per_edge):
        if len(set(tup)) != len(tup):
            continue
        if _mapping_exists(q, H, tup):
            found.add(tup)
    return len(found), (found if collect else None)

"""IHS (incident hyperedge structure) candidate-vertex filter.

Paper Section III-B, reproducing the filter of Ha et al. [30]: a data
vertex ``v`` enters the candidate set of query vertex ``u`` iff

1. label & degree: ``l(u) = l(v)`` and ``d(u) <= d(v)``;
2. adjacency: ``|adj(u)| <= |adj(v)|``;
3. arity containment: ``|he^a(u)| <= |he^a(v)|`` for every arity ``a``;
4. hyperedge labels: for every incident query hyperedge ``e1`` of ``u``
   there is an incident data hyperedge ``e2`` of ``v`` with the same
   arity and identical per-label vertex counts (i.e. identical
   signature). The paper states this condition tersely
   (``exists e1, e2, forall sigma: |e1(sigma)| = |e2(sigma)|``); we
   implement the sound per-query-hyperedge reading, which is the
   strictest version that never prunes a true match: if ``f(u) = v``
   then each ``e1 in he(u)`` maps to some ``e2 in he^{a(e1)}(v)`` with
   ``S(e2) = S(e1)``.
"""
from __future__ import annotations

from repro.hyper.model import Hypergraph


def ihs_candidates(H: Hypergraph, q: Hypergraph, u: int) -> list[int]:
    """Candidate data vertices for query vertex ``u`` under IHS."""
    lu = q.label(u)
    du = q.degree(u)
    adj_u = len(q.adj_vertices[u])
    arity_u = q.he_by_arity(u)
    sigs_u = {q.signature(eid) for eid in q.he[u]}
    out: list[int] = []
    for v in range(H.n_vertices):
        if H.label(v) != lu or H.degree(v) < du:
            continue
        if len(H.adj_vertices[v]) < adj_u:
            continue
        arity_v = H.he_by_arity(v)
        if any(arity_v.get(a, 0) < cnt for a, cnt in arity_u.items()):
            continue
        sigs_v = {H.signature(eid) for eid in H.he[v]}
        if not sigs_u <= sigs_v:
            continue
        out.append(v)
    return out


def label_degree_candidates(H: Hypergraph, q: Hypergraph, u: int) -> list[int]:
    """Plain label+degree candidates (the no-IHS ablation)."""
    lu, du = q.label(u), q.degree(u)
    return [v for v in range(H.n_vertices) if H.label(v) == lu and H.degree(v) >= du]

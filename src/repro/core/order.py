"""Matching-order computation (paper Alg. 3, Section V-A).

Start from the query hyperedge with the smallest data-side cardinality
(Def. V.2: rows in the hyperedge table with the same signature), then
repeatedly append the connected query hyperedge minimising
``Card(e, H) / |V_phi intersect e|`` — i.e. prefer infrequent and
highly-connected hyperedges early. Cardinalities come from partition
metadata, so the whole computation is ``O(|E(q)|^2)`` driver-side work.
"""
from __future__ import annotations

from typing import Callable

from repro.hyper.model import Hypergraph, Signature


def compute_matching_order(
    q: Hypergraph, card: Callable[[Signature], int]
) -> list[int]:
    """Return a permutation of query hyperedge ids (Alg. 3).

    ``card`` maps a signature to its data-side cardinality (typically
    ``SignatureStore.card``). Ties break on smaller hyperedge id for
    determinism. Raises if ``q`` has no hyperedges or is disconnected
    in the hyperedge-adjacency sense (the greedy step requires every
    remaining hyperedge to eventually touch the partial query).
    """
    if q.n_edges == 0:
        raise ValueError("query has no hyperedges")
    cards = [card(q.signature(i)) for i in range(q.n_edges)]
    first = min(range(q.n_edges), key=lambda e: (cards[e], e))
    phi = [first]
    covered: set[int] = set(q.edges[first])
    remaining = set(range(q.n_edges)) - {first}
    while remaining:
        best: tuple[float, int] | None = None
        for e in remaining:
            shared = len(covered & q.edges[e])
            if shared == 0:
                continue
            score = cards[e] / shared
            if best is None or (score, e) < best:
                best = (score, e)
        if best is None:
            raise ValueError(
                "query hypergraph is disconnected; matching order requires "
                "a connected query (paper Section III-A)"
            )
        e = best[1]
        phi.append(e)
        covered |= q.edges[e]
        remaining.remove(e)
    return phi

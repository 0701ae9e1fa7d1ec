"""Matching-order strategies for the match-by-vertex baselines.

The paper extends CFL [9], DAF [31] and CECI [8] through one generic
backtracking framework (Section III-B); the algorithms differ mainly in
how they order query vertices (their auxiliary structures — CPI, CS,
embedding clusters — serve that ordering). We reproduce the ordering
flavour of each on top of the shared framework:

- ``cfl``  — greedy "core-first": start at the vertex minimising
  ``|C(u)| / d(u)`` and repeatedly append the connected vertex with the
  smallest candidate set (postpones Cartesian-product-like leaves);
- ``daf``  — DAG/BFS order from the ``|C(u)|/d(u)``-minimal root,
  level by level, each level sorted by candidate-set size (DAF's
  path-size ordering on the query DAG);
- ``ceci`` — BFS order from the ``|C(u)|``-minimal root, each level
  sorted by higher query degree first (CECI builds a BFS tree and
  matches along it).

All orders are *connected*: every vertex after the first is adjacent to
an earlier one (guaranteed for connected queries).
"""
from __future__ import annotations

from collections import deque
from typing import Mapping, Sequence

from repro.hyper.model import Hypergraph


def _bfs_levels(q: Hypergraph, root: int) -> list[list[int]]:
    seen = {root}
    levels = [[root]]
    cur = deque([root])
    while cur:
        nxt: list[int] = []
        for _ in range(len(cur)):
            u = cur.popleft()
            for w in sorted(q.adj_vertices[u]):
                if w not in seen:
                    seen.add(w)
                    nxt.append(w)
                    cur.append(w)
        if nxt:
            levels.append(nxt)
    return levels


def vertex_order(
    q: Hypergraph, cand_sizes: Mapping[int, int], strategy: str
) -> list[int]:
    """Compute a connected query-vertex order under ``strategy``."""
    n = q.n_vertices
    if n == 0:
        return []

    def ratio(u: int) -> float:
        return cand_sizes[u] / max(1, q.degree(u))

    if strategy == "cfl":
        root = min(range(n), key=lambda u: (ratio(u), u))
        order = [root]
        chosen = {root}
        while len(order) < n:
            frontier = [
                u
                for u in range(n)
                if u not in chosen and q.adj_vertices[u] & chosen
            ]
            if not frontier:
                raise ValueError("query is disconnected")
            u = min(frontier, key=lambda u: (cand_sizes[u], u))
            order.append(u)
            chosen.add(u)
        return order
    if strategy == "daf":
        root = min(range(n), key=lambda u: (ratio(u), u))
        order = []
        for level in _bfs_levels(q, root):
            order.extend(sorted(level, key=lambda u: (cand_sizes[u], u)))
        if len(order) != n:
            raise ValueError("query is disconnected")
        return order
    if strategy == "ceci":
        root = min(range(n), key=lambda u: (cand_sizes[u], u))
        order = []
        for level in _bfs_levels(q, root):
            order.extend(sorted(level, key=lambda u: (-q.degree(u), u)))
        if len(order) != n:
            raise ValueError("query is disconnected")
        return order
    raise ValueError(f"unknown order strategy {strategy!r}")


def validate_connected_order(q: Hypergraph, order: Sequence[int]) -> bool:
    """True iff every vertex after the first touches an earlier one."""
    if sorted(order) != list(range(q.n_vertices)):
        return False
    seen: set[int] = set()
    for i, u in enumerate(order):
        if i > 0 and not (q.adj_vertices[u] & seen):
            return False
        seen.add(u)
    return True

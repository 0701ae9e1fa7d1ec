"""Generic match-by-vertex backtracking framework (paper Alg. 1 + III-B).

The baseline the paper extends from conventional subgraph matching:
recursively map query vertices to data vertices along a matching order,
checking the *subhypergraph matching constraint* (Thm. III.2) — every
query hyperedge that becomes fully mapped must correspond to an
existing data hyperedge — and backtracking otherwise. Hyperedges are
thus used only for (delayed) verification, which is precisely the
inefficiency HGMatch removes.

Candidate sets come from the IHS filter (:mod:`repro.baselines.ihs`)
and enumeration additionally prunes by pairwise hypergraph adjacency
(standard in CFL/DAF/CECI: a new vertex must be adjacent to the matched
images of its matched query neighbours).

Counting convention: results are de-duplicated to embedding *tuples*
(query hyperedge k -> matched data hyperedge), so counts are comparable
with HGMatch; the raw number of vertex mappings is also reported.
"""
from __future__ import annotations

from collections import Counter
from dataclasses import dataclass, field
from typing import Callable

from repro.baselines.ihs import ihs_candidates, label_degree_candidates
from repro.baselines.orders import vertex_order
from repro.hyper.model import Hypergraph


@dataclass
class BacktrackResult:
    tuple_count: int
    mapping_count: int
    order: tuple[int, ...]
    stats: Counter = field(default_factory=Counter)
    timed_out: bool = False
    tuples: set[tuple] | None = None


class _Budget(Exception):
    pass


def match_by_vertex(
    H: Hypergraph,
    q: Hypergraph,
    *,
    strategy: str = "cfl",
    use_ihs: bool = True,
    budget: int | None = None,
    collect: bool = False,
    tuple_extractor: Callable[[dict[int, int]], tuple] | None = None,
) -> BacktrackResult:
    """Enumerate embeddings of ``q`` in ``H`` vertex-by-vertex.

    ``strategy`` selects the CFL/DAF/CECI-flavoured order. ``budget``
    bounds the number of candidate-vertex examinations (the stand-in
    for the paper's 1-hour timeout). ``tuple_extractor`` customises how
    a complete vertex mapping is reduced to a de-duplicated embedding
    tuple (used by the RapidMatch-on-bipartite baseline); the default
    maps every query hyperedge to the data hyperedge id of its image.
    """
    stats: Counter = Counter()
    cand_fn = ihs_candidates if use_ihs else label_degree_candidates
    cands: dict[int, list[int]] = {}
    for u in range(q.n_vertices):
        cands[u] = cand_fn(H, q, u)
        stats["ops"] += H.n_vertices  # filter scans the vertex table
    order = vertex_order(q, {u: len(c) for u, c in cands.items()}, strategy)

    if tuple_extractor is None:

        def tuple_extractor(f: dict[int, int]) -> tuple:
            return tuple(
                H.edge_index[frozenset(f[u] for u in e)] for e in q.edges
            )

    # Per-position constants: query neighbours already matched, and
    # query hyperedges completed exactly when position i is filled.
    pos_of = {u: i for i, u in enumerate(order)}
    matched_neighbors: list[list[int]] = []
    completed_edges: list[list[int]] = []
    for i, u in enumerate(order):
        matched_neighbors.append(
            [w for w in sorted(q.adj_vertices[u]) if pos_of[w] < i]
        )
        completed_edges.append(
            [
                eid
                for eid in q.he[u]
                if all(pos_of[w] <= i for w in q.edges[eid])
            ]
        )

    tuples: set[tuple] = set()
    result = BacktrackResult(0, 0, tuple(order), stats)
    f: dict[int, int] = {}
    used: set[int] = set()

    def rec(i: int) -> None:
        if i == len(order):
            result.mapping_count += 1
            tuples.add(tuple_extractor(f))
            return
        u = order[i]
        for v in cands[u]:
            stats["ops"] += 1
            if budget is not None and stats["ops"] > budget:
                raise _Budget()
            if v in used:
                continue
            # Adjacency prune (GenerateCandidates of Alg. 1).
            if any(v not in H.adj_vertices[f[w]] for w in matched_neighbors[i]):
                continue
            f[u] = v
            # Thm. III.2: verify every newly completed query hyperedge.
            ok = True
            for eid in completed_edges[i]:
                stats["ops"] += q.arity(eid)
                if frozenset(f[w] for w in q.edges[eid]) not in H.edge_set:
                    ok = False
                    break
            if ok:
                used.add(v)
                rec(i + 1)
                used.discard(v)
            del f[u]

    try:
        rec(0)
    except _Budget:
        result.timed_out = True
    result.tuple_count = len(tuples)
    if collect:
        result.tuples = tuples
    return result

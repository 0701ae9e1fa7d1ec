"""Random-walk query sampler (paper Section VII-A, Table III).

Queries are connected subhypergraphs sampled from the data hypergraph
by a random walk over hyperedge adjacency, so every sampled query has
at least one embedding in its data hypergraph (itself). A query setting
fixes the number of hyperedges ``|E|`` and a vertex-count window
``[|V|_min, |V|_max]``; sampling retries until the window is met or
``max_tries`` is exhausted (then the closest miss is returned, flagged).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.hyper.model import Hypergraph


@dataclass(frozen=True)
class QuerySetting:
    """One row of Table III."""

    name: str
    n_edges: int
    v_min: int
    v_max: int


# Paper Table III, verbatim.
TABLE3_SETTINGS: tuple[QuerySetting, ...] = (
    QuerySetting("q2", 2, 5, 15),
    QuerySetting("q3", 3, 10, 20),
    QuerySetting("q4", 4, 10, 30),
    QuerySetting("q6", 6, 15, 35),
)


@dataclass(frozen=True)
class SampledQuery:
    """A sampled query plus its provenance in the data hypergraph."""

    query: Hypergraph
    source_eids: tuple[int, ...]  # data hyperedges the walk visited
    in_window: bool               # |V| landed inside [v_min, v_max]


def sample_query(
    H: Hypergraph,
    setting: QuerySetting,
    *,
    seed: int = 0,
    max_tries: int = 200,
) -> SampledQuery:
    """Random-walk a connected set of ``setting.n_edges`` hyperedges.

    The walk starts at a random hyperedge and repeatedly moves to a
    random hyperedge adjacent to the already-collected set (frontier
    expansion), which is the standard way to sample connected
    subhypergraphs. Falls back to the attempt whose vertex count is
    closest to the window when no attempt lands inside it.
    """
    if H.n_edges == 0:
        raise ValueError("cannot sample queries from an empty hypergraph")
    g = np.random.default_rng(seed)
    best: tuple[int, tuple[int, ...]] | None = None  # (distance, eids)
    for _ in range(max_tries):
        start = int(g.integers(H.n_edges))
        chosen: list[int] = [start]
        chosen_set = {start}
        frontier = set(H.adj_edges(start))
        while len(chosen) < setting.n_edges and frontier:
            nxt = int(g.choice(sorted(frontier)))
            chosen.append(nxt)
            chosen_set.add(nxt)
            frontier |= set(H.adj_edges(nxt))
            frontier -= chosen_set
        if len(chosen) < setting.n_edges:
            continue  # walk got stuck in a small component
        nv = len({v for eid in chosen for v in H.edges[eid]})
        if setting.v_min <= nv <= setting.v_max:
            q, _ = H.subhypergraph(chosen)
            return SampledQuery(q, tuple(chosen), True)
        dist = max(setting.v_min - nv, nv - setting.v_max)
        if best is None or dist < best[0]:
            best = (dist, tuple(chosen))
    if best is None:
        raise ValueError(
            f"hypergraph has no connected subhypergraph with {setting.n_edges} hyperedges"
        )
    q, _ = H.subhypergraph(list(best[1]))
    return SampledQuery(q, best[1], False)


def sample_queries(
    H: Hypergraph,
    setting: QuerySetting,
    k: int,
    *,
    seed: int = 0,
    max_tries: int = 200,
) -> list[SampledQuery]:
    """``k`` independent samples (paper uses 20 per setting)."""
    return [
        sample_query(H, setting, seed=seed * 10_007 + i, max_tries=max_tries)
        for i in range(k)
    ]

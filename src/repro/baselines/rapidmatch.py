"""RapidMatch baseline: matching on the bipartite conversion.

Paper Section VII-A: "since RapidMatch uses join-based techniques which
cannot be fitted in our generic backtracking framework, we directly
convert the query and data hypergraph to bipartite graphs in
RapidMatch". We reproduce exactly that code path: both hypergraphs are
converted with :func:`repro.hyper.bipartite.to_bipartite` (hyperedge
nodes labelled by signature, incidences as binary edges), and matching
runs on the inflated conventional graph. The dominant compared effect —
the bipartite inflation penalty (Section I) — is preserved; the WCO
join internals of RapidMatch are substituted by the shared
match-by-vertex engine (see DESIGN.md substitution #4).

Results are de-duplicated to original-hyperedge tuples via the query
edge-node assignments, so counts are comparable with all other engines.
"""
from __future__ import annotations

from repro.baselines.backtrack import BacktrackResult, match_by_vertex
from repro.hyper.bipartite import to_bipartite
from repro.hyper.model import Hypergraph


def rapidmatch(
    H: Hypergraph,
    q: Hypergraph,
    *,
    budget: int | None = None,
    collect: bool = False,
) -> BacktrackResult:
    """Match ``q`` in ``H`` through bipartite conversion."""
    BH = to_bipartite(H)
    Bq = to_bipartite(q)

    def extract(f: dict[int, int]) -> tuple:
        # Query edge-node for original query hyperedge k maps to a data
        # edge-node; translate back to the original data hyperedge id.
        return tuple(
            BH.original_eid(f[Bq.edge_node_of[k]]) for k in range(q.n_edges)
        )

    return match_by_vertex(
        BH.graph,
        Bq.graph,
        strategy="cfl",
        use_ihs=True,
        budget=budget,
        collect=collect,
        tuple_extractor=extract,
    )

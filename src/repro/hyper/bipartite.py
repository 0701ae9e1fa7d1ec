"""Hypergraph -> bipartite conversion (paper Section I, Fig. 2).

The strawman approach the paper compares against (and the path its
RapidMatch baseline takes): every hyperedge becomes an *edge-node*
whose label encodes the hyperedge's signature, every original vertex
stays a *vertex-node* with its own label, and each incidence becomes a
conventional (arity-2) edge between the two.

We encode the converted graph as a :class:`~repro.hyper.model.Hypergraph`
whose hyperedges all have arity 2 — conventional graphs are exactly the
arity-2 special case, so the match-by-vertex baseline runs on the
conversion unchanged. Labelling edge-nodes with the full signature
preserves matching semantics: a query edge-node can only map to a data
edge-node of identical signature (same arity + label multiset), and the
incidence edges then force the data hyperedge to be exactly the image
of the query hyperedge.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.hyper.model import Hypergraph


@dataclass(frozen=True)
class BipartiteGraph:
    """Converted graph plus the bookkeeping to map results back."""

    graph: Hypergraph               # arity-2 hypergraph (= conventional graph)
    edge_node_of: tuple[int, ...]   # original eid -> converted vertex id
    n_original_vertices: int

    @property
    def n_nodes(self) -> int:
        return self.graph.n_vertices

    @property
    def n_binary_edges(self) -> int:
        return self.graph.n_edges

    def original_eid(self, node: int) -> int:
        """Converted edge-node id -> original hyperedge id."""
        return node - self.n_original_vertices


def to_bipartite(H: Hypergraph) -> BipartiteGraph:
    """Convert ``H`` to its bipartite incidence graph.

    Vertex-nodes keep ids ``0..|V|-1`` and labels; edge-node for
    hyperedge ``e`` gets id ``|V| + eid`` and label ``"E|" + S(e)``.
    """
    labels = list(H.labels)
    edge_node_of = []
    for eid in range(H.n_edges):
        edge_node_of.append(len(labels))
        labels.append("E|" + ",".join(H.signature(eid)))
    edges: list[list[int]] = []
    for eid, e in enumerate(H.edges):
        en = edge_node_of[eid]
        for v in sorted(e):
            edges.append([v, en])
    return BipartiteGraph(
        graph=Hypergraph(labels, edges),
        edge_node_of=tuple(edge_node_of),
        n_original_vertices=H.n_vertices,
    )

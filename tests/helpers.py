"""Shared test fixtures/builders for the HGMatch reproduction suite."""
from __future__ import annotations

from repro.hyper.generator import random_hypergraph
from repro.hyper.model import Hypergraph
from repro.hyper.queries import QuerySetting, sample_query
from repro.hyper.storage import SignatureStore


def small_instance(seed: int, *, n_edges_q: int = 3, v_min: int = 2, v_max: int = 12):
    """A small random (H, store, q) triple suitable for brute force.

    Returns None when the sampled query is disconnected (rare; vertex
    connectivity via shared hyperedges is what matters).
    """
    H = random_hypergraph(
        n_vertices=14,
        n_edges=18,
        n_labels=3,
        mean_arity=2.8,
        max_arity=5,
        seed=seed,
    )
    try:
        sq = sample_query(
            H, QuerySetting("t", n_edges_q, v_min, v_max), seed=seed
        )
    except ValueError:
        return None
    if not sq.query.is_connected():
        return None
    return H, SignatureStore(H), sq.query


def triangle_hypergraph() -> Hypergraph:
    """Three arity-2 hyperedges forming a labelled triangle."""
    return Hypergraph(["A", "A", "A"], [[0, 1], [1, 2], [0, 2]])

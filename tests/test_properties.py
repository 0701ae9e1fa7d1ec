"""Property-based tests (hypothesis) over random hypergraphs.

These complement the seeded cross-validation tests with
adversarially-shrunk instances: profile validation vs the exact
bijection oracle, storage invariants, and scheduler conservation.
"""
from hypothesis import given, settings, strategies as st

from repro.baselines.bruteforce import brute_force
from repro.core.local_engine import embeddings_in_query_edge_order, hgmatch
from repro.core.order import compute_matching_order
from repro.core.plan import compile_plan
from repro.engine.scheduler import simulate_workstealing
from repro.engine.tasks import HGMatchTaskExecutor
from repro.hyper.model import Hypergraph
from repro.hyper.storage import SignatureStore


@st.composite
def small_hypergraphs(draw):
    """Tiny labelled hypergraphs with 2-4 labels and arity <= 4."""
    n = draw(st.integers(4, 9))
    labels = [draw(st.sampled_from("AB")) for _ in range(n)]
    n_edges = draw(st.integers(2, 7))
    edges: list[frozenset[int]] = []
    seen = set()
    for _ in range(n_edges):
        a = draw(st.integers(1, min(4, n)))
        e = frozenset(
            draw(
                st.lists(
                    st.integers(0, n - 1), min_size=a, max_size=a, unique=True
                )
            )
        )
        if e and e not in seen:
            seen.add(e)
            edges.append(e)
    return Hypergraph(labels, edges) if edges else Hypergraph(labels, [[0]])


def connected_query_from(H: Hypergraph, k: int) -> Hypergraph | None:
    """Deterministically grab a connected k-edge subhypergraph."""
    chosen = [0]
    frontier = set(H.adj_edges(0))
    while len(chosen) < k and frontier:
        nxt = min(frontier)
        chosen.append(nxt)
        frontier |= set(H.adj_edges(nxt))
        frontier -= set(chosen)
    if len(chosen) < k:
        return None
    q, _ = H.subhypergraph(chosen)
    return q if q.is_connected() else None


@settings(max_examples=60, deadline=None)
@given(small_hypergraphs(), st.integers(1, 3))
def test_hgmatch_agrees_with_brute_force(H, k):
    q = connected_query_from(H, min(k, H.n_edges))
    if q is None:
        return
    store = SignatureStore(H)
    bf, bft = brute_force(H, q, collect=True)
    r = hgmatch(H, store, q, collect=True)
    assert r.count == bf
    assert embeddings_in_query_edge_order(r) == bft


@settings(max_examples=60, deadline=None)
@given(small_hypergraphs())
def test_storage_invariants(H):
    store = SignatureStore(H)
    # Partitions exactly cover the edges, grouped by signature.
    covered = sorted(e for p in store.partitions.values() for e in p)
    assert covered == list(range(H.n_edges))
    for sig, part in store.partitions.items():
        assert all(H.signature(e) == sig for e in part)
    # Posting totals equal incidence totals.
    postings = sum(
        len(p) for inv in store.inverted.values() for p in inv.values()
    )
    assert postings == sum(H.arity(e) for e in range(H.n_edges))


@settings(max_examples=40, deadline=None)
@given(small_hypergraphs(), st.integers(2, 3), st.integers(1, 6))
def test_scheduler_conserves_embeddings(H, k, p):
    q = connected_query_from(H, min(k, H.n_edges))
    if q is None:
        return
    store = SignatureStore(H)
    plan = compile_plan(q, compute_matching_order(q, store.card))
    expected = hgmatch(H, store, q).count
    sim = simulate_workstealing(HGMatchTaskExecutor(plan, store), p)
    assert sim.emitted == expected


@settings(max_examples=40, deadline=None)
@given(small_hypergraphs())
def test_signature_is_label_multiset(H):
    for e in range(H.n_edges):
        sig = H.signature(e)
        assert list(sig) == sorted(sig)
        assert sorted(sig) == sorted(H.label(v) for v in H.edges[e])

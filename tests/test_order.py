"""Tests for the matching-order computation (paper Alg. 3)."""
import pytest

from tests.helpers import small_instance
from repro.core.order import compute_matching_order
from repro.hyper.model import Hypergraph, fig1_data, fig1_query
from repro.hyper.storage import SignatureStore


def cards_of(H):
    return SignatureStore(H).card


class TestAlg3:
    def test_fig1_order_valid(self):
        H, q = fig1_data(), fig1_query()
        phi = compute_matching_order(q, cards_of(H))
        assert sorted(phi) == [0, 1, 2]

    def test_starts_with_min_cardinality(self):
        H, q = fig1_data(), fig1_query()
        store = SignatureStore(H)
        phi = compute_matching_order(q, store.card)
        first_card = store.card(q.signature(phi[0]))
        assert first_card == min(
            store.card(q.signature(e)) for e in range(q.n_edges)
        )

    def test_connected_prefixes(self):
        for seed in range(10):
            inst = small_instance(seed, n_edges_q=4, v_max=20)
            if inst is None:
                continue
            H, store, q = inst
            phi = compute_matching_order(q, store.card)
            covered = set(q.edges[phi[0]])
            for e in phi[1:]:
                assert covered & q.edges[e], "order must stay connected"
                covered |= q.edges[e]

    def test_permutation(self):
        for seed in range(10):
            inst = small_instance(seed, n_edges_q=3)
            if inst is None:
                continue
            _, store, q = inst
            phi = compute_matching_order(q, store.card)
            assert sorted(phi) == list(range(q.n_edges))

    def test_greedy_ratio_respected_at_step_two(self):
        # Construct a query where the ratio rule is discriminative:
        # e0 (card 1) first; then e2 shares 2 vertices (card 4 / 2 = 2)
        # beats e1 sharing 1 vertex (card 4 / 1 = 4).
        q = Hypergraph(
            ["A", "A", "A", "B", "B"],
            [[0, 1, 2], [2, 3], [0, 1, 4]],
        )

        def card(sig):
            return 1 if sig == ("A", "A", "A") else 4

        phi = compute_matching_order(q, card)
        assert phi == [0, 2, 1]

    def test_empty_query_rejected(self):
        with pytest.raises(ValueError):
            compute_matching_order(Hypergraph(["A"], []), lambda s: 0)

    def test_disconnected_query_rejected(self):
        q = Hypergraph(["A", "A", "A", "A"], [[0, 1], [2, 3]])
        with pytest.raises(ValueError, match="disconnected"):
            compute_matching_order(q, lambda s: 1)

    def test_single_edge_query(self):
        q = Hypergraph(["A", "B"], [[0, 1]])
        assert compute_matching_order(q, lambda s: 5) == [0]

    def test_deterministic_tiebreak(self):
        q = Hypergraph(["A", "A", "A"], [[0, 1], [1, 2]])
        phi1 = compute_matching_order(q, lambda s: 3)
        phi2 = compute_matching_order(q, lambda s: 3)
        assert phi1 == phi2 == [0, 1]

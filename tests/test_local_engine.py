"""Tests for the sequential match-by-hyperedge engine (paper Alg. 2),
including the cross-engine agreement matrix on random instances."""
import pytest

from tests.helpers import small_instance, triangle_hypergraph
from repro.baselines.bruteforce import brute_force
from repro.core.local_engine import (
    embeddings_in_query_edge_order,
    hgmatch,
)
from repro.hyper.model import Hypergraph, fig1_data, fig1_query
from repro.hyper.storage import SignatureStore


@pytest.fixture(scope="module")
def fig1():
    H, q = fig1_data(), fig1_query()
    return H, SignatureStore(H), q


class TestFig1:
    def test_count_is_two(self, fig1):
        H, store, q = fig1
        assert hgmatch(H, store, q).count == 2

    def test_embeddings_match_paper(self, fig1):
        H, store, q = fig1
        r = hgmatch(H, store, q, collect=True)
        # Example III.1: (e1, e3, e5) and (e2, e4, e6), ids 0-based.
        assert embeddings_in_query_edge_order(r) == {(0, 2, 4), (1, 3, 5)}

    def test_explicit_phi_same_count(self, fig1):
        H, store, q = fig1
        for phi in ([0, 1, 2], [1, 0, 2], [2, 1, 0], [2, 0, 1]):
            assert hgmatch(H, store, q, phi=phi).count == 2

    def test_exact_validation_same_count(self, fig1):
        H, store, q = fig1
        assert hgmatch(H, store, q, validation="exact").count == 2

    def test_stats_funnel_monotone(self, fig1):
        H, store, q = fig1
        s = hgmatch(H, store, q).stats
        assert s["candidates"] >= s["filtered"] >= s["validated"] >= 2


class TestSpecialCases:
    def test_single_edge_query(self, fig1):
        H, store, _ = fig1
        q = Hypergraph(["A", "C"], [[0, 1]])
        r = hgmatch(H, store, q, collect=True)
        assert r.count == 2  # e1 and e2 have signature {A, C}
        assert r.embeddings == [(0,), (1,)]

    def test_no_match_signature_absent(self, fig1):
        H, store, _ = fig1
        q = Hypergraph(["C", "C"], [[0, 1]])
        assert hgmatch(H, store, q).count == 0

    def test_triangle_automorphisms(self):
        H = triangle_hypergraph()
        store = SignatureStore(H)
        r = hgmatch(H, store, H)
        # 3 edges, all same signature: 3! alignments of the triangle
        # onto itself = 6 embedding tuples.
        assert r.count == 6

    def test_budget_timeout_flagged(self):
        inst = small_instance(0)
        assert inst is not None
        H, store, q = inst
        r = hgmatch(H, store, q, budget=1)
        assert r.timed_out

    def test_unknown_validation_mode(self, fig1):
        H, store, q = fig1
        with pytest.raises(ValueError):
            hgmatch(H, store, q, validation="wat")

    def test_collect_matches_count(self):
        inst = small_instance(3)
        assert inst is not None
        H, store, q = inst
        r = hgmatch(H, store, q, collect=True)
        assert len(r.embeddings) == r.count


class TestCrossValidation:
    """HGMatch (profile and exact modes) vs brute force, many seeds."""

    @pytest.mark.parametrize("seed", range(20))
    def test_q3_instances(self, seed):
        inst = small_instance(seed, n_edges_q=3)
        if inst is None:
            pytest.skip("sampler could not build a connected query")
        H, store, q = inst
        bf, bft = brute_force(H, q, collect=True)
        r = hgmatch(H, store, q, collect=True)
        assert r.count == bf
        assert embeddings_in_query_edge_order(r) == bft
        assert hgmatch(H, store, q, validation="exact").count == bf

    @pytest.mark.parametrize("seed", range(10))
    def test_q2_instances(self, seed):
        inst = small_instance(seed, n_edges_q=2)
        if inst is None:
            pytest.skip("sampler could not build a connected query")
        H, store, q = inst
        bf, _ = brute_force(H, q)
        assert hgmatch(H, store, q).count == bf

    @pytest.mark.parametrize("seed", [0, 2, 4])
    def test_q4_instances(self, seed):
        inst = small_instance(seed, n_edges_q=4, v_max=14)
        if inst is None:
            pytest.skip("sampler could not build a connected query")
        H, store, q = inst
        bf, _ = brute_force(H, q)
        assert hgmatch(H, store, q).count == bf

    def test_order_invariance(self):
        """The embedding count must not depend on the matching order."""
        import itertools

        inst = small_instance(1, n_edges_q=3)
        assert inst is not None
        H, store, q = inst
        counts = set()
        for phi in itertools.permutations(range(q.n_edges)):
            covered = set(q.edges[phi[0]])
            ok = True
            for e in phi[1:]:
                if not (covered & q.edges[e]):
                    ok = False
                    break
                covered |= q.edges[e]
            if ok:  # only connected orders are executable
                counts.add(hgmatch(H, store, q, phi=list(phi)).count)
        assert len(counts) == 1

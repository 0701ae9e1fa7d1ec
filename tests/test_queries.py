"""Tests for the random-walk query sampler (Table III protocol)."""
import pytest

from repro.baselines.bruteforce import brute_force
from repro.experiments.datasets import make_dataset
from repro.hyper.model import Hypergraph
from repro.hyper.queries import (
    TABLE3_SETTINGS,
    QuerySetting,
    sample_queries,
    sample_query,
)


@pytest.fixture(scope="module")
def H():
    return make_dataset("WT", scale=0.3, seed=0)


class TestSettings:
    def test_table3_verbatim(self):
        rows = {(s.name, s.n_edges, s.v_min, s.v_max) for s in TABLE3_SETTINGS}
        assert rows == {
            ("q2", 2, 5, 15),
            ("q3", 3, 10, 20),
            ("q4", 4, 10, 30),
            ("q6", 6, 15, 35),
        }


class TestSampling:
    def test_edge_count_exact(self, H):
        sq = sample_query(H, QuerySetting("t", 3, 2, 30), seed=1)
        assert sq.query.n_edges == 3

    def test_query_connected(self, H):
        for i in range(8):
            sq = sample_query(H, QuerySetting("t", 3, 2, 30), seed=i)
            assert sq.query.is_connected()

    def test_source_eids_are_connected_in_data(self, H):
        sq = sample_query(H, QuerySetting("t", 4, 2, 40), seed=2)
        assert len(sq.source_eids) == 4
        assert len(set(sq.source_eids)) == 4

    def test_window_respected_when_flagged(self, H):
        sq = sample_query(H, QuerySetting("t", 2, 2, 20), seed=3)
        if sq.in_window:
            assert 2 <= sq.query.n_vertices <= 20

    def test_at_least_one_embedding_exists(self):
        # The sampled subhypergraph itself embeds into the data graph.
        H = make_dataset("CH", scale=0.3, seed=1)
        sq = sample_query(H, QuerySetting("t", 2, 2, 10), seed=4)
        count, _ = brute_force(H, sq.query)
        assert count >= 1

    def test_deterministic(self, H):
        a = sample_query(H, QuerySetting("t", 3, 2, 30), seed=5)
        b = sample_query(H, QuerySetting("t", 3, 2, 30), seed=5)
        assert a.source_eids == b.source_eids

    def test_sample_queries_k(self, H):
        qs = sample_queries(H, QuerySetting("t", 2, 2, 30), 5, seed=0)
        assert len(qs) == 5

    def test_empty_hypergraph_rejected(self):
        with pytest.raises(ValueError):
            sample_query(Hypergraph(["A"], []), QuerySetting("t", 1, 1, 5))

    def test_impossible_edge_count_rejected(self):
        H = Hypergraph(["A", "B"], [[0, 1]])
        with pytest.raises(ValueError):
            sample_query(H, QuerySetting("t", 3, 1, 10), max_tries=5)

    def test_out_of_window_flagged_not_crashed(self):
        # A tiny graph whose only 2-edge subhypergraphs have few
        # vertices: the sampler returns the closest miss, flagged.
        H = Hypergraph(["A", "A", "A"], [[0, 1], [1, 2]])
        sq = sample_query(H, QuerySetting("t", 2, 10, 20), max_tries=10)
        assert not sq.in_window
        assert sq.query.n_edges == 2

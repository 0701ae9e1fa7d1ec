"""Tests for the synthetic hypergraph generator and dataset catalog."""
import pytest

from repro.experiments.datasets import CATALOG, DATASET_ORDER, make_dataset
from repro.hyper.generator import random_hypergraph


class TestRandomHypergraph:
    def test_deterministic_in_seed(self):
        a = random_hypergraph(
            n_vertices=30, n_edges=40, n_labels=4, mean_arity=3, max_arity=6, seed=1
        )
        b = random_hypergraph(
            n_vertices=30, n_edges=40, n_labels=4, mean_arity=3, max_arity=6, seed=1
        )
        assert a.labels == b.labels
        assert a.edges == b.edges

    def test_different_seeds_differ(self):
        a = random_hypergraph(
            n_vertices=30, n_edges=40, n_labels=4, mean_arity=3, max_arity=6, seed=1
        )
        b = random_hypergraph(
            n_vertices=30, n_edges=40, n_labels=4, mean_arity=3, max_arity=6, seed=2
        )
        assert a.edges != b.edges

    def test_no_duplicate_edges(self):
        H = random_hypergraph(
            n_vertices=15, n_edges=100, n_labels=2, mean_arity=2, max_arity=3, seed=3
        )
        assert len(set(H.edges)) == H.n_edges

    def test_arity_bounds(self):
        H = random_hypergraph(
            n_vertices=50, n_edges=80, n_labels=3, mean_arity=4, max_arity=7, seed=4
        )
        assert all(1 <= H.arity(e) <= 7 for e in range(H.n_edges))

    def test_mean_arity_tracks_target(self):
        H = random_hypergraph(
            n_vertices=500, n_edges=400, n_labels=3, mean_arity=8, max_arity=40, seed=5
        )
        assert 5 <= H.avg_arity <= 11

    def test_label_vocabulary_respected(self):
        H = random_hypergraph(
            n_vertices=100, n_edges=50, n_labels=5, mean_arity=3, max_arity=5, seed=6
        )
        assert set(H.labels) <= {f"L{i}" for i in range(5)}

    def test_max_arity_clamped_to_vertices(self):
        H = random_hypergraph(
            n_vertices=4, n_edges=10, n_labels=2, mean_arity=6, max_arity=50, seed=7
        )
        assert H.max_arity <= 4

    def test_invalid_params_rejected(self):
        with pytest.raises(ValueError):
            random_hypergraph(
                n_vertices=0, n_edges=5, n_labels=1, mean_arity=2, max_arity=3
            )

    def test_power_law_participation(self):
        # Zipf membership: the busiest vertex should far exceed the median.
        H = random_hypergraph(
            n_vertices=200,
            n_edges=400,
            n_labels=2,
            mean_arity=4,
            max_arity=10,
            vertex_alpha=1.0,
            seed=8,
        )
        degs = sorted((H.degree(v) for v in range(H.n_vertices)), reverse=True)
        assert degs[0] >= 5 * max(1, degs[len(degs) // 2])


class TestCatalog:
    def test_catalog_has_ten_datasets(self):
        assert len(CATALOG) == 10
        assert set(DATASET_ORDER) == set(CATALOG)

    @pytest.mark.parametrize("name", DATASET_ORDER)
    def test_scaled_down_instantiation(self, name):
        H = make_dataset(name, scale=0.05, seed=1)
        assert H.n_edges >= 4
        assert H.max_arity <= CATALOG[name].max_arity

    @pytest.mark.parametrize("name", ["HC", "SB", "WT"])
    def test_deterministic(self, name):
        a = make_dataset(name, scale=0.1)
        b = make_dataset(name, scale=0.1)
        assert a.edges == b.edges

    def test_mean_arity_shape_preserved(self):
        # High-arity datasets must stay high-arity at benchmark scale —
        # that is the property Exp-2's speedups depend on.
        hc = make_dataset("HC", scale=1.0)
        ch = make_dataset("CH", scale=1.0)
        assert hc.avg_arity > 4 * ch.avg_arity

    def test_paper_stats_recorded(self):
        p = CATALOG["AR"].paper
        assert p.n_edges == 4_239_108
        assert p.avg_arity == 17.1

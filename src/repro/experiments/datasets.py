"""Table II dataset catalog — calibrated synthetic stand-ins.

The paper's 10 real hypergraphs (Benson repository) are unavailable
offline, so each catalog entry configures
:func:`repro.hyper.generator.random_hypergraph` to match the dataset's
*shape*: label-vocabulary size, mean arity, arity skew (``a_max``) and
power-law vertex participation — at a reduced scale (the paper's
numbers are kept alongside for the EXPERIMENTS.md diff; SA and AR are
scaled down ~300-1000x, small datasets much less). Effects the paper
measures (match-by-hyperedge wins most on high-``bar a`` datasets;
signature partitioning prunes candidate scans; skew causes load
imbalance) depend on these shapes, not on absolute sizes.

``scale`` further multiplies vertex/edge counts: unit tests use
``scale<=0.2`` (SF=0.01-ish), benches use ``scale=1.0`` (SF=0.1-ish).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.hyper.generator import random_hypergraph
from repro.hyper.model import Hypergraph


@dataclass(frozen=True)
class PaperStats:
    """The real dataset's row in the paper's Table II."""

    n_vertices: int
    n_edges: int
    n_labels: int
    max_arity: int
    avg_arity: float
    index_size: str  # as printed in the paper


@dataclass(frozen=True)
class DatasetSpec:
    """Generator configuration for the synthetic stand-in (scale=1)."""

    name: str
    full_name: str
    n_vertices: int
    n_edges: int
    n_labels: int
    mean_arity: float
    max_arity: int
    vertex_alpha: float
    paper: PaperStats


CATALOG: dict[str, DatasetSpec] = {
    s.name: s
    for s in (
        DatasetSpec("HC", "house-committees", 1290, 331, 2, 34.8, 81, 0.6,
                    PaperStats(1290, 331, 2, 81, 34.8, "178KB")),
        DatasetSpec("MA", "mathoverflow-answers", 7400, 550, 150, 24.2, 180, 0.8,
                    PaperStats(73851, 5444, 1456, 1784, 24.2, "2.1MB")),
        DatasetSpec("CH", "contact-high-school", 327, 2000, 9, 2.3, 5, 0.7,
                    PaperStats(327, 7818, 9, 5, 2.3, "109KB")),
        DatasetSpec("CP", "contact-primary-school", 242, 2500, 11, 2.4, 5, 0.7,
                    PaperStats(242, 12704, 11, 5, 2.4, "190KB")),
        DatasetSpec("SB", "senate-bills", 294, 2500, 2, 8.0, 40, 0.9,
                    PaperStats(294, 20584, 2, 99, 8.0, "2.1MB")),
        DatasetSpec("HB", "house-bills", 1494, 3000, 2, 20.5, 120, 0.9,
                    PaperStats(1494, 52960, 2, 399, 20.5, "15.5MB")),
        DatasetSpec("WT", "walmart-trips", 4400, 3200, 11, 6.6, 25, 0.8,
                    PaperStats(88860, 65507, 11, 25, 6.6, "6.8MB")),
        DatasetSpec("TC", "trivago-clicks", 3500, 4200, 160, 4.1, 40, 0.8,
                    PaperStats(172738, 212483, 160, 85, 4.1, "7.8MB")),
        DatasetSpec("SA", "stackoverflow-answers", 20000, 3700, 800, 23.7, 200, 1.0,
                    PaperStats(15_211_989, 1_103_193, 56502, 61315, 23.7, "419.7MB")),
        DatasetSpec("AR", "amazon-reviews", 8000, 6000, 29, 17.1, 300, 1.0,
                    PaperStats(2_268_264, 4_239_108, 29, 9350, 17.1, "998.6MB")),
    )
}

# Order used throughout the paper's tables.
DATASET_ORDER = ("HC", "MA", "CH", "CP", "SB", "HB", "WT", "TC", "SA", "AR")
# Table IV / single-thread comparisons exclude AR (paper: baselines fail
# on almost all AR queries; AR is reserved for the parallel evaluation).
SINGLE_THREAD_DATASETS = DATASET_ORDER[:-1]


def make_dataset(name: str, *, scale: float = 1.0, seed: int = 0) -> Hypergraph:
    """Instantiate a catalog dataset at ``scale`` (deterministic)."""
    spec = CATALOG[name]
    # Stable per-dataset seed offset (hash() is salted per process).
    name_tag = sum(ord(c) * 131**i for i, c in enumerate(name)) % 10_000
    return random_hypergraph(
        n_vertices=max(8, int(spec.n_vertices * scale)),
        n_edges=max(4, int(spec.n_edges * scale)),
        n_labels=max(1, min(spec.n_labels, int(spec.n_vertices * scale))),
        mean_arity=spec.mean_arity,
        max_arity=spec.max_arity,
        vertex_alpha=spec.vertex_alpha,
        seed=seed + name_tag,
    )

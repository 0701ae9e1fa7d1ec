"""Hypergraph substrate: model, storage, index, generators, conversion.

Everything the paper depends on below the matching algorithm itself:
the labelled-hypergraph data model (Section III-A), the signature-
partitioned hyperedge tables and inverted hyperedge index (Section IV),
synthetic data/query generators (Section VII-A), and the bipartite
conversion used by the RapidMatch baseline (Sections I and VII-A).
"""
from repro.hyper.model import Hypergraph  # noqa: F401
from repro.hyper.storage import SignatureStore  # noqa: F401

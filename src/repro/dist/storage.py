"""Spark-side hypergraph storage (Sections IV-B/IV-C as DataFrames).

Three relations mirror the paper's indexed data hypergraph:

- ``edges(eid, sig, vs, ls)`` — the hyperedge tables, one logical
  partition per signature (``sig`` is the canonical string encoding of
  the label multiset); ``vs`` holds the member vertex ids ascending and
  ``ls`` their labels, aligned by position;
- ``index(sig, v, eid)`` — the inverted hyperedge index: the posting
  list of ``he(v, s)`` is the ``eid`` set for a ``(sig, v)`` pair;
- ``labels(v, label)`` — the vertex-label relation.

The incidence relation ``incidence(eid, v)`` is also exposed because
the DuckDB oracle verifies index construction and dataset statistics
against plain SQL over it.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.hyper.model import Hypergraph, Signature

SIG_SEP = ","


def sig_str(sig: Signature) -> str:
    """Canonical string form of a signature multiset."""
    return SIG_SEP.join(sig)


@dataclass
class SparkHypergraph:
    """The indexed data hypergraph as Spark relations."""

    edges: DataFrame    # eid: long, sig: string, vs: array<long>, ls: array<string>
    index: DataFrame    # sig: string, v: long, eid: long
    labels: DataFrame   # v: long, label: string
    n_vertices: int
    n_edges: int

    def cardinalities(self) -> dict[str, int]:
        """``sig -> Card`` from partition metadata (Def. V.2)."""
        rows = self.edges.groupBy("sig").count().collect()
        return {r["sig"]: r["count"] for r in rows}


def hypergraph_frames(H: Hypergraph) -> dict[str, pd.DataFrame]:
    """Pandas relations for ``H`` (shared by Spark and the oracle)."""
    edges = pd.DataFrame(
        {
            "eid": range(H.n_edges),
            "sig": [sig_str(H.signature(e)) for e in range(H.n_edges)],
            "vs": [sorted(H.edges[e]) for e in range(H.n_edges)],
            "ls": [
                [H.label(v) for v in sorted(H.edges[e])]
                for e in range(H.n_edges)
            ],
        }
    )
    incidence = pd.DataFrame(
        [
            {"eid": e, "v": v}
            for e in range(H.n_edges)
            for v in sorted(H.edges[e])
        ],
        columns=["eid", "v"],
    )
    labels = pd.DataFrame(
        {"v": range(H.n_vertices), "label": list(H.labels)}
    )
    return {"edges": edges, "incidence": incidence, "labels": labels}


def build_spark_hypergraph(spark: SparkSession, H: Hypergraph) -> SparkHypergraph:
    """Offline preprocessing stage: load + partition + index, on Spark."""
    frames = hypergraph_frames(H)
    edges = spark.createDataFrame(frames["edges"])
    # Inverted hyperedge index: explode membership, keep the signature —
    # a (sig, v) group is one posting list.
    incidence = spark.createDataFrame(frames["incidence"])
    index = (
        edges.select("eid", "sig")
        .join(incidence, "eid")
        .select("sig", "v", "eid")
    )
    labels = spark.createDataFrame(frames["labels"])
    return SparkHypergraph(
        edges=edges,
        index=index,
        labels=labels,
        n_vertices=H.n_vertices,
        n_edges=H.n_edges,
    )

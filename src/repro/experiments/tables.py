"""Row builders / printers for every reproduced table.

Each function returns a ``pandas.DataFrame`` whose rows mirror the
paper's table, and the ``jobs/`` entrypoints print them next to the
paper's reference numbers recorded in EXPERIMENTS.md.
"""
from __future__ import annotations

import pandas as pd

from repro.experiments.datasets import CATALOG, DATASET_ORDER, make_dataset
from repro.hyper.model import Hypergraph, fig1_data
from repro.hyper.queries import TABLE3_SETTINGS, sample_queries
from repro.hyper.storage import SignatureStore


def _human_bytes(n: int) -> str:
    if n >= 1 << 20:
        return f"{n / (1 << 20):.1f}MB"
    return f"{n / (1 << 10):.1f}KB"


def table1_layout(H: Hypergraph | None = None) -> pd.DataFrame:
    """Table I: the signature-partitioned layout + inverted index of the
    Fig. 1b data hypergraph (one row per partition)."""
    H = fig1_data() if H is None else H
    store = SignatureStore(H)
    rows = []
    for sig in sorted(store.partitions):
        rows.append(
            {
                "signature": "{" + ",".join(sig) + "}",
                "hyperedges": [
                    "e" + str(e + 1) + "=" + str(sorted(H.edges[e]))
                    for e in store.partitions[sig]
                ],
                "inverted_index": {
                    f"v{v}": ["e" + str(e + 1) for e in post]
                    for v, post in sorted(store.inverted[sig].items())
                },
            }
        )
    return pd.DataFrame(rows)


def table2_datasets(*, scale: float = 1.0, seed: int = 0) -> pd.DataFrame:
    """Table II: measured statistics of every synthetic catalog dataset
    next to the paper's real-dataset numbers."""
    rows = []
    for name in DATASET_ORDER:
        spec = CATALOG[name]
        H = make_dataset(name, scale=scale, seed=seed)
        store = SignatureStore(H)
        rows.append(
            {
                "dataset": name,
                "|V|": H.n_vertices,
                "|E|": H.n_edges,
                "|Sigma|": len(set(H.labels)),
                "a_max": H.max_arity,
                "avg_a": round(H.avg_arity, 1),
                "index": _human_bytes(store.index_nbytes()),
                "paper_|V|": spec.paper.n_vertices,
                "paper_|E|": spec.paper.n_edges,
                "paper_|Sigma|": spec.paper.n_labels,
                "paper_a_max": spec.paper.max_arity,
                "paper_avg_a": spec.paper.avg_arity,
                "paper_index": spec.paper.index_size,
            }
        )
    return pd.DataFrame(rows).set_index("dataset")


def table3_queries(
    *, dataset: str = "WT", n_queries: int = 5, scale: float = 1.0, seed: int = 0
) -> pd.DataFrame:
    """Table III: the four query settings, plus measured properties of
    queries actually sampled under each setting (all connected, vertex
    counts inside the window)."""
    H = make_dataset(dataset, scale=scale, seed=seed)
    rows = []
    for s in TABLE3_SETTINGS:
        qs = sample_queries(H, s, n_queries, seed=seed)
        nvs = [sq.query.n_vertices for sq in qs]
        rows.append(
            {
                "query": s.name,
                "|E|": s.n_edges,
                "|V|_min": s.v_min,
                "|V|_max": s.v_max,
                "sampled": len(qs),
                "sampled_|V|_range": f"{min(nvs)}-{max(nvs)}",
                "all_connected": all(sq.query.is_connected() for sq in qs),
                "in_window": sum(sq.in_window for sq in qs),
            }
        )
    return pd.DataFrame(rows).set_index("query")

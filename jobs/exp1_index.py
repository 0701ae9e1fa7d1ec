"""Exp-1 (Fig. 7): index build time and size vs graph size.

Run: ``spark-submit jobs/exp1_index.py``.
"""
from repro.experiments.datasets import DATASET_ORDER, make_dataset
from repro.hyper.storage import SignatureStore


def main() -> None:
    print("== Exp-1: inverted hyperedge index build time / sizes ==")
    print(f"{'ds':>3} {'build_s':>8} {'graph':>9} {'index':>9} {'index/graph':>11}")
    for name in DATASET_ORDER:
        H = make_dataset(name)
        rep = SignatureStore(H).build_report()
        print(
            f"{name:>3} {rep.build_seconds:>8.3f} {rep.graph_nbytes/1024:>7.0f}KB "
            f"{rep.index_nbytes/1024:>7.0f}KB {rep.index_nbytes/max(1,rep.graph_nbytes):>11.2f}"
        )
    print("paper shape: build <= 6.7 s even on AR; index size ~= graph size")


if __name__ == "__main__":
    main()

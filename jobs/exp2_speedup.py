"""Exp-2 (Fig. 8): single-thread speedup of HGMatch over the baselines.

Run: ``spark-submit jobs/exp2_speedup.py [n_queries]``.
"""
import sys

from repro.experiments.datasets import SINGLE_THREAD_DATASETS
from repro.experiments.harness import run_queries, speedup_table
from repro.hyper.queries import TABLE3_SETTINGS


def main(n_queries: int = 3) -> None:
    records = []
    for ds in SINGLE_THREAD_DATASETS:
        records += run_queries(ds, list(TABLE3_SETTINGS[:2]), n_queries=n_queries)
        print(f"[exp2] {ds} done")
    print("== Exp-2: average elapsed seconds and speedup over HGMatch ==")
    print(speedup_table(records).to_string(float_format=lambda x: f"{x:.4g}"))
    print("paper shape: average speedups 5e4 (CFL-H), 1e5 (DAF-H), 7e5 (CECI-H), "
          "1e6 (RapidMatch); largest gaps on high-arity datasets (HC, MA, HB, SA)")


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 3)

"""Table IV: single-thread query completion ratio per algorithm.

All five engines run the q2+q3 workloads over the nine single-thread
datasets (AR excluded, as in the paper) under the operation budget that
stands in for the paper's 1-hour timeout.

Run: ``spark-submit jobs/table4_completion.py [n_queries]``.
"""
import sys

from repro.experiments.datasets import SINGLE_THREAD_DATASETS
from repro.experiments.harness import completion_table, run_queries
from repro.hyper.queries import TABLE3_SETTINGS


def main(n_queries: int = 3) -> None:
    records = []
    for ds in SINGLE_THREAD_DATASETS:
        records += run_queries(ds, list(TABLE3_SETTINGS[:2]), n_queries=n_queries)
        print(f"[table4] {ds} done ({len(records)} runs)")
    print("== Table IV: query completion ratio (single-thread, %) ==")
    print(completion_table(records).to_string())
    print("paper: HGMatch 100% everywhere; CFL-H/DAF-H/CECI-H/RapidMatch "
          "100% on HC/MA/CH/CP, 43-56% on SB, 44% HB, 75-76% WT, 86-90% TC, 99% SA")


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 3)

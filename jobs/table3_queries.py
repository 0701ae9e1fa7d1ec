"""Table III: query settings + properties of actually sampled queries.

Run: ``spark-submit jobs/table3_queries.py [dataset]``.
"""
import sys

from repro.experiments.tables import table3_queries


def main(dataset: str = "WT") -> None:
    print(f"== Table III: query settings (sampled from {dataset}) ==")
    print(table3_queries(dataset=dataset).to_string())


if __name__ == "__main__":
    main(sys.argv[1] if len(sys.argv) > 1 else "WT")

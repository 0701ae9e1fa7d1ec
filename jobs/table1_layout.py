"""Table I: signature-partitioned layout of the Fig. 1b hypergraph.

Run: ``spark-submit jobs/table1_layout.py`` (driver-side only).
"""
from repro.experiments.tables import table1_layout


def main() -> None:
    df = table1_layout()
    print("== Table I: hyperedge tables + inverted hyperedge index (Fig. 1b) ==")
    for _, row in df.iterrows():
        print(f"partition {row['signature']}:")
        print("  E:", "; ".join(row["hyperedges"]))
        print("  I:", row["inverted_index"])


if __name__ == "__main__":
    main()

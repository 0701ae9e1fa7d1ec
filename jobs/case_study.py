"""Section VII-D case study: Q/A over a knowledge hypergraph.

Run: ``spark-submit jobs/case_study.py``.
"""
from repro.experiments.case_study import run_case_study


def main() -> None:
    r = run_case_study()
    print("== Case study: Q/A over synthetic JF17K-like knowledge hypergraph ==")
    print(f"Query 1 (players, different teams in different matches): "
          f"{r.q1_count} embeddings (paper on real JF17K: {r.paper_q1})")
    print(f"Query 2 (same character, different actors/seasons): "
          f"{r.q2_count} embeddings (paper on real JF17K: {r.paper_q2})")


if __name__ == "__main__":
    main()

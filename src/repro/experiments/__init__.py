"""Evaluation-section reproduction (paper Section VII).

- :mod:`repro.experiments.datasets` — the Table II dataset catalog as
  calibrated synthetic hypergraphs (DESIGN.md substitution #2);
- :mod:`repro.experiments.harness` — engine registry, deterministic
  operation budgets standing in for wall-clock timeouts, and the
  runners behind Table IV / Exp-2 / Exp-3;
- :mod:`repro.experiments.tables` — row formatters for every table;
- :mod:`repro.experiments.case_study` — the Section VII-D knowledge-
  hypergraph Q/A case study on a synthetic JF17K-like dataset.
"""
from repro.experiments.datasets import CATALOG, make_dataset  # noqa: F401

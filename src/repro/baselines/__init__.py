"""Baselines the paper compares against (Sections III-B, VII-A).

- :mod:`repro.baselines.backtrack` — the generic match-by-vertex
  backtracking framework (Alg. 1) extended to hypergraphs via the
  subhypergraph-matching constraint (Thm. III.2);
- :mod:`repro.baselines.ihs` — the IHS candidate-vertex filter of [30];
- :mod:`repro.baselines.orders` — CFL/DAF/CECI-flavoured matching-order
  strategies plugged into the generic framework (CFL-H, DAF-H, CECI-H);
- :mod:`repro.baselines.rapidmatch` — RapidMatch run on the bipartite
  conversion of query and data hypergraphs;
- :mod:`repro.baselines.bruteforce` — exhaustive enumeration oracle for
  cross-engine correctness tests.
"""
from repro.baselines.backtrack import BacktrackResult, match_by_vertex  # noqa: F401
from repro.baselines.bruteforce import brute_force  # noqa: F401
from repro.baselines.rapidmatch import rapidmatch  # noqa: F401

"""HGMatch core: the paper's match-by-hyperedge contribution.

- :mod:`repro.core.order` — cardinality-driven matching order (Alg. 3)
- :mod:`repro.core.plan` — per-step constants compiled from (q, phi)
- :mod:`repro.core.candidates` — set-operation candidate generation (Alg. 4)
- :mod:`repro.core.validate` — vertex-profile validation (Alg. 5) and an
  exact bijection checker used as a test oracle
- :mod:`repro.core.local_engine` — sequential engine with DFS/LIFO
  traversal, operation budgets, and Exp-3 filtering statistics
"""
from repro.core.local_engine import MatchResult, hgmatch  # noqa: F401
from repro.core.order import compute_matching_order  # noqa: F401
from repro.core.plan import compile_plan  # noqa: F401

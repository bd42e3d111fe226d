"""Feasibility model for the scalability study (DESIGN.md §5).

The paper runs on 12 machines with 128 GB each and reports that the
competitors exceed physical memory beyond 10K–20K vertices, while GBDA
reaches 100K. We reproduce the *feasibility wall* with an analytic
memory model of each method's dominant allocation plus a wall-clock
timeout, against a scaled budget — so the harness never actually OOMs
the container, but the tables show the same "method X infeasible beyond
n" structure.
"""
from __future__ import annotations

#: Scaled stand-in for the paper's 128 GB per-machine budget. At the
#: scaled Syn sizes {100..2000} this yields the paper's feasibility
#: ordering: Greedy/Seriation die first (>1000-ish), LSAP one step
#: later (>1500-ish), GBDA never (linear footprint).
DEFAULT_BUDGET_BYTES = 100 * 1024 * 1024
#: Per-pair wall-clock cap for baselines in the scalability harness.
DEFAULT_TIMEOUT_S = 30.0


def bytes_needed(method: str, n1: int, n2: int) -> int:
    """Dominant allocation of ``method`` on a graph pair (bytes).

    - lsap: the dense (n1+n2)² float64 cost matrix;
    - greedy (Greedy-*Sort*-GED): the cost matrix plus the int64 sort
      index over all its entries;
    - seriation: two dense adjacency matrices plus the probabilistic
      alignment matrix over vertex pairs;
    - gbda: branch tables, O((n1 + n2) * d) — modeled as linear.
    """
    if method == "lsap":
        return 8 * (n1 + n2) ** 2
    if method == "greedy":
        return 16 * (n1 + n2) ** 2
    if method == "seriation":
        return 8 * (n1 * n1 + n2 * n2) + 40 * n1 * n2
    if method == "gbda":
        return 64 * (n1 + n2)
    raise ValueError(f"unknown method {method!r}")


def feasible(
    method: str, n1: int, n2: int, budget: int = DEFAULT_BUDGET_BYTES
) -> bool:
    """True iff the method's dominant allocation fits the budget."""
    return bytes_needed(method, n1, n2) <= budget

"""LSAP-based GED approximation (Riesen & Bunke 2009) and helpers.

Builds the (n1+n2)×(n1+n2) cost matrix with branch-style local costs:
substitution cost = vertex-label difference + lower bound on incident
edge-label multiset reconciliation; deletion/insertion cost = 1 +
degree (the vertex plus all its incident edges). The assignment found
by the Hungarian solver (or the greedy solver — see ``greedy.py``)
induces a full edit path whose **exact induced cost** is reported as
the approximate GED (an upper bound of the true GED).
"""
from __future__ import annotations

import numpy as np

from repro.baselines.assignment import greedy_assignment, hungarian
from repro.ged.exact import induced_edit_cost
from repro.graphs import Graph

#: Large finite cost standing in for "forbidden" (off-diagonal ε cells).
FORBIDDEN = 1e9


def _edge_count_matrix(g: Graph, elabels: list[str]) -> np.ndarray:
    """(n, |L_E|) incident edge-label counts per vertex."""
    idx = {lab: i for i, lab in enumerate(elabels)}
    c = np.zeros((g.n, len(elabels)), dtype=np.float64)
    for (u, v), lab in g.edges.items():
        j = idx[lab]
        c[u, j] += 1
        c[v, j] += 1
    return c


def cost_matrix(g1: Graph, g2: Graph) -> np.ndarray:
    """Riesen–Bunke square cost matrix of size (n1+n2)."""
    n1, n2 = g1.n, g2.n
    elabels = sorted(
        set(g1.edges.values()) | set(g2.edges.values())
    ) or ["_"]
    c1 = _edge_count_matrix(g1, elabels)
    c2 = _edge_count_matrix(g2, elabels)
    d1 = c1.sum(axis=1)
    d2 = c2.sum(axis=1)
    # Substitution block: vertex label diff + multiset LB on edges.
    v1 = np.array(g1.vlabels)
    v2 = np.array(g2.vlabels)
    vdiff = (v1[:, None] != v2[None, :]).astype(np.float64)
    # Chunked to bound the (n1, n2, L) broadcast at ~64 MB.
    inter = np.empty((n1, n2))
    chunk = max(1, int(8e6 / max(n2 * c1.shape[1], 1)))
    for s in range(0, n1, chunk):
        e = min(n1, s + chunk)
        inter[s:e] = np.minimum(c1[s:e, None, :], c2[None, :, :]).sum(axis=2)
    sub = vdiff + np.maximum(d1[:, None], d2[None, :]) - inter
    cm = np.full((n1 + n2, n1 + n2), FORBIDDEN)
    cm[:n1, :n2] = sub
    cm[np.arange(n1), n2 + np.arange(n1)] = 1.0 + d1   # deletions
    cm[n1 + np.arange(n2), np.arange(n2)] = 1.0 + d2   # insertions
    cm[n1:, n2:] = 0.0                                  # ε → ε
    return cm


def _mapping_from_assignment(
    assign: np.ndarray, n1: int, n2: int
) -> dict[int, int | None]:
    """Rows 0..n1-1 of the assignment → vertex mapping (None = delete)."""
    return {
        i: (int(assign[i]) if assign[i] < n2 else None) for i in range(n1)
    }


def lsap_ged(g1: Graph, g2: Graph) -> int:
    """Approximate GED via exact Hungarian on the cost matrix."""
    cm = cost_matrix(g1, g2)
    assign = hungarian(cm)
    return induced_edit_cost(
        g1, g2, _mapping_from_assignment(assign, g1.n, g2.n)
    )


def greedy_sort_ged(g1: Graph, g2: Graph) -> int:
    """Approximate GED via the greedy assignment (Greedy-Sort-GED)."""
    cm = cost_matrix(g1, g2)
    assign = greedy_assignment(cm)
    return induced_edit_cost(
        g1, g2, _mapping_from_assignment(assign, g1.n, g2.n)
    )

"""Linear-sum-assignment solvers (no scipy in the container).

- :func:`hungarian` — O(n³) Kuhn–Munkres with potentials and augmenting
  paths (numpy-vectorized inner relaxation), exact optimum;
- :func:`greedy_assignment` — the O(n² log n) greedy of Riesen 2015
  (rows in sorted order of their cheapest entry; each row takes its
  cheapest remaining column).
"""
from __future__ import annotations

import numpy as np


def hungarian(cost: np.ndarray) -> np.ndarray:
    """Exact minimum-cost assignment for a square matrix.

    Returns ``assign`` with ``assign[i]`` = column matched to row ``i``.
    """
    cost = np.asarray(cost, dtype=np.float64)
    n = cost.shape[0]
    if cost.shape != (n, n):
        raise ValueError("hungarian requires a square cost matrix")
    INF = np.inf
    u = np.zeros(n + 1)
    v = np.zeros(n + 1)
    p = np.zeros(n + 1, dtype=np.int64)    # p[j]: row matched to column j
    way = np.zeros(n + 1, dtype=np.int64)
    # 1-based columns; column 0 is the virtual start.
    for i in range(1, n + 1):
        p[0] = i
        j0 = 0
        minv = np.full(n + 1, INF)
        used = np.zeros(n + 1, dtype=bool)
        while True:
            used[j0] = True
            i0 = p[j0]
            # Vectorized relaxation over unused columns.
            free = ~used
            free[0] = False
            cand = cost[i0 - 1] - u[i0] - v[1:]
            idx = np.where(free[1:])[0]
            better = cand[idx] < minv[idx + 1]
            upd = idx[better]
            minv[upd + 1] = cand[upd]
            way[upd + 1] = j0
            jfree = np.where(free)[0]
            j1 = jfree[np.argmin(minv[jfree])]
            delta = minv[j1]
            u[p[used]] += delta
            v[used] -= delta
            minv[~used] -= delta
            j0 = j1
            if p[j0] == 0:
                break
        while j0:
            j1 = way[j0]
            p[j0] = p[j1]
            j0 = j1
    assign = np.zeros(n, dtype=np.int64)
    for j in range(1, n + 1):
        assign[p[j] - 1] = j - 1
    return assign


def assignment_cost(cost: np.ndarray, assign: np.ndarray) -> float:
    """Total cost of an assignment."""
    return float(cost[np.arange(len(assign)), assign].sum())


def greedy_assignment(cost: np.ndarray) -> np.ndarray:
    """Greedy LSAP: rows ordered by their cheapest entry, each takes
    its cheapest remaining column (Riesen–Ferrer–Bunke 2015)."""
    cost = np.asarray(cost, dtype=np.float64)
    n = cost.shape[0]
    order = np.argsort(cost.min(axis=1), kind="stable")
    taken = np.zeros(n, dtype=bool)
    assign = np.full(n, -1, dtype=np.int64)
    for i in order:
        row = np.where(taken, np.inf, cost[i])
        j = int(np.argmin(row))
        assign[i] = j
        taken[j] = True
    return assign


def brute_force_assignment(cost: np.ndarray) -> float:
    """Optimal assignment cost by enumeration (tests only, n ≤ 8)."""
    from itertools import permutations

    n = cost.shape[0]
    return min(
        sum(cost[i, p[i]] for i in range(n)) for p in permutations(range(n))
    )

"""Graph Seriation GED estimate (Robles-Kelly & Hancock 2005).

The paper's third competitor: (1) extract the leading eigenvector of
the (dense) adjacency matrix — O(n²) space/time, which is precisely why
seriation hits the memory wall first in the paper's scalability study;
(2) *seriate* the vertices by eigenvector magnitude into a string; (3)
estimate the edit distance between the two seriated label strings with
a probabilistic string-alignment, realized here as a unit-cost
Levenshtein DP over (vertex label, sorted incident-edge-label) symbols
(anti-diagonal vectorized). The DP is the O(n·m) core of their edit
model; we document in DESIGN.md that the full O(nm²) Bernoulli
alignment model is simplified to unit costs.
"""
from __future__ import annotations

import numpy as np

from repro.graphs import Graph


def adjacency(g: Graph) -> np.ndarray:
    """Dense 0/1 adjacency matrix (the method's dominant allocation)."""
    a = np.zeros((g.n, g.n), dtype=np.float64)
    for (u, v) in g.edges:
        a[u, v] = 1.0
        a[v, u] = 1.0
    return a


def leading_eigenvector(a: np.ndarray, iters: int = 60, seed: int = 0) -> np.ndarray:
    """Leading eigenvector by power iteration (deterministic init)."""
    n = a.shape[0]
    rng = np.random.default_rng(seed)
    x = rng.random(n) + 1.0
    x /= np.linalg.norm(x)
    for _ in range(iters):
        y = a @ x + 1e-9 * x  # shift keeps convergence on bipartite-ish graphs
        nrm = np.linalg.norm(y)
        if nrm == 0:
            return x
        x = y / nrm
    return x


def seriate(g: Graph) -> list[str]:
    """Vertex symbols in leading-eigenvector order."""
    order = np.argsort(-np.abs(leading_eigenvector(adjacency(g))), kind="stable")
    return [
        f"{g.vlabels[v]}|{','.join(g.incident_labels(int(v)))}" for v in order
    ]


def _levenshtein(a: list[str], b: list[str]) -> int:
    """Unit-cost string edit distance, anti-diagonal vectorized."""
    la, lb = len(a), len(b)
    if la == 0:
        return lb
    if lb == 0:
        return la
    aa = np.array(a)
    bb = np.array(b)
    prev = np.arange(lb + 1, dtype=np.int64)
    for i in range(1, la + 1):
        cur = np.empty(lb + 1, dtype=np.int64)
        cur[0] = i
        sub = prev[:-1] + (aa[i - 1] != bb)
        dele = prev[1:] + 1
        best = np.minimum(sub, dele)
        # Left-to-right insertion propagation via prefix-min:
        # cur[j] = min(cur[0] + j, min_{1<=k<=j}(best[k] + (j - k))).
        j_idx = np.arange(1, lb + 1)
        run = np.minimum.accumulate(best - j_idx)
        cur[1:] = np.minimum(i + j_idx, run + j_idx)
        prev = cur
    return int(prev[-1])


def seriation_ged(g1: Graph, g2: Graph) -> int:
    """Approximate GED as edit distance between seriated strings."""
    return _levenshtein(seriate(g1), seriate(g2))

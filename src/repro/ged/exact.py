"""Exact Graph Edit Distance (Definition 1) — ground truth substrate.

The paper's effectiveness tables need exact GEDs, computed with the
A* algorithm [5]. We implement:

- :func:`induced_edit_cost` — the unit-cost edit cost induced by a full
  vertex mapping (shared with the LSAP/greedy baselines, which return a
  mapping and report its induced cost);
- :func:`ged_exact` — A* best-first search over partial vertex mappings
  with an admissible label-multiset heuristic (optionally bounded by
  ``limit`` for threshold queries);
- :func:`ged_brute` — exhaustive mapping enumeration for tiny graphs,
  used by tests to validate the A* implementation.

Unit costs: every operation in Definition 1 (AV/DV/RV/AE/DE/RE) costs 1.
A vertex deletion/insertion of a non-isolated vertex implies deleting/
inserting its incident edges at 1 each, matching the requirement that
AV/DV apply to isolated vertices only.
"""
from __future__ import annotations

import heapq
from collections import Counter
from itertools import permutations

from repro.graphs import Graph


def induced_edit_cost(g1: Graph, g2: Graph, mapping: dict[int, int | None]) -> int:
    """Edit cost induced by ``mapping`` (g1 vertex → g2 vertex or None).

    Vertices of ``g2`` not in the image are insertions. This is an upper
    bound of GED for any mapping, and equals GED for the optimal one.
    """
    cost = 0
    image = {}
    for u1 in range(g1.n):
        u2 = mapping.get(u1)
        if u2 is None:
            cost += 1  # DV
        else:
            image[u2] = u1
            if g1.vlabels[u1] != g2.vlabels[u2]:
                cost += 1  # RV
    cost += g2.n - len(image)  # AV
    for (u1, v1), l1 in g1.edges.items():
        a, b = mapping.get(u1), mapping.get(v1)
        if a is None or b is None:
            cost += 1  # DE (endpoint deleted)
        else:
            l2 = g2.edge_label(a, b)
            if l2 is None:
                cost += 1  # DE
            elif l1 != l2:
                cost += 1  # RE
    for (a, b), _ in g2.edges.items():
        u1, v1 = image.get(a), image.get(b)
        if u1 is None or v1 is None:
            cost += 1  # AE (endpoint inserted)
        elif g1.edge_label(u1, v1) is None:
            cost += 1  # AE
    return cost


def ged_brute(g1: Graph, g2: Graph) -> int:
    """Exact GED by exhaustive enumeration (tiny graphs only)."""
    if g1.n > g2.n:
        g1, g2 = g2, g1
    best = None
    slots = list(range(g2.n)) + [None] * g1.n  # allow deletions too
    for perm in permutations(slots, g1.n):
        real = [p for p in perm if p is not None]
        if len(real) != len(set(real)):
            continue
        c = induced_edit_cost(g1, g2, dict(enumerate(perm)))
        if best is None or c < best:
            best = c
    return best if best is not None else g2.n


def _label_lb(c1: Counter, c2: Counter) -> int:
    """Lower bound on edits to reconcile two label multisets."""
    inter = sum((c1 & c2).values())
    return max(sum(c1.values()), sum(c2.values())) - inter


class SearchBudgetExceeded(RuntimeError):
    """A* exceeded ``max_expansions`` without proving a bound."""


def ged_exact(
    g1: Graph,
    g2: Graph,
    limit: int | None = None,
    max_expansions: int | None = None,
) -> int | None:
    """Exact GED via A*. Returns None if ``limit`` is set and GED > limit.

    Feasible for small graphs (≲12 vertices, as the paper notes for A*).
    G1 vertices are expanded in descending-degree order for pruning.
    ``max_expansions`` bounds the number of expanded states; exceeding
    it raises :class:`SearchBudgetExceeded` (harnesses exclude and
    count such pairs rather than report a wrong ground truth).
    """
    if g1.n > g2.n:
        g1, g2 = g2, g1
    n1, n2 = g1.n, g2.n
    order = sorted(range(n1), key=g1.degree, reverse=True)

    # Per-prefix remaining-label multisets for the heuristic.
    v1_labels = [Counter(g1.vlabels[v] for v in order[i:]) for i in range(n1 + 1)]
    e_unacc1 = []  # g1 edges with >=1 endpoint still unprocessed, per step
    pos = {v: i for i, v in enumerate(order)}
    for i in range(n1 + 1):
        e_unacc1.append(
            Counter(
                lab
                for (u, v), lab in g1.edges.items()
                if pos[u] >= i or pos[v] >= i
            )
        )
    all_v2 = Counter(g2.vlabels)
    all_e2 = Counter(g2.edges.values())

    def heuristic(idx: int, used: frozenset, mapped_real: int) -> int:
        c2v = all_v2.copy()
        for u2 in used:
            c2v[g2.vlabels[u2]] -= 1
        c2v = +c2v
        hv = _label_lb(v1_labels[idx], c2v)
        c2e = Counter(
            lab
            for (a, b), lab in g2.edges.items()
            if a not in used or b not in used
        )
        he = _label_lb(e_unacc1[idx], c2e)
        return hv + he

    def completion_cost(used: frozenset) -> int:
        c = n2 - len(used)
        for (a, b) in g2.edges:
            if a not in used or b not in used:
                c += 1
        return c

    # State: (f, g_cost, idx, tiebreak, mapping tuple aligned with `order`).
    # The tiebreak keeps heterogeneous mapping tuples (ints and Nones)
    # out of tuple comparison.
    start_h = heuristic(0, frozenset(), 0)
    tie = 0
    heap = [(start_h, 0, 0, tie, ())]
    seen: dict[tuple, int] = {}
    expansions = 0
    while heap:
        f, g_cost, idx, _, mp = heapq.heappop(heap)
        if limit is not None and f > limit:
            return None
        expansions += 1
        if max_expansions is not None and expansions > max_expansions:
            raise SearchBudgetExceeded(
                f"A* exceeded {max_expansions} expansions"
            )
        if idx == n1:
            used = frozenset(p for p in mp if p is not None)
            return g_cost + completion_cost(used)
        key = (idx, mp)
        if seen.get(key, 1 << 30) < g_cost:
            continue
        u1 = order[idx]
        used = frozenset(p for p in mp if p is not None)
        # Option A: map u1 to each unused u2.
        for u2 in range(n2):
            if u2 in used:
                continue
            c = 0 if g1.vlabels[u1] == g2.vlabels[u2] else 1
            for j in range(idx):
                v1, v2 = order[j], mp[j]
                l1 = g1.edge_label(u1, v1)
                l2 = g2.edge_label(u2, v2) if v2 is not None else None
                if l1 is not None or l2 is not None:
                    if l1 is None or l2 is None or l1 != l2:
                        c += 1
            ng = g_cost + c
            nmp = mp + (u2,)
            nk = (idx + 1, nmp)
            if seen.get(nk, 1 << 30) <= ng:
                continue
            seen[nk] = ng
            nh = heuristic(idx + 1, used | {u2}, 0)
            tie += 1
            heapq.heappush(heap, (ng + nh, ng, idx + 1, tie, nmp))
        # Option B: delete u1.
        c = 1
        for j in range(idx):
            if g1.edge_label(u1, order[j]) is not None:
                c += 1
        ng = g_cost + c
        nmp = mp + (None,)
        nk = (idx + 1, nmp)
        if seen.get(nk, 1 << 30) > ng:
            seen[nk] = ng
            nh = heuristic(idx + 1, used, 0)
            tie += 1
            heapq.heappush(heap, (ng + nh, ng, idx + 1, tie, nmp))
    raise RuntimeError("A* exhausted without reaching a goal")  # pragma: no cover

"""Synthetic labeled-graph dataset generators.

Stand-ins for the IAM Graph Database sets used in the paper (AIDS,
Fingerprint, GREC — Table 2), which are not redistributable/downloadable
in this offline container. Each family matches the *shape* that the
paper's model consumes: number of graphs, label alphabet sizes, graph
size distribution, average degree, and scale-freeness. Graph sizes are
scaled down so exact-GED ground truth (needed by the effectiveness
tables) is computable; see DESIGN.md §5.

Two structural regimes are provided, mirroring Syn-1 vs Syn-2:

- ``scale_free_graph`` — preferential attachment (degree distribution
  with a heavy tail, as in the paper's Syn-1 and the IAM sets);
- ``uniform_random_graph`` — uniform edge endpoints (Syn-2).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.graphs import Graph


def _random_connected_graph(
    n: int, avg_degree: float, vlabels: list[str], elabels: list[str],
    rng: np.random.Generator, preferential: bool,
) -> Graph:
    """Connected labeled graph with ~``avg_degree`` average degree.

    Appendix F's connectivity rule: each vertex ``i > 0`` connects to
    some ``j < i`` (preferential ∝ degree for scale-free graphs via the
    classic repeated-endpoints trick — O(1) amortized per edge —
    uniform otherwise), then extra edges are added to reach the target
    edge count ``round(avg_degree * n / 2)``.
    """
    g = Graph([str(rng.choice(vlabels)) for _ in range(n)])
    elab = np.asarray(elabels)
    # `reps` holds each vertex once per incident edge (plus once at
    # birth), so uniform sampling from it is degree-proportional.
    reps: list[int] = [0]
    for i in range(1, n):
        if preferential:
            j = reps[int(rng.integers(len(reps)))]
        else:
            j = int(rng.integers(0, i))
        g.add_edge(i, j, str(elab[rng.integers(len(elab))]))
        reps.append(i)
        reps.append(j)
    m_target = min(
        max(n - 1, int(round(avg_degree * n / 2))), n * (n - 1) // 2
    )
    attempts = 0
    max_attempts = 50 * m_target + 100
    while g.m < m_target and attempts < max_attempts:
        attempts += 1
        if preferential:
            u = reps[int(rng.integers(len(reps)))]
            v = reps[int(rng.integers(len(reps)))]
        else:
            u = int(rng.integers(n))
            v = int(rng.integers(n))
        if u == v or g.edge_label(u, v) is not None:
            continue
        g.add_edge(u, v, str(elab[rng.integers(len(elab))]))
        reps.append(u)
        reps.append(v)
    return g


def scale_free_graph(
    n: int, avg_degree: float, vlabels: list[str], elabels: list[str],
    seed: int = 0,
) -> Graph:
    """Connected scale-free labeled graph (preferential attachment)."""
    return _random_connected_graph(
        n, avg_degree, vlabels, elabels, np.random.default_rng(seed), True
    )


def uniform_random_graph(
    n: int, avg_degree: float, vlabels: list[str], elabels: list[str],
    seed: int = 0,
) -> Graph:
    """Connected uniform-random labeled graph (non-scale-free)."""
    return _random_connected_graph(
        n, avg_degree, vlabels, elabels, np.random.default_rng(seed), False
    )


@dataclass(frozen=True)
class DatasetSpec:
    """Shape parameters for one synthetic dataset family."""

    name: str
    n_db: int          # number of graphs in database D
    n_query: int       # number of query graphs
    size_lo: int       # min vertices per graph
    size_hi: int       # max vertices per graph (our scaled V_m)
    avg_degree: float  # target average degree (Table 2's d)
    n_vlabels: int     # vertex label alphabet size
    n_elabels: int     # edge label alphabet size
    scale_free: bool


# Scaled stand-ins for Table 2's real datasets. |D|/|Q| keep the paper's
# ~5% query fraction at a tenth of the count; V_m scaled so exact GED is
# tractable; avg degree and scale-freeness match Table 2; alphabet sizes
# follow the IAM descriptions (AIDS: atom types / bond types; Fingerprint:
# unlabeled vertices, orientation-coded edges; GREC: symbol primitives).
AIDS_LITE = DatasetSpec("AIDS", 190, 10, 4, 16, 2.1, 20, 3, True)
FINGER_LITE = DatasetSpec("Finger", 216, 11, 3, 12, 1.7, 1, 8, True)
GREC_LITE = DatasetSpec("GREC", 105, 6, 4, 12, 2.1, 12, 4, True)


def make_dataset(
    spec: DatasetSpec, seed: int = 0
) -> tuple[dict[int, Graph], dict[int, Graph]]:
    """Generate ``(database, queries)`` as ``{gid: Graph}`` maps.

    Query gids continue after database gids. Query graphs are perturbed
    copies of database graphs (0–3 random edits) so that similarity
    search has non-trivial answers, mirroring the paper's protocol of
    drawing queries from the same population as D.
    """
    rng = np.random.default_rng(seed)
    vlabels = [f"V{i}" for i in range(spec.n_vlabels)]
    elabels = [f"e{i}" for i in range(spec.n_elabels)]
    gen = scale_free_graph if spec.scale_free else uniform_random_graph
    db: dict[int, Graph] = {}
    for gid in range(spec.n_db):
        n = int(rng.integers(spec.size_lo, spec.size_hi + 1))
        db[gid] = gen(
            n, spec.avg_degree, vlabels, elabels,
            seed=seed * 1_000_003 + gid,
        )
    queries: dict[int, Graph] = {}
    base_ids = rng.choice(spec.n_db, size=spec.n_query, replace=False)
    for i, bid in enumerate(base_ids):
        q = db[int(bid)].copy()
        for _ in range(int(rng.integers(0, 4))):
            _random_edit(q, rng, vlabels, elabels)
        queries[spec.n_db + i] = q
    return db, queries


def _random_edit(
    g: Graph, rng: np.random.Generator,
    vlabels: list[str], elabels: list[str],
) -> None:
    """Apply one random graph edit operation in place (RV/RE/AE/DE)."""
    op = rng.integers(0, 4)
    if op == 0 and g.n:  # RV
        v = int(rng.integers(0, g.n))
        g.vlabels[v] = str(rng.choice(vlabels))
    elif op == 1 and g.edges:  # RE
        k = list(g.edges)[int(rng.integers(0, g.m))]
        g.edges[k] = str(rng.choice(elabels))
    elif op == 2 and g.n >= 2:  # AE
        u, v = rng.choice(g.n, size=2, replace=False)
        if g.edge_label(int(u), int(v)) is None:
            g.add_edge(int(u), int(v), str(rng.choice(elabels)))
    elif op == 3 and g.edges:  # DE
        k = list(g.edges)[int(rng.integers(0, g.m))]
        del g.edges[k]


def dataset_stats(graphs: dict[int, Graph]) -> dict:
    """Table 2-style statistics for a set of graphs."""
    if not graphs:
        return {"count": 0, "V_m": 0, "E_m": 0, "avg_degree": 0.0}
    ns = [g.n for g in graphs.values()]
    ms = [g.m for g in graphs.values()]
    tot_deg = sum(2 * g.m for g in graphs.values())
    tot_n = sum(ns)
    return {
        "count": len(graphs),
        "V_m": max(ns),
        "E_m": max(ms),
        "avg_degree": round(tot_deg / tot_n, 2),
    }


def degree_tail_exponent(graphs: dict[int, Graph]) -> float:
    """Scale-freeness indicator: Hill tail exponent of pooled degrees.

    The Hill estimator ``1 + N / Σ ln(d_i / d_min)`` is applied to the
    upper degree tail only (``d_min`` = 90th percentile), where the
    power-law vs exponential distinction lives. Preferential-attachment
    families have heavier tails, hence a *smaller* exponent than
    uniform-random families at matched average degree.
    """
    degs = [d for g in graphs.values() for d in g.degrees()]
    if len(degs) < 20:
        return float("nan")
    d = np.asarray(degs, dtype=np.float64)
    d_min = max(2.0, float(np.quantile(d, 0.90)))
    tail = d[d >= d_min]
    if tail.size < 10:
        return float("nan")
    return float(1.0 + tail.size / np.log(tail / (d_min - 0.5)).sum())

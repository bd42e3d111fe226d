"""Appendix-F generator: graph families with *known* pairwise GED.

The paper evaluates scalability on Syn-1/Syn-2 — large graphs where the
GED between every pair is known by construction, because exact GED is
uncomputable at that scale. The construction (Appendix F):

1. Generate a connected template graph (scale-free for Syn-1, uniform
   random for Syn-2).
2. Pick a *modification center* ``v_c``: a vertex whose neighbors have
   pairwise-distinct signatures, so that any minimal edit sequence
   between two variants must map each center-incident edge to itself.
3. Derive each member graph by relabelling a subset of the center's
   incident edges to a fresh sentinel label.

We strengthen step 2 into a guarantee instead of a rejection loop: the
center's neighbors are *assigned* globally-unique vertex labels, which
makes their signatures pairwise distinct at ``s_0`` (the sufficient
condition in Appendix F). With prefix subsets ``S_k = {e_1..e_k}`` of
the center's incident edges, ``GED(g_i, g_j) = |k_i − k_j|`` exactly.
``tests/test_known_ged.py`` validates this against the exact A* GED on
small instances.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.datasets.generators import scale_free_graph, uniform_random_graph
from repro.graphs import Graph

MOD_LABEL = "MOD*"  # sentinel edge label used only by modifications


@dataclass
class KnownGedFamily:
    """A set of graphs with known pairwise GED.

    ``graphs[i]`` has ``levels[i]`` modified center edges, so
    ``GED(graphs[i], graphs[j]) == abs(levels[i] - levels[j])``.
    """

    graphs: list[Graph]
    levels: list[int]
    center: int

    def ged(self, i: int, j: int) -> int:
        """Known exact GED between member ``i`` and member ``j``."""
        return abs(self.levels[i] - self.levels[j])


def _prepare_template(
    n: int, avg_degree: float, n_vlabels: int, n_elabels: int,
    center_degree: int, scale_free: bool, seed: int,
) -> tuple[Graph, int, list[tuple[int, int]]]:
    """Template graph + a guaranteed modification center.

    Ensures the center has degree ≥ ``center_degree`` (adding edges if
    needed), gives its neighbors unique vertex labels, and makes every
    original incident-edge label distinct from :data:`MOD_LABEL`.
    """
    rng = np.random.default_rng(seed)
    vlabels = [f"V{i}" for i in range(n_vlabels)]
    elabels = [f"e{i}" for i in range(n_elabels)]
    gen = scale_free_graph if scale_free else uniform_random_graph
    g = gen(n, avg_degree, vlabels, elabels, seed=seed)
    # Highest-degree vertex becomes the center; top up its degree.
    deg = g.degrees()
    center = int(np.argmax(deg))
    non_nb = [v for v in range(g.n) if v != center and g.edge_label(center, v) is None]
    rng.shuffle(non_nb)
    while deg[center] < center_degree and non_nb:
        g.add_edge(center, non_nb.pop(), str(rng.choice(elabels)))
        deg[center] += 1
    # Unique labels on the center's neighborhood → pairwise-distinct
    # signatures → v_c is a modification center by Appendix F's test.
    nbrs = sorted(g.neighbors(center))
    for i, v in enumerate(nbrs):
        g.vlabels[v] = f"U{i}"
    g.vlabels[center] = "CTR"
    inc = [(min(center, v), max(center, v)) for v in nbrs]
    return g, center, inc


def make_family(
    n: int, *, avg_degree: float = 4.0, n_graphs: int = 12,
    n_vlabels: int = 8, n_elabels: int = 4, center_degree: int = 10,
    scale_free: bool = True, seed: int = 0,
) -> KnownGedFamily:
    """Generate ``n_graphs`` graphs of ``n`` vertices with known GEDs.

    Modification levels cycle through ``0..center_degree`` so the family
    realizes pairwise GEDs spanning ``[0, center_degree]``.
    """
    g, center, inc = _prepare_template(
        n, avg_degree, n_vlabels, n_elabels, center_degree, scale_free, seed
    )
    d = len(inc)
    graphs, levels = [], []
    for i in range(n_graphs):
        k = i % (d + 1)
        gi = g.copy()
        for (u, v) in inc[:k]:
            gi.edges[(u, v)] = MOD_LABEL
        graphs.append(gi)
        levels.append(k)
    return KnownGedFamily(graphs, levels, center)


@dataclass
class SynDataset:
    """Syn-1/Syn-2 analog: one known-GED family per graph size."""

    name: str
    families: dict[int, KnownGedFamily]  # n -> family
    scale_free: bool


def make_syn(
    name: str, *, sizes: tuple[int, ...] = (100, 200, 500, 1000, 2000),
    n_graphs: int = 12, scale_free: bool = True,
    avg_degree: float = 6.0, seed: int = 0,
) -> SynDataset:
    """Build a Syn-1 (scale-free) or Syn-2 (uniform) analog dataset.

    Paper scale: 7 subsets × 500 graphs, n up to 100K, avg degree ≈ 9.5.
    Ours is scaled down (DESIGN.md §5) but keeps the same construction,
    per-size subsets, and scale-free vs uniform contrast.
    """
    fams = {
        n: make_family(
            n, avg_degree=avg_degree, n_graphs=n_graphs,
            scale_free=scale_free, seed=seed + 7919 * n,
        )
        for n in sizes
    }
    return SynDataset(name, fams, scale_free)

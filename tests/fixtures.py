"""Shared test fixtures: the paper's Figure 1 graphs and helpers."""
from __future__ import annotations

import numpy as np

from repro.graphs import Graph


def fig1_g1() -> Graph:
    """Figure 1's G1: vertices A, C, B; edges y, y, z (Examples 1–3)."""
    g = Graph(["A", "C", "B"])  # v1, v2, v3
    g.add_edge(0, 1, "y")
    g.add_edge(0, 2, "y")
    g.add_edge(1, 2, "z")
    return g


def fig1_g2() -> Graph:
    """Figure 1's G2: vertices B, A, A, C; edges x, y, z (Examples 1–3)."""
    g = Graph(["B", "A", "A", "C"])  # u1, u2, u3, u4
    g.add_edge(0, 2, "x")  # u1-u3 : x
    g.add_edge(1, 3, "y")  # u2-u4 : y
    g.add_edge(0, 3, "z")  # u1-u4 : z
    return g


def random_graph(
    n: int, p: float, n_vlabels: int, n_elabels: int, seed: int
) -> Graph:
    """Erdős–Rényi labeled graph for property tests."""
    rng = np.random.default_rng(seed)
    g = Graph([f"V{rng.integers(n_vlabels)}" for _ in range(n)])
    for u in range(n):
        for v in range(u + 1, n):
            if rng.random() < p:
                g.add_edge(u, v, f"e{rng.integers(n_elabels)}")
    return g

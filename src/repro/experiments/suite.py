"""The evaluation suite: all five datasets of Table 2, scaled.

Built once per process and cached — jobs and benchmarks share it.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import lru_cache

from repro.datasets.generators import (
    AIDS_LITE,
    FINGER_LITE,
    GREC_LITE,
    DatasetSpec,
    make_dataset,
)
from repro.datasets.known_ged import SynDataset, make_syn
from repro.graphs import Graph

#: Scaled graph sizes for the Syn datasets (paper: 1K..100K).
SYN_SIZES = (100, 200, 500, 1000, 1500, 2000)
#: Graphs per Syn subset (paper: 500).
SYN_GRAPHS_PER_SIZE = 12

REAL_SPECS: tuple[DatasetSpec, ...] = (AIDS_LITE, FINGER_LITE, GREC_LITE)


@dataclass
class RealDataset:
    """A Table-2 real-dataset stand-in: database + query graphs."""

    spec: DatasetSpec
    db: dict[int, Graph]
    queries: dict[int, Graph]


@lru_cache(maxsize=None)
def real_dataset(name: str, seed: int = 0) -> RealDataset:
    """Generate (cached) one of the real-dataset stand-ins by name."""
    spec = {s.name: s for s in REAL_SPECS}[name]
    db, queries = make_dataset(spec, seed=seed)
    return RealDataset(spec, db, queries)


@lru_cache(maxsize=None)
def syn_dataset(name: str, seed: int = 0) -> SynDataset:
    """Generate (cached) Syn-1 (scale-free) or Syn-2 (uniform)."""
    scale_free = name == "Syn-1"
    return make_syn(
        name,
        sizes=SYN_SIZES,
        n_graphs=SYN_GRAPHS_PER_SIZE,
        scale_free=scale_free,
        avg_degree=6.0,
        seed=seed + (0 if scale_free else 101),
    )


def syn_all_graphs(syn: SynDataset) -> dict[int, Graph]:
    """Flatten a Syn dataset into ``{gid: Graph}`` (gid encodes size)."""
    out: dict[int, Graph] = {}
    gid = 0
    for n in sorted(syn.families):
        for g in syn.families[n].graphs:
            out[gid] = g
            gid += 1
    return out

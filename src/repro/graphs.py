"""In-memory graph model and Spark interchange.

The paper operates on simple labeled undirected graphs (Section 2).
``Graph`` is the driver/executor-side representation used by per-graph
algorithms (exact GED, LSAP, seriation, branch enumeration); the Spark
side represents a *dataset* of graphs as two DataFrames:

- vertices: ``(gid: long, vid: long, vlabel: string)``
- edges:    ``(gid: long, src: long, dst: long, elabel: string)`` with
  ``src < dst`` (undirected, stored once).

``graph_store`` packs each graph into a single JSON payload row so that
per-pair algorithms can run inside ``applyInPandas`` after a join.
"""
from __future__ import annotations

import json
from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T


@dataclass
class Graph:
    """A simple labeled undirected graph.

    Vertices are ``0..n-1``; ``vlabels[i]`` is the label of vertex ``i``.
    ``edges`` maps ``(u, v)`` with ``u < v`` to the edge label.
    """

    vlabels: list[str]
    edges: dict[tuple[int, int], str] = field(default_factory=dict)

    @property
    def n(self) -> int:
        """Number of vertices."""
        return len(self.vlabels)

    @property
    def m(self) -> int:
        """Number of edges."""
        return len(self.edges)

    def add_edge(self, u: int, v: int, label: str) -> None:
        """Insert undirected edge ``{u, v}`` with ``label`` (u != v)."""
        if u == v:
            raise ValueError("self-loops not allowed in simple graphs")
        if not (0 <= u < self.n and 0 <= v < self.n):
            raise ValueError(f"edge ({u},{v}) out of range for n={self.n}")
        self.edges[(min(u, v), max(u, v))] = label

    def edge_label(self, u: int, v: int) -> str | None:
        """Label of edge ``{u, v}``, or ``None`` if absent."""
        return self.edges.get((min(u, v), max(u, v)))

    def degree(self, v: int) -> int:
        """Degree of vertex ``v``."""
        return sum(1 for (a, b) in self.edges if a == v or b == v)

    def degrees(self) -> list[int]:
        """All vertex degrees in O(n + m) (``degree`` is O(m) each)."""
        d = [0] * self.n
        for (a, b) in self.edges:
            d[a] += 1
            d[b] += 1
        return d

    def incident_labels(self, v: int) -> list[str]:
        """Sorted multiset of labels of edges adjacent to ``v`` (N(v))."""
        return sorted(
            lab for (a, b), lab in self.edges.items() if a == v or b == v
        )

    def neighbors(self, v: int) -> list[int]:
        """Vertices adjacent to ``v``."""
        out = []
        for a, b in self.edges:
            if a == v:
                out.append(b)
            elif b == v:
                out.append(a)
        return out

    def branch(self, v: int) -> tuple[str, tuple[str, ...]]:
        """Branch B(v) = (label(v), sorted multiset of incident edge labels)."""
        return (self.vlabels[v], tuple(self.incident_labels(v)))

    def branches(self) -> list[tuple[str, tuple[str, ...]]]:
        """Sorted multiset of all branches in the graph (Definition 2)."""
        return sorted(self.branch(v) for v in range(self.n))

    def branch_signatures(self) -> list[str]:
        """Branch multiset as canonical signature strings (sorted).

        The signature is the string form used on the Spark side:
        ``vlabel + "|" + ",".join(sorted edge labels)``.
        """
        return sorted(
            f"{self.vlabels[v]}|{','.join(self.incident_labels(v))}"
            for v in range(self.n)
        )

    def avg_degree(self) -> float:
        """Average vertex degree (2m/n)."""
        return 2.0 * self.m / self.n if self.n else 0.0

    def copy(self) -> "Graph":
        """Deep copy."""
        return Graph(list(self.vlabels), dict(self.edges))

    # -- serialization ----------------------------------------------------
    def to_payload(self) -> str:
        """Compact JSON payload for shipping a whole graph through Spark."""
        return json.dumps(
            {
                "v": self.vlabels,
                "e": [[u, v, lab] for (u, v), lab in sorted(self.edges.items())],
            },
            separators=(",", ":"),
        )

    @staticmethod
    def from_payload(payload: str) -> "Graph":
        """Inverse of :meth:`to_payload`."""
        d = json.loads(payload)
        return Graph(
            list(d["v"]), {(u, v): lab for u, v, lab in d["e"]}
        )


# -- Spark interchange ----------------------------------------------------

VERTEX_SCHEMA = T.StructType(
    [
        T.StructField("gid", T.LongType(), False),
        T.StructField("vid", T.LongType(), False),
        T.StructField("vlabel", T.StringType(), False),
    ]
)

EDGE_SCHEMA = T.StructType(
    [
        T.StructField("gid", T.LongType(), False),
        T.StructField("src", T.LongType(), False),
        T.StructField("dst", T.LongType(), False),
        T.StructField("elabel", T.StringType(), False),
    ]
)


def graphs_to_dataframes(
    spark: SparkSession, graphs: dict[int, Graph]
) -> tuple[DataFrame, DataFrame]:
    """Convert ``{gid: Graph}`` into (vertices, edges) DataFrames."""
    vrows, erows = [], []
    for gid, g in graphs.items():
        for vid, lab in enumerate(g.vlabels):
            vrows.append((gid, vid, lab))
        for (u, v), lab in g.edges.items():
            erows.append((gid, u, v, lab))
    vdf = spark.createDataFrame(
        pd.DataFrame(vrows, columns=["gid", "vid", "vlabel"]), VERTEX_SCHEMA
    )
    edf = spark.createDataFrame(
        pd.DataFrame(erows, columns=["gid", "src", "dst", "elabel"])
        if erows
        else pd.DataFrame(columns=["gid", "src", "dst", "elabel"]),
        EDGE_SCHEMA,
    )
    return vdf, edf


def graph_store(spark: SparkSession, graphs: dict[int, Graph]) -> DataFrame:
    """DataFrame ``(gid, payload)`` with one JSON-packed graph per row."""
    pdf = pd.DataFrame(
        {
            "gid": list(graphs.keys()),
            "payload": [g.to_payload() for g in graphs.values()],
        }
    )
    return spark.createDataFrame(
        pdf,
        T.StructType(
            [
                T.StructField("gid", T.LongType(), False),
                T.StructField("payload", T.StringType(), False),
            ]
        ),
    )


def dataframes_to_graphs(vdf: DataFrame, edf: DataFrame) -> dict[int, Graph]:
    """Collect (vertices, edges) DataFrames back into ``{gid: Graph}``.

    Vertex ids inside each graph must be ``0..n-1``.
    """
    vp = vdf.toPandas()
    ep = edf.toPandas()
    out: dict[int, Graph] = {}
    for gid, grp in vp.groupby("gid"):
        grp = grp.sort_values("vid")
        if list(grp["vid"]) != list(range(len(grp))):
            raise ValueError(f"gid={gid}: vertex ids are not 0..n-1")
        out[int(gid)] = Graph(list(grp["vlabel"]))
    for gid, grp in ep.groupby("gid"):
        g = out[int(gid)]
        for _, r in grp.iterrows():
            g.add_edge(int(r["src"]), int(r["dst"]), str(r["elabel"]))
    return out

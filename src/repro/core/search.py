"""GBDA graph similarity search (Algorithm 1).

Offline: :func:`build_offline` fits the GBD prior from sampled database
pairs (Spark join) and precomputes the Jeffreys GED prior and Λ1 lookup
tables per extended-graph size (Spark-parallelized over sizes).

Online: :func:`search` scores a query against the whole database with a
single Spark pipeline — broadcast-join GBD (``core.gbd``), then a
vectorized pandas scorer that looks up
``Φ = Σ_{τ≤τ̂} Λ1(τ,φ;v) · Pr[GED=τ] / Pr[GBD=φ]`` and filters
``Φ ≥ γ``.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.branches import branch_counts, graph_sizes
from repro.core.gbd import gbd_query_vs_db
from repro.core.model import BranchModel
from repro.core.priors import (
    ged_prior_table,
    gbd_prior_from_samples,
    sample_pair_gbds,
)
from repro.graphs import Graph, graphs_to_dataframes


@dataclass
class OfflineModel:
    """Precomputed priors and Λ1 tables (Algorithm 1, Step 1).

    ``lam1[v]`` is an array ``(τ̂+1, 3τ̂+1)``. Λ1 vanishes for
    φ > 2τ (τ−x random edges cover ≤ 2(τ−x) vertices, so at most
    x + 2(τ−x) ≤ 2τ branches are touched — Ω2's inclusion–exclusion
    enforces this automatically); the table's 3τ̂ width is the paper's
    looser r-bound, so it is complete with margin. Sizes not seen at
    build time (e.g. a query larger than every database graph) are
    filled lazily by :meth:`ensure_size`.
    """

    tau_hat: int
    n_vlabels: int
    n_elabels: int
    gbd_prior: np.ndarray                      # Pr[GBD=φ], φ ∈ 0..φ_max
    ged_prior: dict[int, np.ndarray] = field(default_factory=dict)
    lam1: dict[int, np.ndarray] = field(default_factory=dict)

    def ensure_size(self, v: int) -> None:
        """Lazily add Λ1 + GED-prior tables for extended size ``v``."""
        if v in self.lam1:
            return
        bm = BranchModel(v, self.n_vlabels, self.n_elabels)
        self.lam1[v] = bm.lam1_table(self.tau_hat, 3 * self.tau_hat)
        self.ged_prior[v] = bm.jeffreys_prior(self.tau_hat)

    def phi_prob(self, phi: int) -> float:
        """Pr[GBD = φ], flooring beyond the tabulated range."""
        if 0 <= phi < len(self.gbd_prior):
            return float(self.gbd_prior[phi])
        return float(self.gbd_prior.min())

    def score(self, v: int, phi: int) -> float:
        """Φ = Pr[GED ≤ τ̂ | GBD = φ] for extended size v (Step 3).

        Clamped to [0, 1]: the paper's Λ2 uses a data-estimated
        Pr[GBD], so the Bayes numerator/denominator are not exactly
        consistent and the raw ratio can exceed 1.
        """
        self.ensure_size(v)
        if phi > 3 * self.tau_hat:
            return 0.0
        lam = self.lam1[v][:, phi]
        raw = float((lam * self.ged_prior[v]).sum() / self.phi_prob(phi))
        return min(max(raw, 0.0), 1.0)


def build_offline(
    spark: SparkSession,
    db: dict[int, Graph],
    *,
    tau_hat: int,
    n_vlabels: int,
    n_elabels: int,
    n_pairs: int = 2000,
    gmm_k: int = 3,
    seed: int = 0,
) -> OfflineModel:
    """Offline stage: GBD prior (sampled pairs → GMM) + per-size tables."""
    gbds = sample_pair_gbds(spark, db, n_pairs, seed=seed)
    phi_max = max(int(gbds.max()), 1) if gbds.size else 1
    gbd_prior = gbd_prior_from_samples(gbds, phi_max, k=gmm_k, seed=seed)
    sizes = sorted({g.n for g in db.values()})
    ged = ged_prior_table(spark, sizes, tau_hat, n_vlabels, n_elabels)
    model = OfflineModel(
        tau_hat=tau_hat,
        n_vlabels=n_vlabels,
        n_elabels=n_elabels,
        gbd_prior=gbd_prior,
        ged_prior=dict(ged.table),
    )
    for v in sizes:
        bm = BranchModel(v, n_vlabels, n_elabels)
        model.lam1[v] = bm.lam1_table(tau_hat, 3 * tau_hat)
    return model


@dataclass
class DatabaseIndex:
    """Precomputed per-database Spark artifacts (branch counts, sizes).

    ``distinct_sizes`` is captured at build time so the online stage
    never needs an extra pass over the database to learn which
    (query, graph) extended sizes it must score.
    """

    branch_cnts: DataFrame
    sizes: DataFrame
    distinct_sizes: tuple[int, ...]

    @staticmethod
    def build(spark: SparkSession, db: dict[int, Graph]) -> "DatabaseIndex":
        vdf, edf = graphs_to_dataframes(spark, db)
        bc = branch_counts(vdf, edf).persist()
        sz = graph_sizes(vdf).persist()
        bc.count(), sz.count()  # materialize once; queries reuse
        return DatabaseIndex(bc, sz, tuple(sorted({g.n for g in db.values()})))

    def unpersist(self) -> None:
        self.branch_cnts.unpersist()
        self.sizes.unpersist()


def score_dataframe(
    gbd_df: DataFrame,
    query_n: int,
    model: OfflineModel,
    db_sizes: tuple[int, ...],
) -> DataFrame:
    """Attach Φ to a ``(gid, n_vertices, gbd)`` DataFrame.

    Λ1/prior tables for every needed extended size (``max(n, query_n)``
    for each distinct database size, known from the index — no extra
    scan) are materialized on the driver (tiny) and shipped to the
    executors inside a ``mapInPandas`` scorer, reducing Step 3 to
    vectorized lookups.
    """
    for v in db_sizes:
        model.ensure_size(max(int(v), query_n))
    lam1_tabs = dict(model.lam1)
    ged_tabs = dict(model.ged_prior)
    spark_model = {
        "tau_hat": model.tau_hat,
        "gbd_prior": model.gbd_prior,
    }

    def scorer(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            phis = pdf["gbd"].to_numpy()
            vs = np.maximum(pdf["n_vertices"].to_numpy(), query_n)
            out = np.empty(len(pdf))
            for i, (v, phi) in enumerate(zip(vs, phis)):
                out[i] = _score_tables(
                    int(v), int(phi), spark_model, lam1_tabs, ged_tabs
                )
            pdf = pdf.copy()
            pdf["phi_score"] = out
            yield pdf

    schema = "gid long, n_vertices long, gbd long, phi_score double"
    return gbd_df.mapInPandas(scorer, schema=schema)


def _score_tables(
    v: int, phi: int, m: dict, lam1_tabs: dict, ged_tabs: dict
) -> float:
    """Pure-table Φ computation used inside the Spark scorer."""
    tau_hat = m["tau_hat"]
    if phi > 3 * tau_hat or v not in lam1_tabs:
        return 0.0
    gbd_prior = m["gbd_prior"]
    pr_phi = (
        float(gbd_prior[phi])
        if 0 <= phi < len(gbd_prior)
        else float(gbd_prior.min())
    )
    raw = float((lam1_tabs[v][:, phi] * ged_tabs[v]).sum() / pr_phi)
    return min(max(raw, 0.0), 1.0)


def search(
    spark: SparkSession,
    query: Graph,
    index: DatabaseIndex,
    model: OfflineModel,
    *,
    gamma: float,
) -> DataFrame:
    """Algorithm 1 online stage: ``(gid, gbd, phi_score)`` with Φ ≥ γ."""
    gbd_df = gbd_query_vs_db(spark, query, index.branch_cnts, index.sizes)
    scored = score_dataframe(
        gbd_df, query.n, model, index.distinct_sizes
    )
    return scored.where(F.col("phi_score") >= gamma).select(
        "gid", "gbd", "phi_score"
    )

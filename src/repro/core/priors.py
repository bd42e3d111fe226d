"""Offline stage (Algorithm 1, Step 1): prior distributions.

- GBD prior (§5.2.1): sample graph pairs from the database, compute
  their GBDs **with the Spark join pipeline** (`core.gbd.gbd_pairs`),
  fit a Gaussian Mixture Model by EM (numpy — no sklearn offline), and
  tabulate ``Pr[GBD = φ]`` by the continuity-correction integral
  (Eq. 15) over [φ−0.5, φ+0.5].
- GED prior (§5.2.2): the Jeffreys prior ``F(τ, |V1'|)`` of Eq. (16),
  computed for every needed ``|V1'|`` **in parallel as Spark tasks**
  (the paper parallelizes this across processes; Table 4 reports the
  per-process time/space costs, which we measure per task here).
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.branches import branch_counts, graph_sizes
from repro.core.gbd import gbd_pairs
from repro.core.model import BranchModel
from repro.graphs import Graph, graphs_to_dataframes

_SQRT2 = math.sqrt(2.0)


# -- Gaussian Mixture Model (1-D, EM) -------------------------------------

@dataclass
class GMM:
    """1-D Gaussian mixture: weights π, means μ, stds σ (Eq. 14)."""

    weights: np.ndarray
    means: np.ndarray
    stds: np.ndarray

    def pdf(self, x: np.ndarray) -> np.ndarray:
        """Mixture density f(φ)."""
        x = np.asarray(x, dtype=float)[..., None]
        z = (x - self.means) / self.stds
        comp = np.exp(-0.5 * z * z) / (self.stds * math.sqrt(2 * math.pi))
        return (self.weights * comp).sum(axis=-1)

    def cdf(self, x: np.ndarray) -> np.ndarray:
        """Mixture CDF via erf."""
        x = np.asarray(x, dtype=float)[..., None]
        z = (x - self.means) / (self.stds * _SQRT2)
        erf = np.vectorize(math.erf)(z)
        return (self.weights * 0.5 * (1.0 + erf)).sum(axis=-1)


def fit_gmm(
    x: np.ndarray, k: int = 3, iters: int = 200, seed: int = 0,
    tol: float = 1e-9,
) -> GMM:
    """Fit a K-component 1-D GMM by EM (deterministic quantile init)."""
    x = np.asarray(x, dtype=float)
    if x.size == 0:
        raise ValueError("cannot fit GMM to empty sample")
    k = min(k, max(1, np.unique(x).size))
    means = np.quantile(x, np.linspace(0.1, 0.9, k))
    stds = np.full(k, max(x.std(), 1e-3))
    weights = np.full(k, 1.0 / k)
    prev = -np.inf
    for _ in range(iters):
        z = (x[:, None] - means) / stds
        logp = (
            -0.5 * z * z
            - np.log(stds)
            - 0.5 * math.log(2 * math.pi)
            + np.log(weights)
        )
        mx = logp.max(axis=1, keepdims=True)
        p = np.exp(logp - mx)
        tot = p.sum(axis=1, keepdims=True)
        resp = p / tot
        ll = float((np.log(tot).squeeze(1) + mx.squeeze(1)).sum())
        nk = resp.sum(axis=0) + 1e-12
        weights = nk / x.size
        means = (resp * x[:, None]).sum(axis=0) / nk
        stds = np.sqrt(
            (resp * (x[:, None] - means) ** 2).sum(axis=0) / nk
        )
        stds = np.maximum(stds, 1e-3)
        if abs(ll - prev) < tol * (1 + abs(ll)):
            break
        prev = ll
    return GMM(weights, means, stds)


def gbd_prior_from_samples(
    gbds: np.ndarray, phi_max: int, k: int = 3, seed: int = 0,
    floor: float = 1e-12,
) -> np.ndarray:
    """``Pr[GBD = φ]`` for φ ∈ {0..phi_max} via GMM + Eq. (15)."""
    gmm = fit_gmm(np.asarray(gbds, dtype=float), k=k, seed=seed)
    phis = np.arange(phi_max + 1, dtype=float)
    pr = gmm.cdf(phis + 0.5) - gmm.cdf(phis - 0.5)
    return np.maximum(pr, floor)


# -- Spark pipelines -------------------------------------------------------

def sample_pair_gbds(
    spark: SparkSession, graphs: dict[int, Graph], n_pairs: int,
    seed: int = 0,
) -> np.ndarray:
    """GBDs of ``n_pairs`` random graph pairs, via the Spark GBD join.

    This is Steps 1.1–1.2 of the offline stage (§6.3.1).
    """
    gids = np.array(sorted(graphs))
    rng = np.random.default_rng(seed)
    a = rng.choice(gids, size=n_pairs)
    b = rng.choice(gids, size=n_pairs)
    keep = a != b
    pairs_pdf = pd.DataFrame(
        {"gid1": a[keep], "gid2": b[keep]}
    ).drop_duplicates()
    pairs = spark.createDataFrame(pairs_pdf, "gid1 long, gid2 long")
    vdf, edf = graphs_to_dataframes(spark, graphs)
    bc = branch_counts(vdf, edf)
    sizes = graph_sizes(vdf)
    out = gbd_pairs(pairs, bc, sizes).toPandas()
    return out["gbd"].to_numpy()


@dataclass
class GedPriorResult:
    """GED prior per extended-graph size, with per-task cost telemetry."""

    table: dict[int, np.ndarray]  # v -> Pr[GED=τ], τ ∈ 0..τ̂
    task_seconds: dict[int, float]
    task_bytes: dict[int, int]


def ged_prior_table(
    spark: SparkSession, vs: list[int], tau_hat: int,
    n_vlabels: int, n_elabels: int,
) -> GedPriorResult:
    """Jeffreys GED prior F(τ, v) for every v, one Spark task per v.

    Mirrors the paper's fully-parallelized offline computation; each
    task measures its own wall time and result size for Table 4.
    """
    vs = sorted(set(int(v) for v in vs))

    def compute(v: int):
        t0 = time.perf_counter()
        prior = BranchModel(v, n_vlabels, n_elabels).jeffreys_prior(tau_hat)
        dt = time.perf_counter() - t0
        return v, prior.tolist(), dt, prior.nbytes

    rows = (
        spark.sparkContext.parallelize(vs, numSlices=len(vs))
        .map(compute)
        .collect()
    )
    return GedPriorResult(
        table={v: np.array(p) for v, p, _, _ in rows},
        task_seconds={v: dt for v, _, dt, _ in rows},
        task_bytes={v: nb for v, _, _, nb in rows},
    )

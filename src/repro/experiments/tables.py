"""Tables 2–4 of the paper's evaluation (§7.1–§7.2).

- Table 2: dataset statistics (ours vs the paper's, side by side);
- Table 3: time/space of computing the GBD prior distribution;
- Table 4: time/space of computing the GED (Jeffreys) prior
  distribution, with per-parallel-task breakdown (ΣT, ΣS, max T, max S)
  exactly as the paper reports.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.priors import gbd_prior_from_samples, ged_prior_table, sample_pair_gbds
from repro.datasets.generators import dataset_stats, degree_tail_exponent
from repro.experiments.suite import (
    REAL_SPECS,
    SYN_SIZES,
    real_dataset,
    syn_all_graphs,
    syn_dataset,
)

#: Paper's Table 2, verbatim, for side-by-side comparison.
PAPER_TABLE2 = {
    "AIDS": dict(D=1896, Q=100, V_m=95, E_m=103, d=2.1, scale_free="Yes"),
    "Finger": dict(D=2159, Q=114, V_m=26, E_m=26, d=1.7, scale_free="Yes"),
    "GREC": dict(D=1045, Q=55, V_m=24, E_m=29, d=2.1, scale_free="Yes"),
    "Syn-1": dict(D=3430, Q=70, V_m=100_000, E_m=1_000_000, d=9.6, scale_free="Yes"),
    "Syn-2": dict(D=3430, Q=70, V_m=100_000, E_m=1_000_000, d=9.4, scale_free="No"),
}

ALL_DATASETS = ("AIDS", "Finger", "GREC", "Syn-1", "Syn-2")


def dataset_graphs(name: str, seed: int = 0):
    """All database graphs of a suite dataset as ``{gid: Graph}``."""
    if name in ("Syn-1", "Syn-2"):
        return syn_all_graphs(syn_dataset(name, seed))
    return real_dataset(name, seed).db


def table2(seed: int = 0) -> pd.DataFrame:
    """Table 2: statistics of (scaled) datasets, paper numbers attached."""
    rows = []
    for name in ALL_DATASETS:
        if name in ("Syn-1", "Syn-2"):
            graphs = dataset_graphs(name, seed)
            n_q = len(SYN_SIZES)  # one query per subset in our harness
        else:
            ds = real_dataset(name, seed)
            graphs = ds.db
            n_q = len(ds.queries)
        st = dataset_stats(graphs)
        tail = degree_tail_exponent(graphs)
        paper = PAPER_TABLE2[name]
        rows.append(
            {
                "dataset": name,
                "|D|": st["count"],
                "|Q|": n_q,
                "V_m": st["V_m"],
                "E_m": st["E_m"],
                "d": st["avg_degree"],
                "tail_exp": round(tail, 2),
                "scale_free": paper["scale_free"],
                "paper_|D|": paper["D"],
                "paper_|Q|": paper["Q"],
                "paper_V_m": paper["V_m"],
                "paper_E_m": paper["E_m"],
                "paper_d": paper["d"],
            }
        )
    return pd.DataFrame(rows)


def table3(
    spark: SparkSession, n_pairs: int = 5000, gmm_k: int = 3, seed: int = 0
) -> pd.DataFrame:
    """Table 3: costs of computing the GBD prior per dataset.

    Time = wall clock of sampling pairs + Spark GBD join + GMM fit +
    continuity-correction integral (Steps 1.1–1.4). Space = bytes of
    the stored prior table plus GMM parameters (what the online stage
    keeps), matching the paper's 'space costs' of this artifact.
    """
    rows = []
    for name in ALL_DATASETS:
        graphs = dataset_graphs(name, seed)
        t0 = time.perf_counter()
        gbds = sample_pair_gbds(spark, graphs, n_pairs, seed=seed)
        phi_max = int(gbds.max()) if gbds.size else 1
        prior = gbd_prior_from_samples(gbds, phi_max, k=gmm_k, seed=seed)
        dt = time.perf_counter() - t0
        rows.append(
            {
                "dataset": name,
                "pairs_sampled": int(gbds.size),
                "time_s": round(dt, 2),
                "space_bytes": int(prior.nbytes + 3 * gmm_k * 8),
            }
        )
    return pd.DataFrame(rows)


def table4(
    spark: SparkSession, tau_hat: int = 5, seed: int = 0,
    n_vlabels: int = 8, n_elabels: int = 4,
) -> pd.DataFrame:
    """Table 4: costs of the GED prior, one parallel task per |V1'|.

    Reports ΣT_i / ΣS_i (all-task totals) and max T_i / max S_i, as the
    paper does; the realized wall/space costs under full parallelism
    are max T_i and ΣS_i respectively (§7.2).
    """
    rows = []
    for name in ALL_DATASETS:
        graphs = dataset_graphs(name, seed)
        sizes = sorted({g.n for g in graphs.values()})
        res = ged_prior_table(spark, sizes, tau_hat, n_vlabels, n_elabels)
        ts = list(res.task_seconds.values())
        bs = list(res.task_bytes.values())
        rows.append(
            {
                "dataset": name,
                "n_tasks": len(sizes),
                "sum_T_s": round(sum(ts), 3),
                "sum_S_bytes": int(sum(bs)),
                "max_T_s": round(max(ts), 4),
                "max_S_bytes": int(max(bs)),
            }
        )
    return pd.DataFrame(rows)

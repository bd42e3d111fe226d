"""Effectiveness: precision / recall / F1 (tables behind Figs 17–29).

Ground truth on the real-dataset stand-ins is the exact GED (bounded
A*, computed distributively); pairs whose exact search exceeds its
expansion budget are excluded and counted, never guessed. On the Syn
datasets ground truth is known by construction (Appendix F).

Predictions: GBDA returns the graphs with Φ ≥ γ (Algorithm 1); each
competitor returns the graphs whose estimated GED ≤ τ̂ (the paper's
protocol — the competitors have no probability knob).

For parameter sweeps the harness computes every query-database GBD in
one Spark pass (``gbd_pairs``) and evaluates Φ from the precomputed
(v, φ) model tables — numerically identical to running ``search`` per
query (covered by unit tests), without per-query job overhead.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.spark_runner import estimate_pairs
from repro.core.branches import branch_counts, graph_sizes
from repro.core.gbd import gbd_pairs
from repro.core.search import build_offline
from repro.experiments.suite import real_dataset, syn_dataset
from repro.graphs import Graph, graphs_to_dataframes

BASELINES = ("lsap", "greedy", "seriation")


def prf(pred: set, truth: set) -> tuple[float, float, float]:
    """Precision / recall / F1 with the empty-set conventions.

    Empty prediction and empty truth is a perfect query (1, 1, 1);
    empty prediction against non-empty truth scores precision 1 (no
    false positives) but recall 0.
    """
    tp = len(pred & truth)
    p = tp / len(pred) if pred else 1.0
    r = tp / len(truth) if truth else 1.0
    f = 2 * p * r / (p + r) if (p + r) else 0.0
    return p, r, f


def pairwise_gbd(
    spark: SparkSession,
    queries: dict[int, Graph],
    db: dict[int, Graph],
) -> dict[tuple[int, int], int]:
    """GBD for every (qid, gid) pair in one Spark join pass."""
    graphs = dict(db)
    graphs.update(queries)
    vdf, edf = graphs_to_dataframes(spark, graphs)
    bc = branch_counts(vdf, edf)
    sizes = graph_sizes(vdf)
    plist = [(qid, gid) for qid in queries for gid in db]
    pairs = spark.createDataFrame(
        pd.DataFrame(plist, columns=["gid1", "gid2"]), "gid1 long, gid2 long"
    )
    out = gbd_pairs(pairs, bc, sizes).toPandas()
    return {
        (int(r["gid1"]), int(r["gid2"])): int(r["gbd"])
        for _, r in out.iterrows()
    }


def ground_truth_real(
    spark: SparkSession,
    name: str,
    tau_max: int,
    n_queries: int,
    seed: int = 0,
    max_expansions: int = 200_000,
) -> tuple[dict[int, dict[int, float]], int]:
    """Exact GEDs (≤ tau_max, else +inf) per query: ``{qid: {gid: ged}}``.

    Returns the table and the count of excluded (budget-exceeded) pairs.
    """
    ds = real_dataset(name, seed)
    qids = sorted(ds.queries)[:n_queries]
    pairs = [(qid, gid) for qid in qids for gid in ds.db]
    graphs = dict(ds.db)
    graphs.update({qid: ds.queries[qid] for qid in qids})
    out = estimate_pairs(
        spark, pairs, graphs, "exact",
        limit=tau_max, max_expansions=max_expansions,
    ).toPandas()
    truth: dict[int, dict[int, float]] = {qid: {} for qid in qids}
    excluded = 0
    for _, r in out.iterrows():
        if pd.isna(r["est"]):
            excluded += 1
            continue
        truth[int(r["qid"])][int(r["gid"])] = float(r["est"])
    return truth, excluded


def _row(name, tau_hat, method, gamma, scores, excluded):
    n = len(scores)
    return {
        "dataset": name,
        "tau_hat": tau_hat,
        "method": method,
        "gamma": gamma,
        "precision": round(sum(s[0] for s in scores) / n, 3),
        "recall": round(sum(s[1] for s in scores) / n, 3),
        "f1": round(sum(s[2] for s in scores) / n, 3),
        "excluded_pairs": excluded,
    }


def effectiveness_real(
    spark: SparkSession,
    name: str,
    tau_hats: tuple[int, ...] = (1, 2, 3, 4, 5),
    gammas: tuple[float, ...] = (0.7, 0.8, 0.9),
    n_queries: int = 5,
    n_pairs: int = 2000,
    seed: int = 0,
) -> pd.DataFrame:
    """Figs 17–25 analog for one dataset.

    Rows: (dataset, τ̂, method, γ) → macro-averaged precision / recall /
    F1 over queries. Baselines have γ = NaN.
    """
    ds = real_dataset(name, seed)
    qids = sorted(ds.queries)[:n_queries]
    queries = {qid: ds.queries[qid] for qid in qids}
    tau_max = max(tau_hats)
    truth_ged, excluded = ground_truth_real(
        spark, name, tau_max, n_queries, seed
    )
    known = {qid: set(t) for qid, t in truth_ged.items()}
    gbd = pairwise_gbd(spark, queries, ds.db)

    # Competitor estimates: one distributed pass per method.
    base_est: dict[str, dict[int, dict[int, float]]] = {}
    pairs = [(qid, gid) for qid in qids for gid in ds.db]
    graphs = dict(ds.db)
    graphs.update(queries)
    for m in BASELINES:
        pdf = estimate_pairs(spark, pairs, graphs, m).toPandas()
        table: dict[int, dict[int, float]] = {qid: {} for qid in qids}
        for _, r in pdf.iterrows():
            if not pd.isna(r["est"]):
                table[int(r["qid"])][int(r["gid"])] = float(r["est"])
        base_est[m] = table

    rows = []
    for tau_hat in tau_hats:
        model = build_offline(
            spark, ds.db, tau_hat=tau_hat,
            n_vlabels=ds.spec.n_vlabels, n_elabels=ds.spec.n_elabels,
            n_pairs=n_pairs, seed=seed,
        )
        truth_sets = {
            qid: {g for g, d in truth_ged[qid].items() if d <= tau_hat}
            for qid in qids
        }
        for gamma in gammas:
            scores = []
            for qid in qids:
                qn = queries[qid].n
                pred = {
                    gid
                    for gid in known[qid]
                    if model.score(
                        max(qn, ds.db[gid].n), gbd[(qid, gid)]
                    )
                    >= gamma
                }
                scores.append(prf(pred, truth_sets[qid]))
            rows.append(_row(name, tau_hat, "gbda", gamma, scores, excluded))
        for m in BASELINES:
            scores = []
            for qid in qids:
                pred = {
                    g
                    for g, d in base_est[m][qid].items()
                    if d <= tau_hat and g in known[qid]
                }
                scores.append(prf(pred, truth_sets[qid]))
            rows.append(_row(name, tau_hat, m, float("nan"), scores, excluded))
    return pd.DataFrame(rows)


def accuracy_vs_n(
    spark: SparkSession,
    name: str = "Syn-1",
    tau_hats: tuple[int, ...] = (3, 4, 5, 6),
    gammas: tuple[float, ...] = (0.7, 0.8, 0.9),
    seed: int = 0,
) -> pd.DataFrame:
    """Figs 26–29 analog: GBDA precision/recall/F1 vs subset size n.

    Ground truth is the Appendix-F construction's known GED, so this
    runs at sizes where exact GED is uncomputable — the experiment the
    paper built Syn-1/Syn-2 for. Every family member queries the whole
    subset.
    """
    syn = syn_dataset(name, seed)
    rows = []
    for n in sorted(syn.families):
        fam = syn.families[n]
        db = {i: g for i, g in enumerate(fam.graphs)}
        gbd = pairwise_gbd(spark, db, db)
        for tau_hat in tau_hats:
            model = build_offline(
                spark, db, tau_hat=tau_hat, n_vlabels=16, n_elabels=8,
                n_pairs=200, seed=seed,
            )
            truth = {
                i: {j for j in db if fam.ged(i, j) <= tau_hat} for i in db
            }
            for gamma in gammas:
                scores = []
                for i in db:
                    pred = {
                        j
                        for j in db
                        if model.score(n, gbd[(i, j)]) >= gamma
                    }
                    scores.append(prf(pred, truth[i]))
                r = _row(name, tau_hat, "gbda", gamma, scores, 0)
                r["n"] = n
                rows.append(r)
    return pd.DataFrame(rows)

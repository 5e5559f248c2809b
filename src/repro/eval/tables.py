"""Experiment harnesses — one function per paper table / figure-claim.

Each harness returns plain rows (list[dict] / DataFrame) that the
``jobs/`` entrypoints print as markdown next to the paper's numbers;
EXPERIMENTS.md records both. Everything runs on JD-lite synthetic
graphs (DESIGN.md §2) at a configurable ``scale``.
"""
from __future__ import annotations

import os
import time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.fbox import fbox_scores
from repro.baselines.fraudar import fraudar, fraudar_points
from repro.baselines.spoken import spoken_scores
from repro.core.ensemble import ensemfdet
from repro.core.fdet import fdet
from repro.core.sampling import sample_local
from repro.eval.metrics import prf, score_sweep, threshold_sweep
from repro.graph.bipartite import BipartiteGraph
from repro.synth_data import JD_PRESETS, jd_transactions

PRESETS = ("jd1", "jd2", "jd3")

#: Paper Table III wall-clock seconds (S=0.1, N=80; FRAUDAR K=30).
PAPER_TABLE3 = {
    "jd1": {"ensemfdet": 74.127, "fraudar": 805.533},
    "jd2": {"ensemfdet": 162.102, "fraudar": 2365.659},
    "jd3": {"ensemfdet": 470.508, "fraudar": 5681.591},
}


def _graph(preset: str, scale: float, seed: int = 0):
    edges, users, meta = jd_transactions(preset, scale, seed)
    g = BipartiteGraph.from_pandas(
        edges, n_u=meta["n_pin"], n_v=meta["n_merchant"]
    )
    truth = users.loc[users["is_fraud"], "pin"].to_numpy()
    return edges, g, truth, meta


# ------------------------------------------------------------------ Table I
def table1_rows(scale: float = 0.05, seed: int = 0) -> list[dict]:
    """Dataset statistics: paper counts vs the generated JD-lite counts."""
    rows = []
    for preset in PRESETS:
        _, _, truth, meta = _graph(preset, scale, seed)
        paper = JD_PRESETS[preset]
        rows.append(
            dict(
                dataset=preset,
                paper_pin=paper["n_pin"],
                paper_fraud=paper["n_fraud"],
                paper_merchant=paper["n_merchant"],
                paper_edge=paper["n_edge"],
                gen_pin=meta["n_pin"],
                gen_fraud=int(len(truth)),
                gen_merchant=meta["n_merchant"],
                gen_edge=meta["n_edge"],
                scale=scale,
            )
        )
    return rows


# ----------------------------------------------------------------- Table II
def table2_rows() -> list[dict]:
    """Parameter glossary (Table II is definitional, not measured)."""
    return [
        dict(parameter="N", description="Number of sampled graphs"),
        dict(parameter="S", description="Sample ratio"),
        dict(parameter="T", description="Voting threshold in aggregation method"),
        dict(parameter="R", description="The repetition rate R = S x N (derived)"),
    ]


# ---------------------------------------------------------------- Table III
def table3_rows(
    spark: SparkSession,
    scale: float = 0.05,
    s: float = 0.1,
    n: int = 80,
    k_fraudar: int = 30,
    seed: int = 0,
) -> list[dict]:
    """Running-time comparison EnsemFDet vs FRAUDAR (paper Table III).

    Same parameters as the paper (S=0.1, N=80; FRAUDAR K=30) on JD-lite
    graphs at ``scale``. Absolute seconds are not comparable with the
    authors' cluster; the shape claim is the speedup factor (~10x in
    the paper) and near-linear growth in |E|.

    The paper's cluster solves all N samples concurrently; this box has
    ~16 cores, so N=80 runs in ~5 sequential task waves. The extra
    column ``ensemfdet_1wave_sec`` measures an N = (#cores) run — every
    sample genuinely concurrent, i.e. the per-wave wall time the
    paper's ≥N-core setting would see (the paper's Fig. 7 shows
    detection quality is stable across N ∈ {10..80}).
    """
    n_wave = max(2, min(n, (os.cpu_count() or 16)))
    rows = []
    for preset in PRESETS:
        edges, g, truth, meta = _graph(preset, scale, seed)
        edges_df = spark.createDataFrame(edges).repartition(max(8, n // 8)).cache()
        edges_df.count()

        t0 = time.perf_counter()
        run = ensemfdet(spark, edges_df, method="RES", s=s, n=n, seed=seed)
        t_ens = time.perf_counter() - t0
        run.votes.unpersist()

        t0 = time.perf_counter()
        run1 = ensemfdet(spark, edges_df, method="RES", s=s, n=n_wave, seed=seed)
        t_ens1 = time.perf_counter() - t0
        run1.votes.unpersist()

        t0 = time.perf_counter()
        fraudar(g, k=k_fraudar)
        t_fra = time.perf_counter() - t0

        edges_df.unpersist()
        rows.append(
            dict(
                dataset=preset,
                n_edges=meta["n_edge"],
                ensemfdet_sec=round(t_ens, 3),
                ensemfdet_1wave_sec=round(t_ens1, 3),
                fraudar_sec=round(t_fra, 3),
                speedup=round(t_fra / t_ens, 2) if t_ens > 0 else float("inf"),
                speedup_1wave=round(t_fra / t_ens1, 2) if t_ens1 > 0 else float("inf"),
                paper_ensemfdet_sec=PAPER_TABLE3[preset]["ensemfdet"],
                paper_fraudar_sec=PAPER_TABLE3[preset]["fraudar"],
                paper_speedup=round(
                    PAPER_TABLE3[preset]["fraudar"] / PAPER_TABLE3[preset]["ensemfdet"], 2
                ),
            )
        )
    return rows


# ------------------------------------------------------- figure-shape claims
def fig1_block_scores(
    preset: str = "jd3", scale: float = 0.01, s: float = 0.1, n_curves: int = 5, seed: int = 0
) -> pd.DataFrame:
    """Per-block φ sequences on several sampled graphs (Fig. 1 data)."""
    _, g, _, _ = _graph(preset, scale, seed)
    rows = []
    for i in range(n_curves):
        sub = sample_local(g, "RES", s, seed=seed + i)
        res = fdet(sub.relabeled()[0], truncate=False, k_max=20)
        for j, phi in enumerate(res.phis, start=1):
            rows.append(dict(sample=i, block=j, phi=float(phi)))
    return pd.DataFrame(rows)


def method_comparison(
    spark: SparkSession,
    preset: str,
    scale: float = 0.01,
    s: float = 0.1,
    n: int = 40,
    seed: int = 0,
) -> pd.DataFrame:
    """All five methods on one dataset (Fig. 3 / Fig. 4 data).

    Returns the best-F1 operating point per method plus curve metadata
    (EnsemFDet: T sweep; FRAUDAR: per-top-j-blocks points; SPOKEN/FBox:
    score-quantile sweeps).
    """
    edges, g, truth, meta = _graph(preset, scale, seed)
    edges_df = spark.createDataFrame(edges)
    rows = []

    run = ensemfdet(spark, edges_df, method="RES", s=s, n=n, seed=seed)
    sweep = threshold_sweep(run.pin_votes(), truth, np.arange(1, n + 1))
    run.votes.unpersist()
    best = sweep.loc[sweep["f1"].idxmax()]
    rows.append(
        dict(method="EnsemFDet", precision=best["precision"], recall=best["recall"],
             f1=best["f1"], n_detected=int(best["n_detected"]), curve_points=len(sweep))
    )

    fres = fraudar(g, k=30)
    best_f = (0.0, 0.0, 0.0, 0)
    for pt in fraudar_points(fres):
        p, r, f1 = prf(pt["pins"], truth)
        if f1 > best_f[2]:
            best_f = (p, r, f1, pt["n_detected"])
    rows.append(
        dict(method="FRAUDAR", precision=best_f[0], recall=best_f[1], f1=best_f[2],
             n_detected=best_f[3], curve_points=len(fres.blocks))
    )

    for name, scores in (
        ("SPOKEN", spoken_scores(g)[0]),
        ("FBox", fbox_scores(g)[0]),
    ):
        sw = score_sweep(scores, truth)
        best_s = sw.loc[sw["f1"].idxmax()] if len(sw) else None
        rows.append(
            dict(method=name,
                 precision=float(best_s["precision"]) if best_s is not None else 0.0,
                 recall=float(best_s["recall"]) if best_s is not None else 0.0,
                 f1=float(best_s["f1"]) if best_s is not None else 0.0,
                 n_detected=int(best_s["n_detected"]) if best_s is not None else 0,
                 curve_points=len(sw))
        )
    out = pd.DataFrame(rows)
    out.insert(0, "dataset", preset)
    return out


def sampling_comparison(
    spark: SparkSession,
    preset: str = "jd3",
    scale: float = 0.01,
    s: float = 0.1,
    r: float = 8.0,
    seed: int = 0,
    generator_kwargs: dict | None = None,
) -> pd.DataFrame:
    """Best-F1 per sampling method at fixed repetition rate R (Fig. 5).

    The paper uses dataset 3, S=0.1, R=8 (so N = R/S = 80). TNS keeps
    ~S² of the edges at per-side ratio S; the paper's §IV-A4 says "we
    usually need to enlarge the sampling ratio S … to ensure the
    effectiveness of the two-sides sample", so TNS runs at per-side
    ratio √S (matching the other methods' edge fraction), as they
    prescribe.

    ``generator_kwargs`` lets the caller reshape the planted blocks'
    degree profile — the paper's ONS-PIN-worst finding is a property of
    *their* dataset's D_avg(Merchant) ≫ D_avg(PIN) profile (§V-C2), and
    a low-pin-degree/high-merchant-degree profile reproduces it.
    """
    n = int(round(r / s))
    edges, users, meta = jd_transactions(preset, scale, seed, **(generator_kwargs or {}))
    truth = users.loc[users["is_fraud"], "pin"].to_numpy()
    edges_df = spark.createDataFrame(edges).cache()
    edges_df.count()
    rows = []
    for method in ("RES", "ONS_PIN", "ONS_MERCHANT", "TNS"):
        s_eff = float(np.sqrt(s)) if method == "TNS" else s
        run = ensemfdet(spark, edges_df, method=method, s=s_eff, n=n, seed=seed)
        sweep = threshold_sweep(run.pin_votes(), truth, np.arange(1, n + 1))
        run.votes.unpersist()
        if len(sweep) == 0 or sweep["f1"].max() == 0:
            rows.append(dict(method=method, precision=0.0, recall=0.0, f1=0.0, n_detected=0))
            continue
        best = sweep.loc[sweep["f1"].idxmax()]
        rows.append(
            dict(method=method, precision=best["precision"], recall=best["recall"],
                 f1=best["f1"], n_detected=int(best["n_detected"]))
        )
    edges_df.unpersist()
    out = pd.DataFrame(rows)
    out.insert(0, "dataset", preset)
    return out


def truncation_comparison(
    spark: SparkSession,
    preset: str = "jd1",
    scale: float = 0.01,
    s: float = 0.1,
    n: int = 40,
    k_fix: int = 30,
    seed: int = 0,
) -> pd.DataFrame:
    """EnsemFDet (truncating point) vs EnsemFDet-FIX-K (Fig. 6).

    FIX-K is the same pipeline with truncation disabled and k fixed —
    implemented by setting ``phi_stop_frac=0`` and a solver that keeps
    all ``k_fix`` blocks. Also records the max k̂ observed (paper: all
    < 15 with truncation).
    """
    edges, g, truth, _ = _graph(preset, scale, seed)
    edges_df = spark.createDataFrame(edges).cache()
    edges_df.count()
    rows = []

    run = ensemfdet(spark, edges_df, method="RES", s=s, n=n, seed=seed, k_max=k_fix)
    sweep = threshold_sweep(run.pin_votes(), truth, np.arange(1, n + 1))
    run.votes.unpersist()
    best = sweep.loc[sweep["f1"].idxmax()]
    rows.append(
        dict(variant="EnsemFDet (truncated)", precision=best["precision"],
             recall=best["recall"], f1=best["f1"], n_detected=int(best["n_detected"]))
    )

    # FIX-K: per-sample k̂ observed locally for the record, then the
    # fixed-k ensemble via a local emulation of the same vote pipeline.
    k_hats, votes = [], {}
    for i in range(n):
        sub = sample_local(g, "RES", s, seed=seed + i)
        compact, uids, _ = sub.relabeled()
        res_tr = fdet(compact, k_max=k_fix, truncate=True)
        k_hats.append(res_tr.k_hat)
        res_fx = fdet(compact, k_max=k_fix, truncate=False)
        for pin in uids[res_fx.detected_users(k=k_fix)]:
            votes[pin] = votes.get(pin, 0) + 1
    pv = pd.DataFrame({"node": list(votes), "votes": list(votes.values())})
    sweep_fx = threshold_sweep(pv, truth, np.arange(1, n + 1))
    best_fx = sweep_fx.loc[sweep_fx["f1"].idxmax()]
    rows.append(
        dict(variant=f"EnsemFDet-FIX-K (k={k_fix})", precision=best_fx["precision"],
             recall=best_fx["recall"], f1=best_fx["f1"], n_detected=int(best_fx["n_detected"]))
    )
    edges_df.unpersist()
    out = pd.DataFrame(rows)
    out.insert(0, "dataset", preset)
    out["max_k_hat"] = max(k_hats)
    return out


def n_sweep(
    spark: SparkSession,
    preset: str = "jd3",
    scale: float = 0.01,
    s: float = 0.1,
    ns: tuple[int, ...] = (10, 20, 40, 80),
    seed: int = 0,
) -> pd.DataFrame:
    """Best-F1 vs number of samples N at fixed S (Fig. 7)."""
    edges, _, truth, _ = _graph(preset, scale, seed)
    edges_df = spark.createDataFrame(edges).cache()
    edges_df.count()
    rows = []
    for n in ns:
        run = ensemfdet(spark, edges_df, method="RES", s=s, n=n, seed=seed)
        sweep = threshold_sweep(run.pin_votes(), truth, np.arange(1, n + 1))
        run.votes.unpersist()
        best = sweep.loc[sweep["f1"].idxmax()]
        rows.append(dict(N=n, S=s, precision=best["precision"], recall=best["recall"],
                         f1=best["f1"], n_detected=int(best["n_detected"])))
    edges_df.unpersist()
    out = pd.DataFrame(rows)
    out.insert(0, "dataset", preset)
    return out


def s_sweep(
    spark: SparkSession,
    preset: str = "jd3",
    scale: float = 0.01,
    ss: tuple[float, ...] = (0.01, 0.05, 0.1),
    r: float = 1.0,
    seed: int = 0,
) -> pd.DataFrame:
    """Best-F1 vs sample ratio S at fixed repetition rate R = S·N (Fig. 8)."""
    edges, _, truth, _ = _graph(preset, scale, seed)
    edges_df = spark.createDataFrame(edges).cache()
    edges_df.count()
    rows = []
    for s in ss:
        n = max(1, int(round(r / s)))
        run = ensemfdet(spark, edges_df, method="RES", s=s, n=n, seed=seed)
        sweep = threshold_sweep(run.pin_votes(), truth, np.arange(1, n + 1))
        run.votes.unpersist()
        best = sweep.loc[sweep["f1"].idxmax()]
        rows.append(dict(S=s, N=n, precision=best["precision"], recall=best["recall"],
                         f1=best["f1"], n_detected=int(best["n_detected"])))
    edges_df.unpersist()
    out = pd.DataFrame(rows)
    out.insert(0, "dataset", preset)
    return out


def threshold_analysis(
    spark: SparkSession,
    preset: str = "jd3",
    scale: float = 0.01,
    s: float = 0.1,
    n: int = 80,
    seed: int = 0,
) -> pd.DataFrame:
    """Full T sweep at S=0.1, N=80 (Fig. 9): P↑, R↓ monotone in T."""
    edges, _, truth, _ = _graph(preset, scale, seed)
    edges_df = spark.createDataFrame(edges)
    run = ensemfdet(spark, edges_df, method="RES", s=s, n=n, seed=seed)
    sweep = threshold_sweep(run.pin_votes(), truth, np.arange(1, n + 1))
    run.votes.unpersist()
    sweep.insert(0, "dataset", preset)
    return sweep


def format_markdown(rows: list[dict] | pd.DataFrame, floatfmt: int = 4) -> str:
    """Render rows as a GitHub markdown table (no external deps)."""
    df = pd.DataFrame(rows)
    df = df.round(floatfmt)
    header = "| " + " | ".join(map(str, df.columns)) + " |"
    sep = "|" + "|".join(["---"] * len(df.columns)) + "|"
    body = ["| " + " | ".join(str(x) for x in rec) + " |" for rec in df.itertuples(index=False)]
    return "\n".join([header, sep, *body])

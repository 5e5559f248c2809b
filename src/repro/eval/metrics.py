"""Detection metrics against the blacklist ground truth (paper §V-B1).

The paper evaluates detected PIN sets with Precision / Recall / F1
("Accuracy … seems not very significant, because the proportion of
fraud samples is quite low"). Local numpy versions drive the curve
sweeps; a Spark version computes the same numbers with DataFrame joins
so tests can oracle-check the aggregation against DuckDB SQL.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def prf(detected: np.ndarray, truth: np.ndarray) -> tuple[float, float, float]:
    """(precision, recall, f1) of a detected id set vs a ground-truth id set."""
    detected = np.unique(np.asarray(detected, dtype=np.int64))
    truth = np.unique(np.asarray(truth, dtype=np.int64))
    if len(detected) == 0:
        return 0.0, 0.0, 0.0
    tp = len(np.intersect1d(detected, truth, assume_unique=True))
    precision = tp / len(detected)
    recall = tp / len(truth) if len(truth) else 0.0
    return precision, recall, f1_score(precision, recall)


def f1_score(precision: float, recall: float) -> float:
    """Harmonic mean, 0 when both are 0."""
    return 0.0 if precision + recall == 0 else 2 * precision * recall / (precision + recall)


def prf_spark(
    detected: DataFrame, labels: DataFrame
) -> tuple[float, float, float]:
    """Spark-side P/R/F1.

    ``detected``: DataFrame with a ``node`` column of flagged pins.
    ``labels``: DataFrame (pin, is_fraud) covering all pins.
    """
    d = detected.select(F.col("node").alias("pin")).distinct()
    joined = d.join(labels, "pin", "left")
    n_detected = joined.count()
    if n_detected == 0:
        return 0.0, 0.0, 0.0
    tp = joined.where(F.col("is_fraud")).count()
    n_truth = labels.where(F.col("is_fraud")).count()
    precision = tp / n_detected
    recall = tp / n_truth if n_truth else 0.0
    return precision, recall, f1_score(precision, recall)


def threshold_sweep(
    pin_votes: pd.DataFrame, truth: np.ndarray, thresholds: np.ndarray | list[int]
) -> pd.DataFrame:
    """Sweep the MVA threshold T over a (node, votes) table.

    Returns one row per T with n_detected / precision / recall / f1 —
    the data behind Figs. 4, 7, 8 and 9 (x-axis either T or
    n_detected).
    """
    truth = np.unique(np.asarray(truth, dtype=np.int64))
    nodes = pin_votes["node"].to_numpy()
    votes = pin_votes["votes"].to_numpy()
    rows = []
    for t in thresholds:
        det = nodes[votes >= t]
        p, r, f1 = prf(det, truth)
        rows.append(
            dict(T=int(t), n_detected=int(len(det)), precision=p, recall=r, f1=f1)
        )
    return pd.DataFrame(rows)


def score_sweep(
    scores: np.ndarray, truth: np.ndarray, n_points: int = 50
) -> pd.DataFrame:
    """PR curve for a per-node score array (SPOKEN / FBox baselines).

    Thresholds are score quantiles; higher score = more suspicious.
    """
    truth_mask = np.zeros(len(scores), dtype=bool)
    truth_mask[np.asarray(truth, dtype=np.int64)] = True
    qs = np.linspace(0.0, 1.0, n_points, endpoint=False)
    rows = []
    finite = scores[np.isfinite(scores)]
    if len(finite) == 0:
        return pd.DataFrame(columns=["threshold", "n_detected", "precision", "recall", "f1"])
    for q in qs:
        thr = np.quantile(finite, 1.0 - q) if q > 0 else np.inf
        det = scores >= thr if np.isfinite(thr) else np.zeros(len(scores), bool)
        n_det = int(det.sum())
        if n_det == 0:
            rows.append(dict(threshold=float(thr), n_detected=0, precision=0.0, recall=0.0, f1=0.0))
            continue
        tp = int((det & truth_mask).sum())
        p = tp / n_det
        r = tp / max(1, int(truth_mask.sum()))
        rows.append(
            dict(threshold=float(thr), n_detected=n_det, precision=p, recall=r, f1=f1_score(p, r))
        )
    return pd.DataFrame(rows)

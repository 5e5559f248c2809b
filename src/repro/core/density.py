"""Density score φ (paper Definition 2, read as the FRAUDAR metric it cites).

Every edge (i, j) contributes ``1 / log(d_j + c)`` where ``d_j`` is the
degree of merchant j in the graph handed to the detector (column
weighting that discounts popular merchants, so camouflage edges to
popular stores buy fraudsters little density). The score of a node set
S is the weighted edge mass inside S divided by |U_S| + |V_S|.

See DESIGN.md §1 for why the printed Definition 2 (a bare sum over
merchant nodes, no edge term) is read this way: the paper attributes
the metric to FRAUDAR [13] and claims the FRAUDAR min-heap complexity,
both of which require the per-edge form.

Two implementations are provided: a numpy one used by the solvers, and
a Spark/DataFrame one (``phi_spark``) used to oracle-check the numpy
math against DuckDB SQL in tests.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.bipartite import BipartiteGraph

#: FRAUDAR's constant c in 1/log(d + c); keeps the weight finite at d ∈ {0, 1}.
DEFAULT_C: float = 5.0


def merchant_weights(deg_v: np.ndarray, c: float = DEFAULT_C) -> np.ndarray:
    """Column weights w_j = 1 / log(d_j + c) for merchant degrees ``deg_v``."""
    if c <= 1.0:
        raise ValueError("c must be > 1 so log(d + c) > 0 for all d >= 0")
    return 1.0 / np.log(np.asarray(deg_v, dtype=np.float64) + c)


def edge_values(g: BipartiteGraph, w_col: np.ndarray) -> np.ndarray:
    """Per-edge contribution to f(S): edge weight × its merchant's column weight."""
    return g.w * w_col[g.v]


def phi(
    g: BipartiteGraph,
    w_col: np.ndarray | None = None,
    c: float = DEFAULT_C,
    n_nodes: int | None = None,
) -> float:
    """Density score of a whole graph.

    ``w_col`` defaults to weights from ``g``'s own merchant degrees —
    the right thing when scoring a graph in isolation; FDET instead
    passes the weights of the graph it started from so that removing a
    block does not inflate the remaining merchants' weights.

    ``n_nodes`` overrides the denominator (used by the peeling loop,
    where "remaining nodes" includes nodes whose last edge just died);
    by default only nodes with degree ≥ 1 are counted.
    """
    if g.n_edges == 0:
        return 0.0
    if w_col is None:
        w_col = merchant_weights(g.degrees_v(), c)
    f = float(edge_values(g, w_col).sum())
    if n_nodes is None:
        n_nodes = len(g.present_u()) + len(g.present_v())
    return f / n_nodes if n_nodes > 0 else 0.0


def phi_spark(edges: DataFrame, c: float = DEFAULT_C) -> float:
    """Same score computed with DataFrame aggregations (for oracle tests).

    ``edges`` must have columns ``pin`` and ``merchant``; an optional
    ``w`` column supplies edge weights (default 1.0).
    """
    w = F.col("w") if "w" in edges.columns else F.lit(1.0)
    deg = edges.groupBy("merchant").agg(F.count(F.lit(1)).alias("d_j"))
    weighted = (
        edges.join(deg, "merchant")
        .select((w / F.log(F.col("d_j") + F.lit(float(c)))).alias("val"))
        .agg(F.sum("val").alias("f"))
    )
    f = weighted.collect()[0]["f"]
    if f is None:
        return 0.0
    n_u = edges.select("pin").distinct().count()
    n_v = edges.select("merchant").distinct().count()
    return float(f) / (n_u + n_v)

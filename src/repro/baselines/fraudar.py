"""FRAUDAR baseline (Hooi et al., KDD 2016), as used in the paper.

FRAUDAR is the same greedy peeling under the same camouflage-resistant
density metric, but run on the *full* graph, sequentially, for a fixed
number of blocks K (the paper fixes K = 30 in Table III and Fig. 4) —
no sampling, no voting, no truncation. Every node of a detected block
is flagged, which is why its detected-node counts form the coarse
"polyline" of Fig. 4 rather than EnsemFDet's smooth threshold curve.

Implementation: exactly ``repro.core.fdet.fdet`` with ``truncate=False``
— sharing the solver is the honest comparison (any constant-factor
difference between the two systems then comes from the ensemble
design, not from unequal inner loops).
"""
from __future__ import annotations

import numpy as np

from repro.core.density import DEFAULT_C
from repro.core.fdet import FdetResult, fdet
from repro.graph.bipartite import BipartiteGraph


def fraudar(g: BipartiteGraph, k: int = 30, c: float = DEFAULT_C) -> FdetResult:
    """Detect ``k`` dense blocks on the full graph (no truncation)."""
    return fdet(g, k_max=k, truncate=False, c=c)


def fraudar_points(result: FdetResult) -> list[dict]:
    """Per-prefix detection points (the diamonds of Figs. 3–4).

    Point j flags the union of the top-j blocks; returns one dict per
    j with the flagged pin array — the caller joins against the
    blacklist for precision/recall.
    """
    points = []
    for j in range(1, len(result.blocks) + 1):
        pins = result.detected_users(k=j)
        points.append({"k": j, "pins": pins, "n_detected": int(len(pins))})
    return points

"""SPOKEN baseline (Prakash et al., PAKDD 2010 — "EigenSpokes").

SPOKEN observes that in graphs with blocky community structure, pairs
of singular vectors exhibit "eigenspokes": most nodes sit near the
origin while community members project strongly onto individual
components. Operationally (as generalized for fraud detection in
[17]), a node is suspicious when it has a large loading on any of the
top components. The paper runs it with 25 components.

We score each pin (and merchant) by its maximum absolute loading over
the top-k left (right) singular vectors of the biadjacency matrix;
ranking by that score yields the precision/recall curves of Fig. 3.
"""
from __future__ import annotations

import numpy as np

from repro.graph.bipartite import BipartiteGraph
from repro.linalg.svd import truncated_svd

#: Number of SVD components, as set in the paper's experiments.
DEFAULT_COMPONENTS = 25


def spoken_scores(
    g: BipartiteGraph, k: int = DEFAULT_COMPONENTS, seed: int = 0
) -> tuple[np.ndarray, np.ndarray]:
    """Suspiciousness scores (higher = more suspicious) per pin / merchant.

    Loadings are weighted by each component's relative spoke strength
    (σ_k / σ_1) before taking the max, so a strong community spoke
    outranks loadings on weak noise components — the visual equivalent
    of reading only the pronounced spokes in an eigenspokes plot.
    """
    u, s, vt = truncated_svd(g, k=k, seed=seed)
    if not u.size or s[0] <= 0:
        return np.zeros(g.n_u), np.zeros(g.n_v)
    rel = s / s[0]
    pin_scores = (np.abs(u) * rel[None, :]).max(axis=1)
    merchant_scores = (np.abs(vt) * rel[:, None]).max(axis=0)
    return pin_scores, merchant_scores

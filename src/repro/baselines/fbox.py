"""FBox baseline (Shah et al., ICDM 2014).

FBox's adversarial observation: attacks of small enough scale live
outside the top-k SVD subspace, so the *reconstruction* of an attack
node's row is much smaller than its observed activity. A node whose
reconstructed norm is far below what its degree predicts is flagged.

Score: for pin i with latent row p_i = s ⊙ U[i, :], the reconstruction
norm is ||p_i||₂; honest nodes have ||p_i|| ≈ √d_i (for a 0/1 matrix,
the full-rank row norm equals √degree), so we rank by the ratio
``recon_norm / √degree`` — ascending, lowest ratio = most suspicious.
The returned score is the negated ratio so that, like the other
baselines, *higher = more suspicious*. Zero-degree nodes get -inf…0
handling: they are given the least-suspicious score.
"""
from __future__ import annotations

import numpy as np

from repro.graph.bipartite import BipartiteGraph
from repro.linalg.svd import truncated_svd

#: Default number of SVD components (K is "a determinant factor" per the paper).
DEFAULT_COMPONENTS = 25


def fbox_scores(
    g: BipartiteGraph, k: int = DEFAULT_COMPONENTS, seed: int = 0
) -> tuple[np.ndarray, np.ndarray]:
    """Suspiciousness scores (higher = more suspicious) per pin / merchant."""
    u, s, vt = truncated_svd(g, k=k, seed=seed)
    deg_u = g.degrees_u().astype(np.float64)
    deg_v = g.degrees_v().astype(np.float64)

    recon_u = np.linalg.norm(u * s[None, :], axis=1) if u.size else np.zeros(g.n_u)
    recon_v = np.linalg.norm(vt.T * s[None, :], axis=1) if vt.size else np.zeros(g.n_v)

    with np.errstate(divide="ignore", invalid="ignore"):
        ratio_u = np.where(deg_u > 0, recon_u / np.sqrt(deg_u), np.inf)
        ratio_v = np.where(deg_v > 0, recon_v / np.sqrt(deg_v), np.inf)
    return -ratio_u, -ratio_v

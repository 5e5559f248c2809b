"""Hand-built micro graphs shared across test modules."""
import numpy as np

from repro.graph.bipartite import BipartiteGraph


def clique_plus_noise(
    bu: int = 8, bm: int = 5, n_u: int = 50, n_v: int = 40, n_noise: int = 60, seed: int = 0
) -> tuple[BipartiteGraph, np.ndarray, np.ndarray]:
    """A complete bipartite block (users 0..bu-1 × merchants 0..bm-1)
    plus uniform noise edges elsewhere. Returns (graph, block_users,
    block_merchants)."""
    rng = np.random.default_rng(seed)
    cu = np.repeat(np.arange(bu), bm)
    cv = np.tile(np.arange(bm), bu)
    nu = rng.integers(bu, n_u, n_noise)
    nv = rng.integers(bm, n_v, n_noise)
    g = BipartiteGraph.from_edges(
        np.concatenate([cu, nu]), np.concatenate([cv, nv]), n_u=n_u, n_v=n_v
    )
    return g, np.arange(bu), np.arange(bm)

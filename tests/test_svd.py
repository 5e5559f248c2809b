"""Tests for the randomized truncated-SVD substrate against dense numpy SVD."""
import numpy as np
import pytest

from repro.graph.bipartite import BipartiteGraph
from repro.linalg.svd import truncated_svd


def dense(g: BipartiteGraph) -> np.ndarray:
    a = np.zeros((g.n_u, g.n_v))
    np.add.at(a, (g.u, g.v), g.w)
    return a


def random_graph(n_u, n_v, n_e, seed=0, weighted=False):
    rng = np.random.default_rng(seed)
    w = rng.random(n_e) + 0.5 if weighted else None
    return BipartiteGraph.from_edges(
        rng.integers(0, n_u, n_e), rng.integers(0, n_v, n_e), w, n_u=n_u, n_v=n_v
    )


class TestAgainstDense:
    @pytest.mark.parametrize("seed", range(5))
    def test_singular_values_match(self, seed):
        g = random_graph(50, 40, 400, seed)
        _, s, _ = truncated_svd(g, k=6, seed=seed)
        ref = np.linalg.svd(dense(g), compute_uv=False)[:6]
        np.testing.assert_allclose(s, ref, rtol=1e-5, atol=1e-6)

    @pytest.mark.parametrize("seed", range(3))
    def test_weighted_matrix(self, seed):
        g = random_graph(30, 25, 200, seed, weighted=True)
        _, s, _ = truncated_svd(g, k=4, seed=seed)
        ref = np.linalg.svd(dense(g), compute_uv=False)[:4]
        np.testing.assert_allclose(s, ref, rtol=1e-5, atol=1e-6)

    def test_reconstruction_error_near_optimal(self):
        g = random_graph(60, 45, 600, seed=3)
        a = dense(g)
        u, s, vt = truncated_svd(g, k=8, seed=0)
        approx = (u * s) @ vt
        err = np.linalg.norm(a - approx)
        uu, ss, vv = np.linalg.svd(a, full_matrices=False)
        opt = np.linalg.norm(a - (uu[:, :8] * ss[:8]) @ vv[:8])
        assert err <= opt * (1 + 1e-4)

    def test_orthonormal_factors(self):
        g = random_graph(40, 30, 300, seed=1)
        u, _, vt = truncated_svd(g, k=5)
        np.testing.assert_allclose(u.T @ u, np.eye(5), atol=1e-8)
        np.testing.assert_allclose(vt @ vt.T, np.eye(5), atol=1e-8)


class TestShapesAndEdgeCases:
    def test_shapes(self):
        g = random_graph(20, 10, 50)
        u, s, vt = truncated_svd(g, k=4)
        assert u.shape == (20, 4) and s.shape == (4,) and vt.shape == (4, 10)

    def test_k_clipped_to_rank_bound(self):
        g = random_graph(20, 3, 30)
        u, s, vt = truncated_svd(g, k=10)
        assert s.shape == (3,)

    def test_empty_graph(self):
        g = BipartiteGraph.from_edges([], [])
        u, s, vt = truncated_svd(g, k=5)
        assert (s == 0).all()

    def test_rank_one_block(self):
        """A complete block is rank-1: σ₁ = √(bu·bm), σ₂ ≈ 0."""
        bu, bm = 8, 5
        g = BipartiteGraph.from_edges(
            np.repeat(np.arange(bu), bm), np.tile(np.arange(bm), bu)
        )
        _, s, _ = truncated_svd(g, k=3)
        assert s[0] == pytest.approx(np.sqrt(bu * bm), rel=1e-6)
        assert s[1] == pytest.approx(0.0, abs=1e-6)

    def test_block_dominates_top_component(self):
        """Top left singular vector concentrates on a planted block."""
        rng = np.random.default_rng(0)
        bu, bm = 10, 6
        cu = np.repeat(np.arange(bu), bm)
        cv = np.tile(np.arange(bm), bu)
        nu = rng.integers(bu, 100, 120)
        nv = rng.integers(bm, 80, 120)
        g = BipartiteGraph.from_edges(
            np.concatenate([cu, nu]), np.concatenate([cv, nv]), n_u=100, n_v=80
        )
        u, _, _ = truncated_svd(g, k=1)
        top = np.argsort(np.abs(u[:, 0]))[::-1][:bu]
        assert set(top.tolist()) == set(range(bu))

    def test_deterministic_in_seed(self):
        g = random_graph(30, 20, 150)
        s1 = truncated_svd(g, k=4, seed=9)[1]
        s2 = truncated_svd(g, k=4, seed=9)[1]
        np.testing.assert_array_equal(s1, s2)

"""Tests for FRAUDAR, SPOKEN and FBox baselines."""
import numpy as np
import pytest

from repro.baselines.fbox import fbox_scores
from repro.baselines.fraudar import fraudar, fraudar_points
from repro.baselines.spoken import spoken_scores
from repro.eval.metrics import prf, score_sweep

from tests.helpers import clique_plus_noise


class TestFraudar:
    def test_fixed_k_blocks(self, jd1_small):
        _, _, g, _, _ = jd1_small
        r = fraudar(g, k=10)
        assert len(r.blocks) <= 10
        assert r.k_hat == len(r.blocks)  # no truncation

    def test_detects_planted_fraud(self, jd_small):
        preset, _, _, g, truth, _ = jd_small
        r = fraudar(g, k=30)
        best = 0.0
        for pt in fraudar_points(r):
            _, _, f1 = prf(pt["pins"], truth)
            best = max(best, f1)
        assert best > 0.9, f"{preset}: best F1 {best}"

    def test_points_monotone_in_detected(self, jd1_small):
        """Fig. 4 claim: FRAUDAR's operating points are a coarse,
        non-decreasing sequence of detected-node counts."""
        _, _, g, _, _ = jd1_small
        pts = fraudar_points(fraudar(g, k=10))
        counts = [p["n_detected"] for p in pts]
        assert counts == sorted(counts)
        assert len(set(counts)) > 1

    def test_points_are_coarse(self, jd1_small):
        """Consecutive FRAUDAR points jump by whole blocks (the paper's
        'polyline' practicability complaint) — some gap exceeds 1."""
        _, _, g, _, _ = jd1_small
        pts = fraudar_points(fraudar(g, k=10))
        gaps = np.diff([p["n_detected"] for p in pts])
        assert gaps.max() > 1

    def test_micro_clique(self, micro_clique):
        g, bu, _ = micro_clique
        r = fraudar(g, k=1)
        assert set(bu).issubset(set(r.blocks[0].users.tolist()))


class TestSpoken:
    def test_scores_shape(self, jd1_small):
        _, _, g, _, _ = jd1_small
        pu, pv = spoken_scores(g, k=10)
        assert pu.shape == (g.n_u,) and pv.shape == (g.n_v,)

    def test_block_members_score_high(self):
        g, bu, bm = clique_plus_noise(bu=10, bm=6, n_u=120, n_v=90, n_noise=200)
        pu, pv = spoken_scores(g, k=5)
        top_u = np.argsort(pu)[::-1][: len(bu)]
        assert len(set(top_u.tolist()) & set(bu.tolist())) >= len(bu) - 2

    def test_detects_planted_fraud_reasonably(self, jd1_small):
        _, _, g, truth, _ = jd1_small
        pu, _ = spoken_scores(g)
        sweep = score_sweep(pu, truth)
        assert sweep["f1"].max() > 0.5

    def test_deterministic(self, jd1_small):
        _, _, g, _, _ = jd1_small
        a, _ = spoken_scores(g, k=5, seed=3)
        b, _ = spoken_scores(g, k=5, seed=3)
        np.testing.assert_array_equal(a, b)


class TestFbox:
    def test_scores_shape(self, jd1_small):
        _, _, g, _, _ = jd1_small
        pu, pv = fbox_scores(g, k=10)
        assert pu.shape == (g.n_u,) and pv.shape == (g.n_v,)

    def test_zero_degree_least_suspicious(self, jd1_small):
        _, _, g, _, _ = jd1_small
        pu, _ = fbox_scores(g, k=10)
        deg = g.degrees_u()
        isolated = pu[deg == 0]
        if len(isolated):
            assert isolated.max() <= pu[deg > 0].min() + 1e-12

    def test_out_of_subspace_attack_scores_high(self):
        """A small attack block orthogonal to the main structure has low
        reconstruction — FBox's core claim."""
        rng = np.random.default_rng(0)
        # strong main structure: two big communities
        au = np.repeat(np.arange(30), 10)
        av = rng.integers(0, 15, 300)
        bu = np.repeat(np.arange(30, 60), 10)
        bv = rng.integers(15, 30, 300)
        # tiny attack: users 60..63 x merchants 30..32 complete
        xu = np.repeat(np.arange(60, 64), 3)
        xv = np.tile(np.arange(30, 33), 4)
        from repro.graph.bipartite import BipartiteGraph

        g = BipartiteGraph.from_edges(
            np.concatenate([au, bu, xu]), np.concatenate([av, bv, xv])
        )
        pu, _ = fbox_scores(g, k=2)  # k too small to capture the attack
        attack_mean = pu[60:64].mean()
        honest_mean = pu[:60].mean()
        assert attack_mean > honest_mean

    def test_runs_on_all_presets(self, jd_small):
        _, _, _, g, truth, _ = jd_small
        pu, _ = fbox_scores(g)
        sweep = score_sweep(pu, truth)
        # FBox is known-unstable (paper Fig. 3: near-0 on dataset 1);
        # only assert it produces a valid sweep, not that it is good.
        assert (sweep["precision"] <= 1.0).all()
        assert (sweep["recall"] <= 1.0).all()

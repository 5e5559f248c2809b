"""Tests for FDET: repeated extraction, truncating point, detection quality."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.fdet import fdet, truncating_point
from repro.graph.bipartite import BipartiteGraph


def planted_blocks_graph(densities=(12, 8, 5), bu=8, seed=0):
    """Disjoint complete-bipartite blocks with bm per `densities`, plus noise."""
    rng = np.random.default_rng(seed)
    us, vs = [], []
    u0 = v0 = 0
    blocks = []
    for bm in densities:
        us.append(np.repeat(np.arange(u0, u0 + bu), bm))
        vs.append(np.tile(np.arange(v0, v0 + bm), bu))
        blocks.append((np.arange(u0, u0 + bu), np.arange(v0, v0 + bm)))
        u0 += bu
        v0 += bm
    # background noise: sparse random edges among 200 extra users/merchants
    nu = rng.integers(u0, u0 + 200, 150)
    nv = rng.integers(v0, v0 + 150, 150)
    g = BipartiteGraph.from_edges(
        np.concatenate(us + [nu]), np.concatenate(vs + [nv])
    )
    return g, blocks


class TestTruncatingPoint:
    def test_short_sequences_kept_whole(self):
        assert truncating_point([]) == 0
        assert truncating_point([1.0]) == 1
        assert truncating_point([1.0, 0.5]) == 2

    def test_cliff_detected(self):
        # plateau then collapse after block 3
        assert truncating_point([1.00, 0.98, 0.96, 0.30, 0.28, 0.27]) == 3

    def test_cliff_at_second_block(self):
        assert truncating_point([1.0, 0.9, 0.2, 0.18, 0.17]) == 2

    def test_staircase_with_cliff(self):
        # heterogeneous planted blocks then background
        assert truncating_point([2.0, 1.8, 1.6, 1.4, 0.6, 0.5, 0.45]) == 4

    def test_result_in_valid_range(self):
        phis = [3.0, 2.0, 1.5, 1.2, 1.0, 0.9]
        k = truncating_point(phis)
        assert 1 <= k <= len(phis)

    @given(
        st.lists(st.floats(min_value=0.01, max_value=10.0), min_size=3, max_size=30)
    )
    @settings(max_examples=50, deadline=None)
    def test_always_valid_on_arbitrary_sequences(self, phis):
        phis = sorted(phis, reverse=True)
        assert 2 <= truncating_point(phis) <= len(phis) - 1


class TestFdet:
    def test_k_max_validation(self):
        with pytest.raises(ValueError, match="k_max"):
            fdet(BipartiteGraph.from_edges([0], [0]), k_max=0)

    def test_empty_graph(self):
        r = fdet(BipartiteGraph.from_edges([], []))
        assert r.k_hat == 0 and r.blocks == []
        assert r.detected_users().tolist() == []

    def test_single_block_graph(self):
        u = np.repeat(np.arange(5), 4)
        v = np.tile(np.arange(4), 5)
        r = fdet(BipartiteGraph.from_edges(u, v))
        assert len(r.blocks) >= 1
        assert set(r.blocks[0].users.tolist()) == set(range(5))

    def test_finds_all_planted_blocks(self):
        g, blocks = planted_blocks_graph()
        r = fdet(g, k_max=20)
        det_u = set(r.detected_users().tolist())
        for bu, _ in blocks:
            assert set(bu).issubset(det_u), "a planted block was missed"

    def test_blocks_ordered_by_decreasing_phi(self):
        g, _ = planted_blocks_graph()
        r = fdet(g, k_max=20)
        phis = r.phis
        # denser blocks come out first (weak monotone: small numerical wiggle ok)
        assert np.all(np.diff(phis) <= 1e-9)

    def test_densest_block_first(self):
        g, blocks = planted_blocks_graph(densities=(12, 8, 5))
        r = fdet(g, k_max=20)
        assert set(blocks[0][0]).issubset(set(r.blocks[0].users.tolist()))

    def test_truncation_cuts_noise_blocks(self):
        g, blocks = planted_blocks_graph()
        r_trunc = fdet(g, k_max=20, truncate=True)
        r_full = fdet(g, k_max=20, truncate=False)
        assert r_trunc.k_hat <= len(r_full.blocks)
        assert r_trunc.k_hat >= len(blocks) - 1

    def test_truncate_false_keeps_all(self):
        g, _ = planted_blocks_graph()
        r = fdet(g, k_max=6, truncate=False)
        assert r.k_hat == len(r.blocks)

    def test_k_max_respected(self):
        g, _ = planted_blocks_graph()
        r = fdet(g, k_max=2, truncate=False)
        assert len(r.blocks) == 2

    def test_blocks_have_disjoint_edges(self):
        """Detected subgraphs are edge-disjoint (Equ. 1's constraint is on
        node sets; FDET enforces it by removing detected edges)."""
        g, _ = planted_blocks_graph()
        r = fdet(g, k_max=10, truncate=False)
        seen = set()
        for b in r.blocks:
            in_u = np.isin(g.u, b.users)
            in_v = np.isin(g.v, b.merchants)
            edges = set(zip(g.u[in_u & in_v].tolist(), g.v[in_u & in_v].tolist()))
            # a later block may not reuse an earlier block's intra-edges
            # as its own majority; strict check: first block's edges
            # never reappear fully
            if seen:
                assert not edges.issubset(seen)
            seen |= edges

    def test_selected_prefix(self):
        g, _ = planted_blocks_graph()
        r = fdet(g, k_max=20)
        assert r.selected == r.blocks[: r.k_hat]

    def test_detected_users_k_argument(self):
        g, _ = planted_blocks_graph()
        r = fdet(g, k_max=5, truncate=False)
        u1 = r.detected_users(k=1)
        u_all = r.detected_users(k=5)
        assert set(u1.tolist()).issubset(set(u_all.tolist()))
        assert len(u_all) >= len(u1)

    def test_deterministic(self):
        g, _ = planted_blocks_graph()
        a, b = fdet(g, k_max=10), fdet(g, k_max=10)
        assert a.k_hat == b.k_hat
        assert [x.phi for x in a.blocks] == [x.phi for x in b.blocks]


class TestFdetOnJd:
    def test_full_recall_at_k_hat(self, jd_small):
        preset, _, _, g, truth, meta = jd_small
        r = fdet(g, k_max=30)
        det = r.detected_users()
        recall = np.isin(truth, det).mean()
        assert recall == pytest.approx(1.0), f"{preset}: recall {recall}"

    def test_high_precision_at_k_hat(self, jd_small):
        preset, _, _, g, truth, _ = jd_small
        r = fdet(g, k_max=30)
        det = r.detected_users()
        precision = np.isin(det, truth).mean()
        assert precision > 0.9, f"{preset}: precision {precision}"

    def test_k_hat_close_to_planted(self, jd_small):
        """k̂ tracks the number of planted groups (equal-density groups
        may merge, so allow k̂ <= planted and >= planted/2)."""
        preset, _, _, g, _, meta = jd_small
        r = fdet(g, k_max=30)
        assert r.k_hat <= meta["n_blocks"] + 2
        assert r.k_hat >= max(2, meta["n_blocks"] // 2)

    def test_truncation_improves_precision(self, jd1_small):
        """The Fig. 6 claim at FDET level: k̂ beats a large fixed k."""
        _, _, g, truth, _ = jd1_small
        r_t = fdet(g, k_max=30, truncate=True)
        r_f = fdet(g, k_max=30, truncate=False)
        p_t = np.isin(r_t.detected_users(), truth).mean()
        p_f = np.isin(r_f.detected_users(k=30), truth).mean()
        assert p_t > p_f

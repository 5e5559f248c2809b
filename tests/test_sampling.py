"""Tests for RES/ONS/TNS sampling — Spark and local variants, Lemma 1, Theorem 1."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.density import phi
from repro.core.sampling import (
    METHODS,
    expected_sampled_degree_counts,
    lemma1_crossover,
    ons_local,
    res_local,
    sample_edges_spark,
    sample_local,
    tns_local,
)
from repro.graph.bipartite import BipartiteGraph
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def edge_pdf():
    rng = np.random.default_rng(11)
    return pd.DataFrame(
        {"pin": rng.integers(0, 300, 3000), "merchant": rng.integers(0, 200, 3000)}
    ).drop_duplicates(ignore_index=True)


@pytest.fixture(scope="module")
def edges_df(spark, edge_pdf):
    df = spark.createDataFrame(edge_pdf)
    df.cache().count()
    return df


class TestSparkSamplingValidation:
    def test_bad_method(self, edges_df):
        with pytest.raises(ValueError, match="unknown sampling method"):
            sample_edges_spark(edges_df, "BOGUS", 0.1, 4)

    @pytest.mark.parametrize("s", [0.0, -0.1, 1.5])
    def test_bad_ratio(self, edges_df, s):
        with pytest.raises(ValueError, match="sample ratio"):
            sample_edges_spark(edges_df, "RES", s, 4)

    def test_bad_n(self, edges_df):
        with pytest.raises(ValueError, match="at least one sample"):
            sample_edges_spark(edges_df, "RES", 0.1, 0)


class TestSparkSamplingSemantics:
    @pytest.mark.parametrize("method", METHODS)
    def test_produces_n_sample_ids(self, edges_df, method):
        out = sample_edges_spark(edges_df, method, 0.5, 6, seed=1).toPandas()
        assert set(out["sample_id"].unique()).issubset(set(range(6)))
        assert out["sample_id"].nunique() >= 5  # overwhelmingly likely

    @pytest.mark.parametrize("method", METHODS)
    def test_sampled_edges_are_real_edges(self, edges_df, edge_pdf, method):
        out = sample_edges_spark(edges_df, method, 0.3, 3, seed=2).toPandas()
        real = set(zip(edge_pdf["pin"], edge_pdf["merchant"]))
        got = set(zip(out["pin"], out["merchant"]))
        assert got.issubset(real)

    @pytest.mark.parametrize("method", METHODS)
    def test_deterministic_in_seed(self, edges_df, method):
        a = sample_edges_spark(edges_df, method, 0.2, 3, seed=5).toPandas()
        b = sample_edges_spark(edges_df, method, 0.2, 3, seed=5).toPandas()
        key = ["sample_id", "pin", "merchant"]
        pd.testing.assert_frame_equal(
            a.sort_values(key).reset_index(drop=True),
            b.sort_values(key).reset_index(drop=True),
        )

    def test_different_seeds_differ(self, edges_df):
        a = sample_edges_spark(edges_df, "RES", 0.2, 1, seed=5).count()
        ap = sample_edges_spark(edges_df, "RES", 0.2, 1, seed=6)
        b = sample_edges_spark(edges_df, "RES", 0.2, 1, seed=5)
        # same seed same count; different seed → different edge set (w.h.p.)
        assert b.count() == a
        overlap = ap.join(b, ["pin", "merchant"]).count()
        assert overlap < min(ap.count(), a)

    def test_res_ratio_approx(self, edges_df, edge_pdf):
        n, s = 10, 0.2
        out = sample_edges_spark(edges_df, "RES", s, n, seed=3)
        per = out.groupBy("sample_id").count().toPandas()["count"]
        expect = s * len(edge_pdf)
        assert abs(per.mean() - expect) < 0.15 * expect

    def test_ons_merchant_keeps_full_columns(self, edges_df, edge_pdf):
        """Every edge of a sampled merchant is present in that sample."""
        out = sample_edges_spark(edges_df, "ONS_MERCHANT", 0.3, 2, seed=4).toPandas()
        full_deg = edge_pdf.groupby("merchant").size()
        for sid, grp in out.groupby("sample_id"):
            got_deg = grp.groupby("merchant").size()
            for m, d in got_deg.items():
                assert d == full_deg[m], "ONS must keep whole adjacency rows"

    def test_ons_pin_keeps_full_rows(self, edges_df, edge_pdf):
        out = sample_edges_spark(edges_df, "ONS_PIN", 0.3, 2, seed=4).toPandas()
        full_deg = edge_pdf.groupby("pin").size()
        for sid, grp in out.groupby("sample_id"):
            for p, d in grp.groupby("pin").size().items():
                assert d == full_deg[p]

    def test_tns_is_intersection_of_side_samples(self, edges_df):
        """TNS sample ⊆ corresponding ONS_PIN sample of the same seed."""
        tns = sample_edges_spark(edges_df, "TNS", 0.4, 2, seed=9).toPandas()
        ons = sample_edges_spark(edges_df, "ONS_PIN", 0.4, 2, seed=9).toPandas()
        key = set(map(tuple, ons[["sample_id", "pin", "merchant"]].to_numpy()))
        assert all(tuple(r) in key for r in tns[["sample_id", "pin", "merchant"]].to_numpy())

    def test_tns_ratio_approx_s_squared(self, edges_df, edge_pdf):
        n, s = 16, 0.3
        out = sample_edges_spark(edges_df, "TNS", s, n, seed=3)
        per_sample = out.count() / n
        expect = s * s * len(edge_pdf)
        assert abs(per_sample - expect) < 0.5 * expect

    def test_rescale_weights(self, edges_df):
        out = sample_edges_spark(edges_df, "RES", 0.25, 1, seed=0, rescale_weights=True)
        w = out.select("w").distinct().collect()
        assert len(w) == 1 and w[0]["w"] == pytest.approx(4.0)

    def test_default_weight_one(self, edges_df):
        out = sample_edges_spark(edges_df, "RES", 0.25, 1, seed=0)
        assert out.select("w").distinct().collect()[0]["w"] == 1.0

    def test_sample_count_oracle(self, spark, edges_df, edge_pdf):
        """Per-sample edge counts agree with a DuckDB replica of the
        sampling computed from the materialized sample table itself."""
        out = sample_edges_spark(edges_df, "RES", 0.2, 4, seed=1)
        counts = out.groupBy("sample_id").agg(F.count(F.lit(1)).alias("n_edges"))
        assert_equivalent(
            counts,
            "SELECT sample_id, COUNT(*) AS n_edges FROM samples GROUP BY sample_id",
            samples=out.toPandas(),
        )


class TestLocalSampling:
    @pytest.fixture(scope="class")
    def g(self, edge_pdf):
        return BipartiteGraph.from_pandas(edge_pdf)

    def test_res_ratio(self, g):
        sub = res_local(g, 0.3, seed=0)
        assert abs(sub.n_edges - 0.3 * g.n_edges) < 0.1 * g.n_edges

    def test_res_rescale(self, g):
        sub = res_local(g, 0.5, seed=0, rescale_weights=True)
        assert np.allclose(sub.w, 2.0)

    def test_ons_bad_side(self, g):
        with pytest.raises(ValueError, match="side must be"):
            ons_local(g, 0.3, side="bogus")

    @pytest.mark.parametrize("side", ["pin", "merchant"])
    def test_ons_keeps_whole_nodes(self, g, side):
        sub = ons_local(g, 0.3, side=side, seed=1)
        deg_full = g.degrees_u() if side == "pin" else g.degrees_v()
        deg_sub = sub.degrees_u() if side == "pin" else sub.degrees_v()
        present = np.nonzero(deg_sub)[0]
        assert np.array_equal(deg_sub[present], deg_full[present])

    def test_tns_subset_of_ons(self, g):
        tns = tns_local(g, 0.5, seed=2)
        assert tns.n_edges <= ons_local(g, 0.5, "pin", seed=2).n_edges

    @pytest.mark.parametrize("method", METHODS)
    def test_dispatch(self, g, method):
        sub = sample_local(g, method, 0.3, seed=0)
        assert sub.n_edges <= g.n_edges
        assert sub.n_u == g.n_u and sub.n_v == g.n_v

    def test_dispatch_bad_method(self, g):
        with pytest.raises(ValueError, match="unknown sampling method"):
            sample_local(g, "NOPE", 0.3)


class TestLemma1:
    """ES samples high-degree nodes at a higher rate than NS (Lemma 1)."""

    def test_expected_counts_formula(self):
        hist = np.array([0, 100, 50, 25])  # f_D(q)
        e_ns, e_es = expected_sampled_degree_counts(hist, p_v=0.2, p_e=0.1)
        np.testing.assert_allclose(e_ns, hist * 0.2)
        np.testing.assert_allclose(e_es, hist * (1 - 0.9 ** np.arange(4)))

    def test_crossover_threshold(self):
        q_star = lemma1_crossover(p_v=0.2, p_e=0.1)
        hist = np.ones(60)
        e_ns, e_es = expected_sampled_degree_counts(hist, 0.2, 0.1)
        q = np.arange(60)
        assert np.all(e_es[q > q_star] > e_ns[q > q_star])
        assert np.all(e_es[(q > 0) & (q < q_star)] < e_ns[(q > 0) & (q < q_star)])

    def test_empirical_lemma1(self):
        """Monte-Carlo check on a graph with a degree spread: RES(=ES)
        retains high-degree merchants more often than ONS(=NS)."""
        rng = np.random.default_rng(0)
        # merchant 0 has degree 60; merchants 1..60 degree 1
        u = np.concatenate([rng.permutation(60), np.arange(60, 120)])
        v = np.concatenate([np.zeros(60, np.int64), np.arange(1, 61)])
        g = BipartiteGraph.from_edges(u, v)
        s = 0.2
        hit_es = hit_ns = 0
        for i in range(200):
            if 0 in res_local(g, s, seed=i).present_v():
                hit_es += 1
            if 0 in ons_local(g, s, "merchant", seed=i).present_v():
                hit_ns += 1
        assert hit_es > hit_ns  # ~100% vs ~20%


class TestTheorem1:
    def test_eps_approximation_of_phi(self):
        """RES with 1/p rescaling approximates φ of a dense graph.

        Column weights are held fixed (from the full graph) on both
        sides, matching Theorem 1's setting where the metric's weights
        are data of the problem: the rescaled edge mass is then an
        unbiased estimator of f and φ concentrates."""
        from repro.core.density import merchant_weights

        rng = np.random.default_rng(1)
        # dense-ish graph so per-merchant degrees concentrate
        u = rng.integers(0, 80, 6000)
        v = rng.integers(0, 60, 6000)
        g = BipartiteGraph.from_edges(u, v, n_u=80, n_v=60)
        w_col = merchant_weights(g.degrees_v())
        full = phi(g, w_col=w_col)
        p = 0.5
        errs = []
        for i in range(10):
            sub = res_local(g, p, seed=i, rescale_weights=True)
            errs.append(abs(phi(sub, w_col=w_col) - full) / full)
        assert np.mean(errs) < 0.05  # ε-approximation in expectation

    def test_eps_error_shrinks_with_p(self):
        """Higher sampling probability → tighter φ approximation."""
        from repro.core.density import merchant_weights

        rng = np.random.default_rng(2)
        u = rng.integers(0, 80, 6000)
        v = rng.integers(0, 60, 6000)
        g = BipartiteGraph.from_edges(u, v, n_u=80, n_v=60)
        w_col = merchant_weights(g.degrees_v())
        full = phi(g, w_col=w_col)

        def mean_err(p):
            errs = [
                abs(phi(res_local(g, p, seed=i, rescale_weights=True), w_col=w_col) - full)
                / full
                for i in range(12)
            ]
            return np.mean(errs)

        assert mean_err(0.8) < mean_err(0.1)

"""Tests for the synthetic data generators (JD-lite + provided TPC-H-lite)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.density import merchant_weights, phi
from repro.graph.bipartite import BipartiteGraph
from repro.synth_data import (
    JD_PRESETS,
    customer,
    jd_transactions,
    jd_transactions_spark,
    lineitem,
    orders,
    part,
    zipf_keys,
)


class TestJdGenerator:
    @pytest.fixture(scope="class")
    def jd1(self):
        return jd_transactions("jd1", scale=0.002, seed=0)

    def test_unknown_preset(self):
        with pytest.raises(ValueError, match="unknown preset"):
            jd_transactions("jd9")

    def test_edge_schema(self, jd1):
        edges, _, _ = jd1
        assert list(edges.columns) == ["pin", "merchant"]
        assert edges["pin"].dtype == np.int64

    def test_no_duplicate_edges(self, jd1):
        edges, _, _ = jd1
        assert not edges.duplicated().any()

    def test_user_table_covers_all_pins(self, jd1):
        edges, users, meta = jd1
        assert len(users) == meta["n_pin"]
        assert edges["pin"].max() < meta["n_pin"]
        assert edges["merchant"].max() < meta["n_merchant"]

    def test_fraud_count_matches_meta(self, jd1):
        _, users, meta = jd1
        assert users["is_fraud"].sum() == meta["n_fraud"]

    def test_deterministic(self):
        a = jd_transactions("jd1", scale=0.002, seed=3)[0]
        b = jd_transactions("jd1", scale=0.002, seed=3)[0]
        pd.testing.assert_frame_equal(a, b)

    def test_seeds_differ(self):
        a = jd_transactions("jd1", scale=0.002, seed=1)[0]
        b = jd_transactions("jd1", scale=0.002, seed=2)[0]
        assert not a.equals(b)

    @pytest.mark.parametrize("preset", sorted(JD_PRESETS))
    def test_proportions_track_paper(self, preset):
        """Generated counts scale the paper's Table I rows (±tolerance;
        floors apply at tiny scales)."""
        scale = 0.01
        _, users, meta = jd_transactions(preset, scale=scale, seed=0)
        paper = JD_PRESETS[preset]
        assert meta["n_pin"] == max(200, int(paper["n_pin"] * scale))
        # edges may shrink slightly from dedup
        assert meta["n_edge"] > 0.8 * paper["n_edge"] * scale
        assert meta["n_edge"] <= 1.2 * paper["n_edge"] * scale + 1000

    @pytest.mark.parametrize("preset", sorted(JD_PRESETS))
    def test_fraud_blocks_denser_than_background(self, preset):
        """The planted blocks must realize the 'rare behaviour' clue:
        per-block φ well above the full-graph density."""
        edges, users, meta = jd_transactions(preset, scale=0.002, seed=0)
        g = BipartiteGraph.from_pandas(edges, n_u=meta["n_pin"], n_v=meta["n_merchant"])
        w_col = merchant_weights(g.degrees_v())
        background = phi(g, w_col=w_col)
        fraud_pins = meta["fraud_pins"]
        for b, merch in enumerate(meta["fraud_merchants_per_block"]):
            pins_b = fraud_pins[meta["block_of_pin"] == b]
            in_u = np.isin(g.u, pins_b)
            in_v = np.isin(g.v, merch)
            sub = g.keep_edges(in_u & in_v)
            assert phi(sub, w_col=w_col) > 2.0 * background

    def test_blocks_are_disjoint(self, jd1):
        _, _, meta = jd1
        all_m = np.concatenate(meta["fraud_merchants_per_block"])
        assert len(all_m) == len(set(all_m.tolist()))

    def test_fraud_pins_are_labeled(self, jd1):
        _, users, meta = jd1
        labeled = set(users.loc[users["is_fraud"], "pin"])
        assert labeled == set(meta["fraud_pins"].tolist())

    def test_spark_wrapper(self, spark):
        edges_df, users_df, meta = jd_transactions_spark(spark, "jd1", scale=0.002)
        assert edges_df.count() == meta["n_edge"]
        assert users_df.count() == meta["n_pin"]

    def test_scale_grows_graph(self):
        small = jd_transactions("jd1", scale=0.002)[2]["n_edge"]
        big = jd_transactions("jd1", scale=0.01)[2]["n_edge"]
        assert big > 3 * small


class TestTpchLite:
    """Sanity for the provided TPC-H-lite generators (they back the oracle
    tests and stay available for OLAP-flavoured substrates)."""

    def test_lineitem(self, spark):
        df = lineitem(spark, sf=0.001)
        assert df.count() == 6000
        assert "l_orderkey" in df.columns

    def test_orders_keys_unique(self, spark):
        df = orders(spark, sf=0.001)
        assert df.count() == df.select("o_orderkey").distinct().count()

    def test_customer(self, spark):
        assert customer(spark, sf=0.001).count() == 150

    def test_part(self, spark):
        assert part(spark, sf=0.001).count() == 200

    def test_zipf_keys_skewed(self, spark):
        df = zipf_keys(spark, n=5000, n_keys=100, alpha=1.2).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[-1]

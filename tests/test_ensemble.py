"""Tests for the EnsemFDet ensemble pipeline (Algorithm 2) on Spark."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.ensemble import (
    accept,
    detect_on_samples,
    ensemfdet,
    vote,
)
from repro.core.sampling import sample_edges_spark
from repro.eval.metrics import prf, threshold_sweep
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def jd1_run(spark, jd1_small):
    """One shared EnsemFDet run on jd1 (module-scoped: Spark runs are slow)."""
    edges, users, g, truth, meta = jd1_small
    edges_df = spark.createDataFrame(edges)
    run = ensemfdet(spark, edges_df, method="RES", s=0.3, n=12, seed=0)
    yield run, truth, edges
    run.votes.unpersist()


class TestPipelinePieces:
    def test_detect_on_samples_schema(self, spark, jd1_small):
        edges, *_ = jd1_small
        samples = sample_edges_spark(spark.createDataFrame(edges), "RES", 0.3, 2, seed=1)
        det = detect_on_samples(samples)
        assert set(det.columns) == {"sample_id", "side", "node", "block", "phi"}
        pdf = det.toPandas()
        assert set(pdf["side"].unique()).issubset({"pin", "merchant"})
        assert (pdf["phi"] > 0).all()

    def test_detected_nodes_exist_in_sample(self, spark, jd1_small):
        edges, *_ = jd1_small
        samples = sample_edges_spark(spark.createDataFrame(edges), "RES", 0.4, 1, seed=2)
        sample_pdf = samples.toPandas()
        det = detect_on_samples(samples).toPandas()
        pins = set(sample_pdf["pin"])
        merch = set(sample_pdf["merchant"])
        assert set(det.loc[det["side"] == "pin", "node"]).issubset(pins)
        assert set(det.loc[det["side"] == "merchant", "node"]).issubset(merch)

    def test_vote_counts_distinct_samples(self, spark):
        """A node detected twice in one sample casts a single vote."""
        det = spark.createDataFrame(
            pd.DataFrame(
                {
                    "sample_id": [0, 0, 1, 2],
                    "side": ["pin"] * 4,
                    "node": [7, 7, 7, 8],
                    "block": [0, 1, 0, 0],
                    "phi": [1.0] * 4,
                }
            )
        )
        out = vote(det).toPandas().set_index("node")["votes"]
        assert out[7] == 2  # samples {0, 1}, not 3 rows
        assert out[8] == 1

    def test_vote_oracle(self, spark):
        """The vote aggregation matches DuckDB SQL."""
        det_pdf = pd.DataFrame(
            {
                "sample_id": [0, 0, 1, 2, 2, 3],
                "side": ["pin", "merchant", "pin", "pin", "pin", "merchant"],
                "node": [1, 1, 1, 1, 2, 9],
                "block": [0] * 6,
                "phi": [1.0] * 6,
            }
        )
        votes = vote(spark.createDataFrame(det_pdf))
        assert_equivalent(
            votes,
            """
            SELECT side, node, COUNT(*) AS votes FROM (
              SELECT DISTINCT sample_id, side, node FROM detected)
            GROUP BY side, node
            """,
            detected=det_pdf,
        )

    def test_accept_threshold(self, spark):
        votes = spark.createDataFrame(
            pd.DataFrame(
                {"side": ["pin", "pin", "merchant"], "node": [1, 2, 3], "votes": [5, 2, 9]}
            )
        )
        got = accept(votes, t=3, side="pin").toPandas()
        assert got["node"].tolist() == [1]

    def test_accept_no_side_filter(self, spark):
        votes = spark.createDataFrame(
            pd.DataFrame(
                {"side": ["pin", "merchant"], "node": [1, 3], "votes": [5, 9]}
            )
        )
        assert accept(votes, t=1, side=None).count() == 2


class TestEnsemFDetEndToEnd:
    def test_votes_bounded_by_n(self, jd1_run):
        run, _, _ = jd1_run
        assert run.votes.agg(F.max("votes")).collect()[0][0] <= run.n

    def test_detects_planted_fraud(self, jd1_run):
        run, truth, _ = jd1_run
        sweep = threshold_sweep(run.pin_votes(), truth, np.arange(1, run.n + 1))
        assert sweep["f1"].max() > 0.8

    def test_precision_monotone_in_t(self, jd1_run):
        """Fig. 9 claim: precision rises (weakly) with T."""
        run, truth, _ = jd1_run
        sweep = threshold_sweep(run.pin_votes(), truth, np.arange(1, run.n + 1))
        active = sweep[sweep["n_detected"] > 0]
        p = active["precision"].to_numpy()
        # allow tiny local wiggles but overall non-decreasing trend
        assert p[-1] >= p[0]
        assert np.sum(np.diff(p) < -0.05) <= 1

    def test_recall_monotone_decreasing_in_t(self, jd1_run):
        run, truth, _ = jd1_run
        sweep = threshold_sweep(run.pin_votes(), truth, np.arange(1, run.n + 1))
        r = sweep["recall"].to_numpy()
        assert np.all(np.diff(r) <= 1e-12)

    def test_n_detected_decreasing_in_t(self, jd1_run):
        run, truth, _ = jd1_run
        sweep = threshold_sweep(run.pin_votes(), truth, np.arange(1, run.n + 1))
        assert np.all(np.diff(sweep["n_detected"].to_numpy()) <= 0)

    def test_detected_pins_match_accept(self, jd1_run):
        run, _, _ = jd1_run
        t = 3
        via_api = set(run.detected_pins(t).tolist())
        via_accept = {
            r["node"] for r in accept(run.votes, t, side="pin").collect()
        }
        assert via_api == via_accept

    def test_deterministic_across_runs(self, spark, jd1_small):
        edges, _, _, truth, _ = jd1_small
        edges_df = spark.createDataFrame(edges)
        a = ensemfdet(spark, edges_df, method="RES", s=0.3, n=4, seed=7)
        b = ensemfdet(spark, edges_df, method="RES", s=0.3, n=4, seed=7)
        pa = a.pin_votes().sort_values("node").reset_index(drop=True)
        pb = b.pin_votes().sort_values("node").reset_index(drop=True)
        a.votes.unpersist()
        b.votes.unpersist()
        pd.testing.assert_frame_equal(pa, pb)

    @pytest.mark.parametrize("method", ["ONS_MERCHANT", "TNS"])
    def test_other_sampling_methods_work(self, spark, jd1_small, method):
        edges, _, _, truth, _ = jd1_small
        edges_df = spark.createDataFrame(edges)
        # TNS keeps ~s² of edges, so use a larger s for it
        s = 0.6 if method == "TNS" else 0.3
        run = ensemfdet(spark, edges_df, method=method, s=s, n=12, seed=0)
        sweep = threshold_sweep(run.pin_votes(), truth, np.arange(1, 13))
        run.votes.unpersist()
        assert sweep["f1"].max() > 0.5

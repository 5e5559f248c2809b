"""EnsemFDet (Algorithm 2): sample → parallel FDET → majority voting.

Distributed dataflow (all Catalyst except the per-subgraph solver):

```
edges (pin, merchant)
  └─ sample_edges_spark ──▶ (sample_id, pin, merchant, w)      # N samples, one pass
  └─ groupBy(sample_id).applyInPandas(FDET) ──▶ (sample_id, side, node, block, phi)
  └─ groupBy(side, node).count ──▶ (side, node, votes)         # MVA numerator
  └─ votes >= T ──▶ detected nodes                             # Definition 4
```

The per-sample FDET solve is sequential by the paper's own argument
(heuristic peeling cannot be parallelized); Spark schedules the N
independent solves across cores — exactly the paper's "apply FDET to
all sampled graphs simultaneously with the multicore environment".
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.density import DEFAULT_C
from repro.core.fdet import fdet
from repro.core.sampling import sample_edges_spark
from repro.graph.bipartite import BipartiteGraph

#: Output schema of the grouped FDET solver.
DETECTED_SCHEMA = "sample_id long, side string, node long, block int, phi double"


def _solve_group(pdf: pd.DataFrame, k_max: int, phi_stop_frac: float, c: float) -> pd.DataFrame:
    """Solve FDET on one sampled subgraph (one ``applyInPandas`` group).

    Relabels the group's sparse raw ids to a compact space, runs FDET
    with truncation, and emits one row per detected node per selected
    block, mapped back to original ids.
    """
    if pdf.empty:
        return pd.DataFrame(
            {"sample_id": [], "side": [], "node": [], "block": [], "phi": []}
        ).astype({"sample_id": "int64", "side": "str", "node": "int64", "block": "int32", "phi": "float64"})
    sample_id = int(pdf["sample_id"].iloc[0])
    raw = BipartiteGraph.from_pandas(pdf, "pin", "merchant", "w")
    g, uids, vids = raw.relabeled()
    result = fdet(g, k_max=k_max, truncate=True, phi_stop_frac=phi_stop_frac, c=c)
    rows: list[pd.DataFrame] = []
    for b_idx, block in enumerate(result.selected):
        if len(block.users):
            rows.append(
                pd.DataFrame(
                    {"side": "pin", "node": uids[block.users], "block": b_idx, "phi": block.phi}
                )
            )
        if len(block.merchants):
            rows.append(
                pd.DataFrame(
                    {
                        "side": "merchant",
                        "node": vids[block.merchants],
                        "block": b_idx,
                        "phi": block.phi,
                    }
                )
            )
    if not rows:
        return _solve_group(pd.DataFrame(), k_max, phi_stop_frac, c)
    out = pd.concat(rows, ignore_index=True)
    out.insert(0, "sample_id", sample_id)
    return out.astype(
        {"sample_id": "int64", "side": "str", "node": "int64", "block": "int32", "phi": "float64"}
    )


def detect_on_samples(
    samples: DataFrame,
    k_max: int = 30,
    phi_stop_frac: float = 0.05,
    c: float = DEFAULT_C,
) -> DataFrame:
    """Run FDET on every sampled subgraph in parallel.

    ``samples`` is the output of ``sample_edges_spark``. A node
    detected in several blocks of the *same* sample still casts one
    vote (dedup inside the result via distinct on (sample, side, node)
    happens at vote time).
    """

    def solver(pdf: pd.DataFrame) -> pd.DataFrame:
        return _solve_group(pdf, k_max, phi_stop_frac, c)

    return samples.groupBy("sample_id").applyInPandas(solver, schema=DETECTED_SCHEMA)


def vote(detected: DataFrame) -> DataFrame:
    """Majority Voting Aggregation numerator (Definition 4).

    Returns (side, node, votes) where ``votes`` = number of distinct
    samples in which the node was detected. The caller applies the
    threshold T (``H(u) = accept iff votes >= T``).
    """
    return (
        detected.select("sample_id", "side", "node")
        .distinct()
        .groupBy("side", "node")
        .agg(F.count(F.lit(1)).alias("votes"))
    )


def accept(votes: DataFrame, t: int, side: str | None = "pin") -> DataFrame:
    """Nodes accepted at voting threshold ``t`` (optionally one side only)."""
    out = votes.where(F.col("votes") >= int(t))
    if side is not None:
        out = out.where(F.col("side") == side)
    return out.select("side", "node", "votes")


@dataclass
class EnsemFDetRun:
    """Handle on one EnsemFDet execution: the vote table plus its settings."""

    votes: DataFrame
    method: str
    s: float
    n: int
    k_max: int

    def detected_pins(self, t: int) -> np.ndarray:
        """Accepted PIN ids at threshold ``t`` (collected to the driver)."""
        rows = accept(self.votes, t, side="pin").select("node").collect()
        return np.asarray(sorted(r["node"] for r in rows), dtype=np.int64)

    def pin_votes(self) -> pd.DataFrame:
        """(node, votes) for the PIN side as pandas, for threshold sweeps."""
        return (
            self.votes.where(F.col("side") == "pin")
            .select("node", "votes")
            .toPandas()
            .astype({"node": "int64", "votes": "int64"})
        )


def ensemfdet(
    spark: SparkSession,
    edges: DataFrame,
    method: str = "RES",
    s: float = 0.1,
    n: int = 80,
    seed: int = 0,
    k_max: int = 30,
    phi_stop_frac: float = 0.05,
    c: float = DEFAULT_C,
) -> EnsemFDetRun:
    """Full EnsemFDet pipeline; returns the materialized vote table.

    The vote DataFrame is eagerly cached and counted so that timing a
    call to this function measures the whole sample→solve→vote compute
    (Table III), not a lazy plan.
    """
    samples = sample_edges_spark(edges, method, s, n, seed)
    detected = detect_on_samples(samples, k_max=k_max, phi_stop_frac=phi_stop_frac, c=c)
    votes = vote(detected).cache()
    # The groupBy(sample_id) shuffle hashes N groups into the session's
    # shuffle partitions; with partitions ~ N, several multi-second FDET
    # groups collide into one task and straggle. Spread them out for
    # the duration of this (eagerly executed) pipeline.
    conf = spark.conf
    old_parts = conf.get("spark.sql.shuffle.partitions")
    conf.set("spark.sql.shuffle.partitions", str(max(int(old_parts), 3 * n)))
    try:
        votes.count()  # force execution
    finally:
        conf.set("spark.sql.shuffle.partitions", old_parts)
    return EnsemFDetRun(votes=votes, method=method, s=s, n=n, k_max=k_max)

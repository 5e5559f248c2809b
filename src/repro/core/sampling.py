"""Structural sampling for bipartite graphs (paper §IV-A).

Three methods, each producing N sampled subgraphs at ratio S:

* **RES** — Random Edge Sampling: each edge enters sample i i.i.d.
  with probability S; the subgraph is exactly the sampled edges.
* **ONS** — One-side Node Sampling: sample a fraction S of one node
  side (pins or merchants); the subgraph keeps every edge incident to
  a sampled node (the corresponding rows/columns of W).
* **TNS** — Two-sides Node Sampling: sample both sides at ratio S;
  keep edges whose *both* endpoints were sampled (~S² of the edges,
  as the paper notes).

The Spark variants materialize all N samples in **one distributed
pass**: each edge row is exploded into the sample ids that keep it,
with membership decided by ``xxhash64(endpoint(s), sample_id, seed)``
— a pure function of (ids, sample, seed), so sampling is deterministic,
reproducible across retries, and needs no join against a sampled-node
table (an ONS node is "sampled in i" iff its hash falls below S).

The local numpy variants implement the identical semantics for
property tests (Lemma 1, Theorem 1) without Spark overhead.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.bipartite import BipartiteGraph

#: Sampling-method names accepted by the Spark/local dispatchers.
METHODS = ("RES", "ONS_PIN", "ONS_MERCHANT", "TNS")

# Hash buckets for the inclusion predicate: P(include) = S to ~1e-6.
_BUCKETS = 1_000_000


def _hash_frac(*cols) -> F.Column:
    """xxhash64 of ``cols`` folded into a uniform fraction in [0, 1)."""
    h = F.xxhash64(*cols)
    return ((h % _BUCKETS) + _BUCKETS) % _BUCKETS / float(_BUCKETS)


def sample_edges_spark(
    edges: DataFrame,
    method: str,
    s: float,
    n: int,
    seed: int = 0,
    rescale_weights: bool = False,
) -> DataFrame:
    """Materialize N sampled subgraphs as one DataFrame.

    Parameters mirror the paper's Table II: ``s`` is the sample ratio
    S, ``n`` the number of sampled graphs N. Input needs columns
    ``pin`` and ``merchant``; output adds ``sample_id`` (0..N-1) and
    ``w`` (1.0, or 1/p per Theorem 1 when ``rescale_weights``).
    """
    if method not in METHODS:
        raise ValueError(f"unknown sampling method {method!r}; one of {METHODS}")
    if not (0.0 < s <= 1.0):
        raise ValueError(f"sample ratio must be in (0, 1], got {s}")
    if n < 1:
        raise ValueError(f"need at least one sample, got n={n}")

    sid = F.col("sample_id")
    if method == "RES":
        keep = _hash_frac(F.col("pin"), F.col("merchant"), sid, F.lit(seed)) < s
        p_edge = s
    elif method == "ONS_PIN":
        keep = _hash_frac(F.col("pin"), sid, F.lit(seed)) < s
        p_edge = s
    elif method == "ONS_MERCHANT":
        keep = _hash_frac(F.col("merchant"), sid, F.lit(seed)) < s
        p_edge = s
    else:  # TNS — independent hashes per side (distinct salts)
        keep = (_hash_frac(F.col("pin"), sid, F.lit(seed)) < s) & (
            _hash_frac(F.col("merchant"), sid, F.lit(seed + 1_000_003)) < s
        )
        p_edge = s * s

    w = F.lit(1.0 / p_edge) if rescale_weights else F.lit(1.0)
    return (
        edges.select(
            "pin",
            "merchant",
            F.explode(F.sequence(F.lit(0), F.lit(n - 1))).alias("sample_id"),
        )
        .where(keep)
        .select("sample_id", "pin", "merchant", w.alias("w"))
    )


# ------------------------------------------------------------------ local
def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def res_local(
    g: BipartiteGraph, s: float, seed: int = 0, rescale_weights: bool = False
) -> BipartiteGraph:
    """Local RES: keep each edge i.i.d. with probability ``s``."""
    mask = _rng(seed).random(g.n_edges) < s
    out = g.keep_edges(mask)
    if rescale_weights:
        out.w = out.w / s
    return out


def ons_local(g: BipartiteGraph, s: float, side: str = "merchant", seed: int = 0) -> BipartiteGraph:
    """Local ONS: keep all edges incident to a sampled ``side`` node."""
    rng = _rng(seed)
    if side == "pin":
        picked = rng.random(g.n_u) < s
        return g.keep_edges(picked[g.u])
    if side == "merchant":
        picked = rng.random(g.n_v) < s
        return g.keep_edges(picked[g.v])
    raise ValueError(f"side must be 'pin' or 'merchant', got {side!r}")


def tns_local(g: BipartiteGraph, s: float, seed: int = 0) -> BipartiteGraph:
    """Local TNS: keep edges whose both endpoints were sampled."""
    rng = _rng(seed)
    pu = rng.random(g.n_u) < s
    pv = rng.random(g.n_v) < s
    return g.keep_edges(pu[g.u] & pv[g.v])


def sample_local(g: BipartiteGraph, method: str, s: float, seed: int = 0) -> BipartiteGraph:
    """Dispatch a local sample by method name (same names as Spark)."""
    if method == "RES":
        return res_local(g, s, seed)
    if method == "ONS_PIN":
        return ons_local(g, s, "pin", seed)
    if method == "ONS_MERCHANT":
        return ons_local(g, s, "merchant", seed)
    if method == "TNS":
        return tns_local(g, s, seed)
    raise ValueError(f"unknown sampling method {method!r}; one of {METHODS}")


def expected_sampled_degree_counts(
    degree_hist: np.ndarray, p_v: float, p_e: float
) -> tuple[np.ndarray, np.ndarray]:
    """Paper Eq. 3: E_NS[d_q] and E_ES[d_q] per original degree q.

    ``degree_hist[q]`` = f_D(q), the number of nodes of degree q in the
    original graph. Returns the two expectation curves; Lemma 1 says ES
    overtakes NS above q = log(1-p_v)/log(1-p_e).
    """
    f_d = np.asarray(degree_hist, dtype=np.float64)
    q = np.arange(len(f_d), dtype=np.float64)
    e_ns = f_d * p_v
    e_es = f_d * (1.0 - (1.0 - p_e) ** q)
    return e_ns, e_es


def lemma1_crossover(p_v: float, p_e: float) -> float:
    """Degree threshold above which ES samples nodes at a higher rate than NS."""
    return float(np.log(1.0 - p_v) / np.log(1.0 - p_e))

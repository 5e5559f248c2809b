"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# --------------------------------------------------------------------------
# JD-lite: synthetic 'who buy-from where' bipartite fraud graphs
# (EnsemFDet reproduction — the paper's JD.com datasets are proprietary;
# see DESIGN.md §2 for the substitution rationale.)
# --------------------------------------------------------------------------

#: Paper Table I statistics; ``scale`` multiplies the counts.
JD_PRESETS: dict[str, dict] = {
    "jd1": dict(n_pin=454_925, n_fraud=24_247, n_merchant=226_585, n_edge=1_023_846, n_blocks=12),
    "jd2": dict(n_pin=2_194_325, n_fraud=16_035, n_merchant=120_867, n_edge=2_790_517, n_blocks=8),
    "jd3": dict(n_pin=4_332_696, n_fraud=101_702, n_merchant=556_634, n_edge=7_997_696, n_blocks=20),
}


def _zipf_weights(n: int, alpha: float) -> np.ndarray:
    w = 1.0 / np.arange(1, n + 1, dtype=np.float64) ** alpha
    return w / w.sum()


def jd_transactions(
    preset: str = "jd1",
    scale: float = 0.01,
    seed: int = 0,
    fraud_edges_per_user: int = 10,
    block_merchant_degree: int = 25,
    camo_edges_per_user: int = 2,
) -> tuple[pd.DataFrame, pd.DataFrame, dict]:
    """Generate a JD-lite 'who buy-from where' graph with planted fraud.

    Mirrors the paper's Table I proportions at ``scale``: background
    traffic is heavy-tailed (zipfian user activity and merchant
    popularity — the paper's "rare behaviour" clue holds because dense
    blocks are anomalous against it), and ``n_blocks`` disjoint groups
    of fraud pins each hammer a small private set of fraud merchants
    ("synchronized behaviour"), plus a little camouflage toward popular
    honest merchants (the reason for the 1/log column weights).

    Returns ``(edges, users, meta)``:
      * ``edges`` — pandas DataFrame (pin:int64, merchant:int64), deduped;
      * ``users`` — pandas DataFrame (pin, is_fraud) for *all* pins —
        ``is_fraud`` is the blacklist ground truth;
      * ``meta`` — dict with block assignments and generation stats.
    """
    if preset not in JD_PRESETS:
        raise ValueError(f"unknown preset {preset!r}; one of {sorted(JD_PRESETS)}")
    p = JD_PRESETS[preset]
    rng = _rng(seed)

    n_blocks = max(3, int(round(p["n_blocks"] * min(1.0, scale * 50))))
    n_pin = max(200, int(p["n_pin"] * scale))
    n_fraud = min(n_pin // 2, max(n_blocks * 6, int(p["n_fraud"] * scale)))
    n_merchant = max(60, int(p["n_merchant"] * scale))
    n_edge = max(1000, int(p["n_edge"] * scale))

    # Fraud block layout: split fraud pins round-robin into blocks; give
    # each block enough private merchants that block merchants end up
    # with degree ~ block_merchant_degree (well above background).
    #
    # Blocks are deliberately HETEROGENEOUS in intensity (per-block
    # purchases-per-pin q_b spans [0.6q, q]): groups of identical
    # density would tie under φ — the densest-subgraph peel would then
    # return their disjoint union as one block — while real fraud rings
    # differ in aggressiveness, which is exactly the monotonically
    # decreasing per-block φ staircase of the paper's Fig. 1.
    fraud_pins = np.arange(n_pin - n_fraud, n_pin, dtype=np.int64)  # last ids are fraud
    block_of_pin = np.arange(n_fraud) % n_blocks
    q_per_block = np.maximum(
        3, np.round(np.linspace(fraud_edges_per_user, 0.6 * fraud_edges_per_user, n_blocks))
    ).astype(np.int64)
    fraud_merchants_per_block = []
    next_merchant = n_merchant  # fraud merchants appended after honest ones
    for b in range(n_blocks):
        bu = int((block_of_pin == b).sum())
        # A block with fewer pins than the target merchant degree cannot
        # reach that degree; it becomes a complete bipartite block on
        # q_b merchants instead (otherwise its density would collapse
        # below the honest background and the "planted" group would not
        # be anomalous at small scales).
        if bu <= block_merchant_degree:
            bm = int(q_per_block[b])
        else:
            bm = max(int(q_per_block[b]), int(round(bu * q_per_block[b] / block_merchant_degree)))
        fraud_merchants_per_block.append(np.arange(next_merchant, next_merchant + bm, dtype=np.int64))
        next_merchant += bm
    n_merchant_total = next_merchant

    # Fraud edges: each fraud pin buys from q_b distinct merchants of
    # its block (or all of them if fewer exist).
    fe_u, fe_v = [], []
    for b in range(n_blocks):
        pins_b = fraud_pins[block_of_pin == b]
        merch_b = fraud_merchants_per_block[b]
        q = min(int(q_per_block[b]), len(merch_b))
        # per-pin random q-subset of the block's merchants, vectorized
        perm = np.argsort(rng.random((len(pins_b), len(merch_b))), axis=1)[:, :q]
        fe_u.append(np.repeat(pins_b, q))
        fe_v.append(merch_b[perm].ravel())
    fe_u = np.concatenate(fe_u)
    fe_v = np.concatenate(fe_v)

    # Camouflage: fraud pins also touch honest merchants, drawn uniformly
    # so no single hot merchant accidentally bridges two planted blocks
    # into one detectable super-block (the blocks must stay disjoint, as
    # in the paper's problem definition).
    merch_pop = _zipf_weights(n_merchant, 0.85)
    camo_u = np.repeat(fraud_pins, camo_edges_per_user)
    camo_v = rng.integers(0, n_merchant, size=len(camo_u)).astype(np.int64)

    # Background: heavy-tailed merchant popularity, near-flat user
    # activity (real shoppers make few purchases; an over-active head
    # of users would fabricate a dense honest core denser than the
    # planted blocks).
    n_bg = max(0, n_edge - len(fe_u) - len(camo_u))
    user_act = _zipf_weights(n_pin, 0.3)
    bg_u = rng.choice(n_pin, size=n_bg, p=user_act).astype(np.int64)
    bg_v = rng.choice(n_merchant, size=n_bg, p=merch_pop).astype(np.int64)

    edges = pd.DataFrame(
        {
            "pin": np.concatenate([fe_u, camo_u, bg_u]),
            "merchant": np.concatenate([fe_v, camo_v, bg_v]),
        }
    ).drop_duplicates(ignore_index=True)

    is_fraud = np.zeros(n_pin, dtype=bool)
    is_fraud[fraud_pins] = True
    users = pd.DataFrame({"pin": np.arange(n_pin, dtype=np.int64), "is_fraud": is_fraud})

    meta = dict(
        preset=preset,
        scale=scale,
        n_pin=n_pin,
        n_fraud=n_fraud,
        n_merchant=n_merchant_total,
        n_edge=len(edges),
        n_blocks=n_blocks,
        fraud_pins=fraud_pins,
        block_of_pin=block_of_pin,
        fraud_merchants_per_block=fraud_merchants_per_block,
        paper=dict(p),
    )
    return edges, users, meta


def jd_transactions_spark(
    spark: SparkSession,
    preset: str = "jd1",
    scale: float = 0.01,
    seed: int = 0,
    **kwargs,
) -> tuple[DataFrame, DataFrame, dict]:
    """Spark wrapper over ``jd_transactions`` (same outputs as DataFrames)."""
    edges, users, meta = jd_transactions(preset, scale, seed, **kwargs)
    return spark.createDataFrame(edges), spark.createDataFrame(users), meta

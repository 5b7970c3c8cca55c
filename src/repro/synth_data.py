"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

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


# ---------------------------------------------------------------------------
# Interaction streams for the TDN reproduction (paper §V-A substitutes).
#
# The paper evaluates on six real interaction datasets (Table I). Offline,
# we generate synthetic streams that preserve the structural features the
# algorithms are sensitive to: heavy-tailed influencer popularity (hubs),
# repeat interactions (multi-edges), shallow cascades (retweet chains), and
# bipartite structure for the LBSN check-in data. One interaction per time
# step, t = 1..n_steps, matching §V-B ("one interaction arrives at a time").
# ---------------------------------------------------------------------------


def _zipf_choice(g: np.random.Generator, n: int, alpha: float, size: int) -> np.ndarray:
    """Zipf(alpha)-distributed ranks in [0, n) — popularity skew."""
    ranks = np.arange(1, n + 1)
    w = 1.0 / ranks**alpha
    w /= w.sum()
    return g.choice(n, size=size, p=w)


def lbsn_stream(
    *, n_steps: int, n_places: int = 200, n_users: int = 800,
    alpha: float = 1.1, seed: int = 0,
) -> pd.DataFrame:
    """Bipartite check-in stream ⟨place, user, t⟩ (Brightkite/Gowalla-like).

    A check-in means the place influenced the user (paper §V-A): edges run
    place -> user, so a place's spread is 1 + its distinct check-in users.
    Place ids are ``0..n_places-1``; user ids are offset above them.
    """
    g = np.random.default_rng(seed)
    places = _zipf_choice(g, n_places, alpha, n_steps)
    users = n_places + _zipf_choice(g, n_users, 0.6, n_steps)
    return pd.DataFrame(
        {"u": places.astype(np.int64), "v": users.astype(np.int64),
         "t": np.arange(1, n_steps + 1, dtype=np.int64)}
    )


def retweet_stream(
    *, n_steps: int, n_users: int = 1000, alpha: float = 1.2,
    chain_prob: float = 0.25, seed: int = 0,
) -> pd.DataFrame:
    """User->user retweet/mention stream (Twitter-Higgs/Twitter-HK-like).

    ⟨u, v, t⟩: v retweeted u, i.e. u influenced v. Sources are Zipf-skewed
    hubs; with probability ``chain_prob`` the source is instead a recent
    *influencee* (a user who just retweeted), which produces the shallow
    multi-hop cascades real retweet graphs show.
    """
    g = np.random.default_rng(seed)
    recent: list[int] = []
    us = np.empty(n_steps, dtype=np.int64)
    vs = np.empty(n_steps, dtype=np.int64)
    hub = _zipf_choice(g, n_users, alpha, n_steps)
    # Decorrelate source and target popularity: influencers are rarely
    # influencees in retweet data, so targets draw their (mild) skew over
    # an independent permutation of the user ids.
    perm = g.permutation(n_users)
    tgt = perm[_zipf_choice(g, n_users, 0.4, n_steps)]
    chain = g.random(n_steps) < chain_prob
    pick = g.integers(0, 1 << 30, n_steps)
    for i in range(n_steps):
        if chain[i] and recent:
            u = recent[pick[i] % len(recent)]
        else:
            u = int(hub[i])
        v = int(tgt[i])
        if v == u:
            v = (v + 1) % n_users
        us[i], vs[i] = u, v
        recent.append(v)
        if len(recent) > 50:  # cascades feed off *recent* activity only
            recent.pop(0)
    return pd.DataFrame(
        {"u": us, "v": vs, "t": np.arange(1, n_steps + 1, dtype=np.int64)}
    )


def qa_stream(
    *, n_steps: int, n_users: int = 2000, alpha: float = 0.8, seed: int = 0,
) -> pd.DataFrame:
    """Q&A comment stream (StackOverflow-c2q / c2a-like): ⟨asker, commenter,
    t⟩ with milder popularity skew and a broader node set than Twitter."""
    g = np.random.default_rng(seed)
    u = _zipf_choice(g, n_users, alpha, n_steps).astype(np.int64)
    # Askers and commenters have independent popularity rankings.
    perm = g.permutation(n_users)
    v = perm[_zipf_choice(g, n_users, 0.3, n_steps)].astype(np.int64)
    clash = u == v
    v[clash] = (v[clash] + 1) % n_users
    return pd.DataFrame(
        {"u": u, "v": v, "t": np.arange(1, n_steps + 1, dtype=np.int64)}
    )


def interactions_df(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Lift an interaction stream into Spark with a proper event timestamp
    (``ts``) derived from the integer step ``t`` — input to the Structured
    Streaming pipeline and the windowed aggregations."""
    sdf = spark.createDataFrame(pdf)
    return sdf.withColumn(
        "ts", F.to_timestamp(F.lit("2019-01-01").cast("timestamp")) + F.make_interval(secs=F.col("t").cast("double"))
    )

"""Edges-DataFrame TDN and distributed influence spread (DESIGN §3).

``G_t`` lives as a DataFrame ``(u, v, tau, lifetime, expiry)``; alive-ness
at ``t`` is the TDN condition ``tau <= t < tau + lifetime``. Influence
spread ``f_t(S)`` is computed with iterative semi-join BFS: each level is
one Catalyst plan (join + distinct + anti-join), the driver loops until
the frontier is empty. Checked in tests against both the driver-side BFS
and a DuckDB ``WITH RECURSIVE`` query via :func:`repro.oracle.assert_equivalent`.
"""
from __future__ import annotations

from typing import Iterable

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

#: DuckDB ground-truth for reachability — `edges(u,v)` and `seeds(node)`.
REACHABILITY_SQL = """
WITH RECURSIVE reach AS (
    SELECT node FROM seeds
    UNION
    SELECT e.v AS node FROM edges e, reach r WHERE e.u = r.node
)
SELECT node FROM reach
"""


def tdn_edges(
    spark: SparkSession,
    interactions: pd.DataFrame | DataFrame,
    lifetime_col,
) -> DataFrame:
    """Attach lifetimes and expiry to an interaction stream.

    ``interactions`` has columns ``u, v, t`` (arrival step ``tau``);
    ``lifetime_col`` is a Spark Column (see
    :meth:`repro.tdn.lifetimes.GeometricLifetime.spark_column`).
    """
    sdf = (
        spark.createDataFrame(interactions)
        if isinstance(interactions, pd.DataFrame)
        else interactions
    )
    return (
        sdf.withColumnRenamed("t", "tau")
        .withColumn("lifetime", lifetime_col)
        .withColumn("expiry", F.col("tau") + F.col("lifetime"))
    )


def alive_at(edges: DataFrame, t: int) -> DataFrame:
    """Edges alive at time ``t``: ``tau <= t < tau + lifetime``."""
    return edges.where((F.col("tau") <= F.lit(t)) & (F.lit(t) < F.col("expiry")))


def reachable_nodes(
    spark: SparkSession,
    edges: DataFrame,
    seeds: Iterable[int],
    max_iter: int = 64,
) -> DataFrame:
    """Distinct nodes reachable from ``seeds`` (paths of length >= 0) as a
    one-column DataFrame ``node`` — the distributed ``f_t`` evaluator.

    Level-synchronous BFS: ``frontier`` is joined to the edge list, new
    nodes are appended to ``reached``. Both are cached per level and the
    loop exits on an empty frontier (or ``max_iter`` as a safety bound —
    reachability converges in at most |V| levels).
    """
    seed_list = sorted(set(int(s) for s in seeds))
    if not seed_list:
        return spark.createDataFrame([], "node long")
    arcs = edges.select(F.col("u"), F.col("v")).distinct().cache()
    reached = spark.createDataFrame(pd.DataFrame({"node": seed_list})).cache()
    frontier = reached
    try:
        for _ in range(max_iter):
            nxt = (
                arcs.join(frontier, arcs.u == frontier.node)
                .select(F.col("v").alias("node"))
                .distinct()
                .join(reached, on="node", how="left_anti")
                .cache()
            )
            if nxt.isEmpty():
                break
            reached = reached.unionByName(nxt).cache()
            frontier = nxt
        return reached
    finally:
        arcs.unpersist()


def influence_spread(
    spark: SparkSession, edges: DataFrame, seeds: Iterable[int], max_iter: int = 64
) -> int:
    """``f_t(S)`` = |reachable set| via the distributed BFS."""
    return reachable_nodes(spark, edges, seeds, max_iter).count()

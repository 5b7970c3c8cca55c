"""Tests for the edges-DataFrame TDN + distributed BFS (repro.tdn.spark_graph).

The distributed reachability is checked two ways: against the driver-side
BFS and — via the DuckDB oracle — against a recursive CTE.
"""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.tdn.graph import DiGraph
from repro.tdn.lifetimes import ConstantLifetime, GeometricLifetime
from repro.tdn.spark_graph import (
    REACHABILITY_SQL,
    alive_at,
    influence_spread,
    reachable_nodes,
    tdn_edges,
)


def random_interactions(seed: int, n: int = 120, n_nodes: int = 25) -> pd.DataFrame:
    rng = np.random.default_rng(seed)
    u = rng.integers(0, n_nodes, n)
    v = (u + 1 + rng.integers(0, n_nodes - 1, n)) % n_nodes
    return pd.DataFrame(
        {"u": u.astype("int64"), "v": v.astype("int64"),
         "t": np.sort(rng.integers(1, 50, n)).astype("int64")}
    )


class TestTdnEdges:
    def test_schema(self, spark):
        e = tdn_edges(spark, random_interactions(0), ConstantLifetime(5).spark_column())
        assert set(e.columns) == {"u", "v", "tau", "lifetime", "expiry"}

    def test_expiry_is_tau_plus_lifetime(self, spark):
        e = tdn_edges(spark, random_interactions(1), ConstantLifetime(5).spark_column())
        pdf = e.toPandas()
        assert (pdf["expiry"] == pdf["tau"] + 5).all()

    def test_geometric_lifetimes_within_cap(self, spark):
        e = tdn_edges(
            spark, random_interactions(2), GeometricLifetime(0.3, 7).spark_column(seed=1)
        )
        pdf = e.toPandas()
        assert pdf["lifetime"].between(1, 7).all()

    @pytest.mark.parametrize("t", [1, 10, 30, 60])
    def test_alive_at_matches_pandas_filter(self, spark, t):
        pdf = random_interactions(3)
        e = tdn_edges(spark, pdf, ConstantLifetime(8).spark_column())
        got = alive_at(e, t).count()
        expect = ((pdf["t"] <= t) & (t < pdf["t"] + 8)).sum()
        assert got == expect


class TestDistributedReachability:
    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_matches_driver_bfs(self, spark, seed):
        pdf = random_interactions(seed, n=80, n_nodes=20)
        e = tdn_edges(spark, pdf, ConstantLifetime(1000).spark_column())
        g = DiGraph()
        for u, v in zip(pdf["u"], pdf["v"]):
            g.add_edge(int(u), int(v))
        seeds = sorted(g.nodes())[:3]
        got = {r["node"] for r in reachable_nodes(spark, e, seeds).collect()}
        assert got == g.reachable(seeds)

    def test_matches_duckdb_recursive_cte(self, spark):
        pdf = random_interactions(7, n=100, n_nodes=22)
        e = tdn_edges(spark, pdf, ConstantLifetime(1000).spark_column())
        seeds = [0, 5]
        reach_df = reachable_nodes(spark, e, seeds)
        assert_equivalent(
            reach_df,
            REACHABILITY_SQL,
            edges=pdf[["u", "v"]],
            seeds=pd.DataFrame({"node": seeds}),
        )

    def test_seed_outside_graph(self, spark):
        pdf = pd.DataFrame({"u": [1], "v": [2], "t": [1]})
        e = tdn_edges(spark, pdf, ConstantLifetime(10).spark_column())
        assert influence_spread(spark, e, [99]) == 1

    def test_empty_seed_set(self, spark):
        pdf = pd.DataFrame({"u": [1], "v": [2], "t": [1]})
        e = tdn_edges(spark, pdf, ConstantLifetime(10).spark_column())
        assert influence_spread(spark, e, []) == 0

    def test_cycle_terminates(self, spark):
        pdf = pd.DataFrame({"u": [1, 2, 3], "v": [2, 3, 1], "t": [1, 1, 1]})
        e = tdn_edges(spark, pdf, ConstantLifetime(10).spark_column())
        assert influence_spread(spark, e, [1]) == 3

    def test_spread_on_time_slice(self, spark):
        """f_t over the alive slice differs across t as edges expire."""
        pdf = pd.DataFrame(
            {"u": [1, 2, 3], "v": [2, 3, 4], "t": [1, 1, 20]}
        )
        e = tdn_edges(spark, pdf, ConstantLifetime(5).spark_column())
        assert influence_spread(spark, alive_at(e, 2), [1]) == 3
        assert influence_spread(spark, alive_at(e, 21), [1]) == 1
        assert influence_spread(spark, alive_at(e, 21), [3]) == 2

"""Tests for IC probability derivation (repro.ic.probabilities)."""
import numpy as np
import pandas as pd
import pytest

from repro.ic.probabilities import IC_PROB_SQL, ic_probabilities, ic_probabilities_pandas
from repro.oracle import assert_equivalent


def interactions(seed: int = 0, n: int = 200, n_nodes: int = 12) -> pd.DataFrame:
    rng = np.random.default_rng(seed)
    u = rng.integers(0, n_nodes, n)
    v = (u + 1 + rng.integers(0, n_nodes - 1, n)) % n_nodes
    return pd.DataFrame({"u": u.astype("int64"), "v": v.astype("int64")})


class TestFormula:
    def test_single_interaction_probability(self):
        out = ic_probabilities_pandas(pd.DataFrame({"u": [1], "v": [2]}))
        assert out["p"].iloc[0] == pytest.approx(2 / (1 + np.exp(-0.2)) - 1)

    def test_monotone_in_count(self):
        pdf = pd.DataFrame({"u": [1] * 5 + [3], "v": [2] * 5 + [4]})
        out = ic_probabilities_pandas(pdf).set_index(["u", "v"])
        assert out.loc[(1, 2), "p"] > out.loc[(3, 4), "p"]

    def test_bounded_in_unit_interval(self):
        out = ic_probabilities_pandas(interactions(1, n=500))
        assert ((out["p"] > 0) & (out["p"] < 1)).all()

    def test_saturates_toward_one(self):
        pdf = pd.DataFrame({"u": [1] * 100, "v": [2] * 100})
        out = ic_probabilities_pandas(pdf)
        assert out["p"].iloc[0] > 0.999

    def test_counts(self):
        pdf = pd.DataFrame({"u": [1, 1, 1, 2], "v": [2, 2, 3, 3]})
        out = ic_probabilities_pandas(pdf).set_index(["u", "v"])
        assert out.loc[(1, 2), "x"] == 2
        assert out.loc[(1, 3), "x"] == 1


class TestSparkVsDuckdbVsPandas:
    def test_spark_matches_duckdb(self, spark):
        pdf = interactions(2)
        sdf = ic_probabilities(spark.createDataFrame(pdf))
        assert_equivalent(sdf, IC_PROB_SQL, edges=pdf)

    def test_spark_matches_pandas(self, spark):
        pdf = interactions(3)
        got = (
            ic_probabilities(spark.createDataFrame(pdf))
            .toPandas()
            .sort_values(["u", "v"])
            .reset_index(drop=True)
        )
        expect = (
            ic_probabilities_pandas(pdf).sort_values(["u", "v"]).reset_index(drop=True)
        )
        pd.testing.assert_frame_equal(got, expect, check_dtype=False)

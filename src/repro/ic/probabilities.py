"""Interaction counts -> IC diffusion probabilities (paper §V-C).

The paper's baselines need edge probabilities: "if node u imposed x
interactions on node v at time t, we assign edge (u,v) a diffusion
probability p_uv = 2/(1+exp(-0.2 x)) - 1" — a logistic squash of the
interaction multiplicity. Implemented as a DataFrame aggregation
(groupBy + expression) with a pandas twin for the driver-side samplers;
tests check both against DuckDB SQL.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

#: DuckDB ground truth over a table `edges(u, v)` (one row per interaction).
IC_PROB_SQL = """
SELECT u, v,
       CAST(count(*) AS BIGINT) AS x,
       2.0 / (1.0 + exp(-0.2 * count(*))) - 1.0 AS p
FROM edges
GROUP BY u, v
"""


def ic_probabilities(alive_edges: DataFrame) -> DataFrame:
    """Per-(u,v) interaction count ``x`` and IC probability ``p``."""
    return alive_edges.groupBy("u", "v").agg(
        F.count(F.lit(1)).alias("x")
    ).withColumn(
        "p", F.lit(2.0) / (F.lit(1.0) + F.exp(F.lit(-0.2) * F.col("x"))) - F.lit(1.0)
    )


def ic_probabilities_pandas(edges: pd.DataFrame) -> pd.DataFrame:
    """Pandas twin of :func:`ic_probabilities` (columns ``u, v`` in,
    ``u, v, x, p`` out) — used by the driver-side RR samplers."""
    g = edges.groupby(["u", "v"], as_index=False).size().rename(columns={"size": "x"})
    g["x"] = g["x"].astype(np.int64)
    g["p"] = 2.0 / (1.0 + np.exp(-0.2 * g["x"])) - 1.0
    return g

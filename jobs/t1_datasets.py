"""T1 (paper Table I): synthetic dataset summary — #nodes, #interactions.

The distinct-node counts are computed in Spark (union + distinct over the
endpoint columns) to exercise the DataFrame path on the same data the
driver-side experiments consume.
"""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

import pandas as pd
from pyspark.sql import functions as F

from repro.experiments.datasets import DATASET_NAMES, make_stream


def main(n_steps: int = 5000) -> pd.DataFrame:
    spark = get_spark("t1_datasets")
    rows = []
    for name in DATASET_NAMES:
        sdf = spark.createDataFrame(make_stream(name, n_steps))
        n_nodes = (
            sdf.select(F.col("u").alias("node"))
            .unionByName(sdf.select(F.col("v").alias("node")))
            .distinct()
            .count()
        )
        rows.append({"dataset": name, "n_nodes": n_nodes, "n_interactions": sdf.count()})
    return pd.DataFrame(rows)


if __name__ == "__main__":
    emit("T1 — dataset summary (Table I analog)", main())

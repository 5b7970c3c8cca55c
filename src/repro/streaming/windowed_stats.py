"""Event-time windowed influence statistics (repro-hint: "Structured
Streaming with windowed aggregation").

A cheap degree-style influence proxy: per sliding event-time window, the
number of *distinct* influencees each source touched. The batch variant
(exact ``countDistinct``) is the DuckDB-checked reference; the streaming
variant runs the same plan over the file-replayed stream with a watermark
(streaming aggregations need one to bound state) and
``approx_count_distinct`` (exact distinct aggregation is not available
incrementally).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

#: DuckDB ground truth over `events(u, v, ts)` for tumbling windows of
#: `:win` seconds since epoch — window_start is the bucket's start time.
WINDOWED_DEGREE_SQL = """
SELECT
    to_timestamp(floor(epoch(ts) / {win}) * {win}) AS window_start,
    u,
    count(DISTINCT v) AS influencees
FROM events
GROUP BY 1, 2
"""


def windowed_influence_counts(
    events: DataFrame, window: str = "60 seconds"
) -> DataFrame:
    """Batch variant: exact distinct influencees per tumbling window."""
    return (
        events.groupBy(F.window("ts", window).alias("w"), F.col("u"))
        .agg(F.countDistinct("v").alias("influencees"))
        .select(F.col("w.start").alias("window_start"), "u", "influencees")
    )


def streaming_influence_counts(
    events: DataFrame, window: str = "60 seconds", watermark: str = "120 seconds"
) -> DataFrame:
    """Streaming variant of :func:`windowed_influence_counts`.

    ``events`` must be a streaming DataFrame with an event-time ``ts``
    column; apply to a ``readStream`` source and write with a sink, e.g.
    ``format("memory")`` in tests or console in jobs.
    """
    return (
        events.withWatermark("ts", watermark)
        .groupBy(F.window("ts", window).alias("w"), F.col("u"))
        .agg(F.approx_count_distinct("v").alias("influencees"))
        .select(F.col("w.start").alias("window_start"), "u", "influencees")
    )

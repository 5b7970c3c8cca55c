"""Structured Streaming dataflow around the driver-side trackers.

- :mod:`repro.streaming.driver` — write an interaction stream as ordered
  parquet chunks and replay them as micro-batches into ``foreachBatch``.
- :mod:`repro.streaming.windowed_stats` — event-time windowed
  distinct-influencee aggregation (degree heuristic / sanity baseline).
"""

from repro.streaming.driver import replay_stream, write_stream_chunks

__all__ = ["replay_stream", "write_stream_chunks"]

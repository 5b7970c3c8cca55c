"""Time-decaying dynamic interaction network (TDN) substrate.

The TDN model (paper §II-B): each arriving edge ``(u, v, tau)`` gets a
lifetime ``l in {1..L}``; at time ``t`` the edge is alive iff
``tau <= t < tau + l``. Submodules:

- :mod:`repro.tdn.lifetimes` — lifetime assignment (geometric / constant /
  infinite), both seeded-NumPy and Spark Column implementations.
- :mod:`repro.tdn.graph` — driver-side multigraph with scheduled expiry and
  BFS reachability.
- :mod:`repro.tdn.influence` — counting influence-spread oracle ``f_t``.
- :mod:`repro.tdn.spark_graph` — edges-DataFrame TDN with iterative
  semi-join BFS influence spread.
"""

from repro.tdn.graph import TDNGraph
from repro.tdn.influence import InfluenceOracle
from repro.tdn.lifetimes import (
    ConstantLifetime,
    GeometricLifetime,
    InfiniteLifetime,
)

__all__ = [
    "TDNGraph",
    "InfluenceOracle",
    "ConstantLifetime",
    "GeometricLifetime",
    "InfiniteLifetime",
]

"""Counting influence-spread oracle ``f_t`` (paper Definition 3).

``f_t(S)`` = number of distinct nodes reachable from ``S`` in ``G_t``
(directed paths of length >= 0, so the seeds count themselves). Every
evaluation — a plain ``spread`` or a marginal gain — increments an oracle
call counter: the paper's hardware-independent efficiency metric (§V-C,
"an oracle call refers to an evaluation of f_t").

A :class:`CallCounter` can be shared by many oracles so an algorithm that
owns several SieveADN instances (BasicReduction, HistApprox) reports one
aggregate count.

The oracle memoizes the reached set of a *solution set* between calls, so
sieve/greedy marginal gains are a single BFS from the candidate plus a set
union — still billed as exactly one oracle call, identically for every
algorithm.
"""
from __future__ import annotations

from typing import Iterable

from repro.tdn.graph import DiGraph


class CallCounter:
    """Mutable oracle-call tally shared across oracles of one algorithm."""

    __slots__ = ("calls",)

    def __init__(self) -> None:
        self.calls = 0

    def __repr__(self) -> str:  # pragma: no cover - debug aid
        return f"CallCounter(calls={self.calls})"


class InfluenceOracle:
    """Wraps a :class:`DiGraph` with call counting and per-set caching."""

    def __init__(self, graph: DiGraph, counter: CallCounter | None = None) -> None:
        self.graph = graph
        self.counter = counter if counter is not None else CallCounter()
        # cache: frozenset(S) -> (graph.version, reached set)
        self._cache: dict[frozenset[int], tuple[int, set[int]]] = {}

    @property
    def oracle_calls(self) -> int:
        return self.counter.calls

    def spread(self, seeds: Iterable[int]) -> int:
        """``f_t(S)`` — one oracle call."""
        self.counter.calls += 1
        return len(self._reach(frozenset(seeds)))

    def marginal_gain(self, base: frozenset[int], v: int) -> int:
        """``f_t(S ∪ {v}) − f_t(S)`` — one oracle call.

        Uses the cached reach of ``base`` (recomputed if the graph mutated
        since) and a BFS from ``v`` only.
        """
        self.counter.calls += 1
        r_base = self._reach(base)
        if v in r_base:
            return 0
        r_v = self.graph.reachable((v,))
        return len(r_v - r_base)

    def _reach(self, s: frozenset[int]) -> set[int]:
        hit = self._cache.get(s)
        if hit is not None and hit[0] == self.graph.version:
            return hit[1]
        r = self.graph.reachable(s)
        # Keep the cache bounded: sieve algorithms query O(eps^-1 log k)
        # distinct sets and greedy its k prefixes; evict stale entries when
        # the map grows past that working set.
        if len(self._cache) > 4096:
            v = self.graph.version
            self._cache = {k: h for k, h in self._cache.items() if h[0] == v}
        self._cache[s] = (self.graph.version, r)
        return r


def brute_force_opt(graph: DiGraph, k: int) -> tuple[frozenset[int], int]:
    """Exact optimum of ``f`` over all <=k-subsets — tests only (tiny graphs)."""
    from itertools import combinations

    nodes = sorted(graph.nodes())
    best, best_val = frozenset(), 0
    for r in range(1, min(k, len(nodes)) + 1):
        for combo in combinations(nodes, r):
            val = len(graph.reachable(combo))
            if val > best_val:
                best, best_val = frozenset(combo), val
    return best, best_val

"""Shared simulation loop for every experiment table.

An experiment feeds one interaction per time step (paper §V-B) through a
tracker and records, at query steps, the *externally scored* value of the
tracker's solution — ``f_t(S)`` evaluated on a reference ``G_t`` that the
runner maintains independently — plus the tracker's cumulative internal
oracle calls. External scoring is never billed to any algorithm, so value
comparisons are apples-to-apples across sieve, greedy, random, and the
RR-set baselines.
"""
from __future__ import annotations

import time
from typing import Callable

import numpy as np
import pandas as pd

from repro.core.basic_reduction import BasicReduction
from repro.core.greedy import lazy_greedy, random_solution
from repro.core.histapprox import HistApprox
from repro.ic.probabilities import ic_probabilities_pandas
from repro.rrset.dim import DIMIndex
from repro.rrset.imm import imm_select
from repro.rrset.rr import ICGraph
from repro.rrset.timplus import tim_plus_select
from repro.tdn.graph import TDNGraph
from repro.tdn.lifetimes import GeometricLifetime


def assign_lifetimes(
    stream: pd.DataFrame, p: float, L: int, seed: int = 0
) -> pd.DataFrame:
    """Attach a truncated-geometric lifetime column ``l`` (paper §V-B)."""
    out = stream.sort_values("t", kind="stable").reset_index(drop=True).copy()
    out["l"] = GeometricLifetime(p, L, seed=seed).sample(len(out))
    return out


class _Reference:
    """Independent ``G_t`` for scoring + the alive-interaction frame the
    RR baselines derive IC probabilities from."""

    def __init__(self) -> None:
        self.tdn = TDNGraph()

    def advance(self, t: int, batch: pd.DataFrame) -> tuple[pd.DataFrame, pd.DataFrame]:
        """Apply one step; returns (added, removed) interaction frames."""
        dropped = self.tdn.advance_to(t)
        self.tdn.add_edges(batch[["u", "v", "l"]].itertuples(index=False), t)
        added = batch[["u", "v"]]
        removed = pd.DataFrame(dropped, columns=["u", "v"])
        return added, removed

    def score(self, seeds) -> int:
        """Unbilled f_t(S) on the reference graph."""
        if not seeds:
            return 0
        return len(self.tdn.g.reachable(seeds))

    def alive_interactions(self) -> pd.DataFrame:
        rows = [(u, v) for u, v, _ in self.tdn.edges_with_lifetime()]
        return pd.DataFrame(rows, columns=["u", "v"])


def _iter_steps(stream: pd.DataFrame):
    for t, batch in stream.groupby("t", sort=True):
        yield int(t), batch


def run_tracker(
    stream: pd.DataFrame,
    algo: str,
    *,
    k: int,
    eps: float = 0.1,
    L: int = 100,
    query_every: int = 1,
    seed: int = 0,
    rr_kwargs: dict | None = None,
) -> pd.DataFrame:
    """Run one tracker over a lifetimed stream (columns ``u, v, t, l``).

    ``algo`` ∈ {"histapprox", "basicreduction", "greedy", "random",
    "dim", "imm", "tim+"}. Returns one row per query step:
    ``t, value, calls, n_instances, wall_s`` (calls are cumulative
    internal oracle calls / RR-sets sampled; 0 for random).
    """
    rr_kwargs = dict(rr_kwargs or {})
    ref = _Reference()
    rng = np.random.default_rng(seed + 17)
    records: list[dict] = []
    t_start = time.perf_counter()

    tracker = None
    dim: DIMIndex | None = None
    if algo == "histapprox":
        tracker = HistApprox(k, eps, L)
    elif algo == "basicreduction":
        tracker = BasicReduction(k, eps, L)
    elif algo == "dim":
        dim = DIMIndex(
            beta=rr_kwargs.pop("beta", 32),
            seed=seed,
            max_sets=rr_kwargs.pop("max_sets", 2000),
        )
    elif algo not in ("greedy", "random", "imm", "tim+"):
        raise ValueError(f"unknown algo {algo!r}")

    for t, batch in _iter_steps(stream):
        added, removed = ref.advance(t, batch)
        edges = list(batch[["u", "v", "l"]].itertuples(index=False))

        solution: frozenset[int] = frozenset()
        calls = 0
        n_instances = 0
        if tracker is not None:  # sieve family: every step is processed
            solution, _ = tracker.step(edges)
            calls = tracker.oracle_calls
            n_instances = getattr(tracker, "n_instances", 0)
        elif dim is not None:  # DIM maintains its index every step
            probs = ic_probabilities_pandas(ref.alive_interactions())
            dim.update(probs, added=added, removed=removed)
            calls = dim.n_resampled

        if t % query_every != 0:
            continue

        if algo == "greedy":
            from repro.tdn.influence import CallCounter

            counter = CallCounter()
            solution, _ = lazy_greedy(ref.tdn.g, k, counter)
            calls = records[-1]["calls"] + counter.calls if records else counter.calls
        elif algo == "random":
            solution = random_solution(sorted(ref.tdn.nodes()), k, rng)
        elif algo == "dim":
            solution = dim.query(k)
        elif algo in ("imm", "tim+"):
            probs = ic_probabilities_pandas(ref.alive_interactions())
            graph = ICGraph(probs)
            select = imm_select if algo == "imm" else tim_plus_select
            prev = records[-1]["calls"] if records else 0
            solution, used = select(graph, k, seed=seed + t, **rr_kwargs)
            calls = prev + used

        records.append(
            {
                "t": t,
                "value": ref.score(solution),
                "calls": calls,
                "n_instances": n_instances,
                "wall_s": time.perf_counter() - t_start,
            }
        )
    return pd.DataFrame(records)

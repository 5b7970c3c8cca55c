"""T5/T6 (paper Figs. 11-12): HistApprox vs Greedy across budgets ``k``
and lifetime caps ``L``.

Paper's observations to reproduce: the value ratio stays high for all
``k`` and ``L``; the *call* ratio improves (drops) as ``k`` grows —
HistApprox scales logarithmically with ``k``, Greedy linearly — and is
insensitive to ``L``.
"""
from __future__ import annotations

import pandas as pd

from repro.experiments.datasets import make_stream
from repro.experiments.runner import assign_lifetimes, run_tracker


def _one(
    stream: pd.DataFrame,
    *,
    k: int,
    L: int,
    p: float,
    eps: float,
    query_every: int,
    seed: int,
) -> dict:
    lifetimed = assign_lifetimes(stream, p=p, L=L, seed=seed)
    greedy = run_tracker(lifetimed, "greedy", k=k, query_every=query_every)
    hist = run_tracker(lifetimed, "histapprox", k=k, eps=eps, L=L)
    hq = hist[hist["t"].isin(set(greedy["t"]))].reset_index(drop=True)
    greedy_proj = int(greedy["calls"].iloc[-1]) * query_every
    return {
        "value_ratio": (hq["value"].to_numpy() / greedy["value"].to_numpy()).mean(),
        "call_ratio": hist["calls"].iloc[-1] / max(greedy_proj, 1),
        "hist_calls": int(hist["calls"].iloc[-1]),
        "greedy_calls_projected": greedy_proj,
    }


def vary_k(
    *,
    dataset: str = "brightkite",
    k_values: tuple[int, ...] = (10, 20, 40, 80),
    n_steps: int = 1000,
    L: int = 1000,
    p: float = 0.001,
    eps: float = 0.2,
    query_every: int = 5,
    seed: int = 0,
) -> pd.DataFrame:
    """T5: one row per budget k (paper Fig. 11)."""
    stream = make_stream(dataset, n_steps, seed)
    return pd.DataFrame(
        [
            {"k": k, **_one(stream, k=k, L=L, p=p, eps=eps, query_every=query_every, seed=seed)}
            for k in k_values
        ]
    )


def vary_l(
    *,
    dataset: str = "brightkite",
    l_values: tuple[int, ...] = (500, 1000, 2000, 4000),
    n_steps: int = 1000,
    p: float = 0.005,
    k: int = 10,
    eps: float = 0.2,
    query_every: int = 5,
    seed: int = 0,
) -> pd.DataFrame:
    """T6: one row per lifetime cap L (paper Fig. 12).

    ``p`` is held fixed with mean lifetime ``1/p`` well below every ``L``
    — the paper's Geo(0.001) at L=10K..100K has the same "cap rarely
    binds" character, which is why L barely affects performance.
    """
    stream = make_stream(dataset, n_steps, seed)
    return pd.DataFrame(
        [
            {"L": L, **_one(stream, k=k, L=L, p=p, eps=eps, query_every=query_every, seed=seed)}
            for L in l_values
        ]
    )

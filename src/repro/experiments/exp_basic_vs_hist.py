"""T2 (paper Fig. 7): BasicReduction vs HistApprox across lifetime skew.

The paper sweeps the geometric-decay parameter ``p`` at fixed ``L=1000``
and reports, per ``p``, the time-averaged solution value and the total
number of oracle calls of both algorithms. We sweep the same *shape
parameter* ``p·L`` (1, 2, 4, 8) at a smaller ``L`` (DESIGN §2 scaling).

Paper's observations to reproduce: value ratio HA/BR ≥ 0.98; BR's calls
decrease as ``p`` grows; HA uses a small fraction of BR's calls.
"""
from __future__ import annotations

import pandas as pd

from repro.experiments.datasets import make_stream
from repro.experiments.runner import assign_lifetimes, run_tracker


def run(
    *,
    dataset: str = "brightkite",
    n_steps: int = 500,
    L: int = 100,
    pl_values: tuple[float, ...] = (1.0, 2.0, 4.0, 8.0),
    k: int = 10,
    eps: float = 0.1,
    seed: int = 0,
) -> pd.DataFrame:
    """One row per ``p``: values, oracle calls, and HA/BR ratios."""
    stream = make_stream(dataset, n_steps, seed)
    rows = []
    for pl in pl_values:
        p = pl / L
        lifetimed = assign_lifetimes(stream, p=p, L=L, seed=seed)
        br = run_tracker(lifetimed, "basicreduction", k=k, eps=eps, L=L)
        ha = run_tracker(lifetimed, "histapprox", k=k, eps=eps, L=L)
        rows.append(
            {
                "p": p,
                "br_value": br["value"].mean(),
                "ha_value": ha["value"].mean(),
                "br_calls": int(br["calls"].iloc[-1]),
                "ha_calls": int(ha["calls"].iloc[-1]),
                "value_ratio": ha["value"].mean() / max(br["value"].mean(), 1e-12),
                "call_ratio": ha["calls"].iloc[-1] / max(br["calls"].iloc[-1], 1),
            }
        )
    return pd.DataFrame(rows)

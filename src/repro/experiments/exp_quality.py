"""T3/T4 (paper Figs. 8-10): HistApprox vs Greedy vs Random — solution
quality over time and cumulative oracle-call efficiency.

One sweep serves both tables: per (dataset, ε) it runs HistApprox on every
step, lazy Greedy and Random at query steps, and reports

- ``value_ratio``  — time-averaged ``f_t(S_hist) / f_t(S_greedy)`` (Fig. 9),
- ``random_ratio`` — same for Random (Fig. 8's lower envelope),
- ``call_ratio``   — cumulative HistApprox calls / *projected* cumulative
  Greedy calls (Fig. 10). Greedy is invoked every ``query_every`` steps to
  keep the run laptop-sized; since each invocation is from-scratch, running
  it every step would cost ``query_every`` times its summed calls — the
  projection multiplies by exactly that factor (recorded in EXPERIMENTS.md).
"""
from __future__ import annotations

import pandas as pd

from repro.experiments.datasets import DATASET_NAMES, make_stream
from repro.experiments.runner import assign_lifetimes, run_tracker


def sweep(
    *,
    datasets: tuple[str, ...] = DATASET_NAMES,
    eps_values: tuple[float, ...] = (0.1, 0.15, 0.2),
    n_steps: int = 1200,
    k: int = 10,
    L: int = 1000,
    p: float = 0.001,
    query_every: int = 5,
    seed: int = 0,
) -> pd.DataFrame:
    """Rows: dataset × ε with value/call columns for T3 and T4."""
    rows = []
    for name in datasets:
        stream = make_stream(name, n_steps, seed)
        lifetimed = assign_lifetimes(stream, p=p, L=L, seed=seed)
        greedy = run_tracker(lifetimed, "greedy", k=k, query_every=query_every)
        rand = run_tracker(lifetimed, "random", k=k, query_every=query_every, seed=seed)
        greedy_proj = int(greedy["calls"].iloc[-1]) * query_every
        qsteps = set(greedy["t"])
        for eps in eps_values:
            hist = run_tracker(lifetimed, "histapprox", k=k, eps=eps, L=L)
            hq = hist[hist["t"].isin(qsteps)].reset_index(drop=True)
            gv = greedy["value"].to_numpy()
            rows.append(
                {
                    "dataset": name,
                    "eps": eps,
                    "hist_value": hq["value"].mean(),
                    "greedy_value": greedy["value"].mean(),
                    "random_value": rand["value"].mean(),
                    "value_ratio": (hq["value"].to_numpy() / gv).mean(),
                    "random_ratio": (rand["value"].to_numpy() / gv).mean(),
                    "hist_calls": int(hist["calls"].iloc[-1]),
                    "greedy_calls_projected": greedy_proj,
                    "call_ratio": hist["calls"].iloc[-1] / max(greedy_proj, 1),
                }
            )
    return pd.DataFrame(rows)


def quality_table(sweep_df: pd.DataFrame) -> pd.DataFrame:
    """T3 view (Figs. 8-9): value ratios per dataset × ε."""
    return sweep_df.pivot_table(index="dataset", columns="eps", values="value_ratio")


def efficiency_table(sweep_df: pd.DataFrame) -> pd.DataFrame:
    """T4 view (Fig. 10): call ratios per dataset × ε."""
    return sweep_df.pivot_table(index="dataset", columns="eps", values="call_ratio")

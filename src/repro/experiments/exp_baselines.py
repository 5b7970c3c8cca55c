"""T7/T8 (paper Figs. 13-14): quality and throughput against the full
baseline roster — HistApprox(ε=0.3), DIM, IMM, TIM+, Random, with Greedy
as the quality reference.

Paper's observations to reproduce: HistApprox/IMM/TIM+ find high-quality
solutions and DIM is less stable (T7); HistApprox has the highest stream
throughput, then Greedy and DIM, with IMM/TIM+ (full static rebuilds per
step) slowest (T8).
"""
from __future__ import annotations

import pandas as pd

from repro.experiments.datasets import make_stream
from repro.experiments.runner import assign_lifetimes, run_tracker

QUALITY_ALGOS = ("histapprox", "dim", "imm", "tim+", "random")


def quality_table(
    *,
    datasets: tuple[str, ...] = ("brightkite", "twitter-higgs", "stackoverflow-c2q"),
    k_values: tuple[int, ...] = (10, 20, 40),
    n_steps: int = 800,
    L: int = 1000,
    p: float = 0.001,
    eps: float = 0.3,
    query_every: int = 20,
    seed: int = 0,
    rr_max_sets: int = 1500,
) -> pd.DataFrame:
    """T7: rows dataset × k, value ratio vs Greedy per method (Fig. 13)."""
    rows = []
    for name in datasets:
        stream = make_stream(name, n_steps, seed)
        lifetimed = assign_lifetimes(stream, p=p, L=L, seed=seed)
        for k in k_values:
            greedy = run_tracker(lifetimed, "greedy", k=k, query_every=query_every)
            qsteps = set(greedy["t"])
            gv = greedy["value"].to_numpy()
            row = {"dataset": name, "k": k, "greedy_value": gv.mean()}
            for algo in QUALITY_ALGOS:
                res = run_tracker(
                    lifetimed,
                    algo,
                    k=k,
                    eps=eps,
                    L=L,
                    query_every=query_every,
                    seed=seed,
                    rr_kwargs={"max_sets": rr_max_sets},
                )
                rq = res[res["t"].isin(qsteps)]
                row[algo] = (rq["value"].to_numpy() / gv).mean()
            rows.append(row)
    return pd.DataFrame(rows)


def throughput_table(
    *,
    dataset: str = "brightkite",
    n_steps: int = 200,
    k: int = 10,
    L: int = 1000,
    p: float = 0.001,
    eps: float = 0.3,
    seed: int = 0,
    rr_max_sets: int = 800,
) -> pd.DataFrame:
    """T8: interactions/second per method, every method queried at every
    step (the paper's "maximum stream processing speed", Fig. 14)."""
    stream = make_stream(dataset, n_steps, seed)
    lifetimed = assign_lifetimes(stream, p=p, L=L, seed=seed)
    rows = []
    for algo in ("histapprox", "greedy", "dim", "imm", "tim+"):
        res = run_tracker(
            lifetimed,
            algo,
            k=k,
            eps=eps,
            L=L,
            query_every=1,
            seed=seed,
            rr_kwargs={"max_sets": rr_max_sets},
        )
        wall = res["wall_s"].iloc[-1]
        rows.append(
            {
                "algo": algo,
                "wall_s": wall,
                "throughput_eps": n_steps / max(wall, 1e-9),
                "final_value": res["value"].iloc[-1],
            }
        )
    return pd.DataFrame(rows)

"""T3 (paper Figs. 8-9): HistApprox vs Greedy vs Random solution quality.

The sweep also powers T4; it is computed once per bench session and
cached at module scope.
"""
import pytest
from _tables import save

from repro.experiments.exp_quality import quality_table, sweep

_CACHE: dict = {}


def full_sweep():
    if "sweep" not in _CACHE:
        _CACHE["sweep"] = sweep(
            n_steps=1200, k=10, L=1000, p=0.001, query_every=5,
            eps_values=(0.1, 0.15, 0.2),
        )
    return _CACHE["sweep"]


def test_t3_quality(benchmark):
    s = benchmark.pedantic(full_sweep, rounds=1, iterations=1)
    save("t3_quality_sweep", s)
    save("t3_quality", quality_table(s).reset_index())
    # Paper: HistApprox close to Greedy on every dataset, far above Random.
    assert (s["value_ratio"] > 0.85).all()
    assert (s["value_ratio"] > s["random_ratio"] + 0.1).all()
    # Larger eps never helps quality much: per dataset, eps=0.2 <= eps=0.1 + slack.
    by = s.pivot_table(index="dataset", columns="eps", values="value_ratio")
    assert (by[0.2] <= by[0.1] + 0.05).all()

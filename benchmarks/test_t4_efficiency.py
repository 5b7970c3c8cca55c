"""T4 (paper Fig. 10): HistApprox vs Greedy oracle-call efficiency."""
from _tables import save

from repro.experiments.exp_quality import efficiency_table
from test_t3_quality import full_sweep


def test_t4_efficiency(benchmark):
    s = benchmark.pedantic(full_sweep, rounds=1, iterations=1)
    save("t4_efficiency", efficiency_table(s).reset_index())
    # Paper: HistApprox uses a fraction of Greedy's oracle calls on every
    # dataset, and larger eps means fewer calls.
    assert (s["call_ratio"] < 0.6).all()
    by = s.pivot_table(index="dataset", columns="eps", values="call_ratio")
    assert (by[0.2] <= by[0.1] * 1.1).all()
    # eps=0.2 hits the paper's headline regime on at least half the datasets.
    assert (by[0.2] < 0.25).sum() >= 3

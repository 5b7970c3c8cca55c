"""T5 (paper Fig. 11): HistApprox vs Greedy across budgets k."""
from _tables import save

from repro.experiments.exp_k_l import vary_k


def test_t5_vary_k(benchmark):
    table = benchmark.pedantic(
        lambda: vary_k(
            dataset="twitter-higgs", k_values=(10, 20, 40, 80),
            n_steps=800, L=1000, p=0.001, eps=0.2, query_every=5,
        ),
        rounds=1,
        iterations=1,
    )
    save("t5_vary_k", table)
    # Paper: quality stays high for every budget...
    assert (table["value_ratio"] > 0.85).all()
    # ...and HistApprox stays cheaper than Greedy throughout. (The paper's
    # *monotone* improvement with k does not reproduce here — see
    # EXPERIMENTS.md T5 deviation note.)
    assert (table["call_ratio"] < 1.0).all()

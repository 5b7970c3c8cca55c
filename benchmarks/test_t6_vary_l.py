"""T6 (paper Fig. 12): HistApprox vs Greedy across lifetime caps L."""
from _tables import save

from repro.experiments.exp_k_l import vary_l


def test_t6_vary_l(benchmark):
    table = benchmark.pedantic(
        lambda: vary_l(
            dataset="brightkite", l_values=(500, 1000, 2000, 4000),
            n_steps=800, p=0.005, k=10, eps=0.2, query_every=5,
        ),
        rounds=1,
        iterations=1,
    )
    save("t6_vary_l", table)
    # Paper: L barely affects either ratio (cap rarely binds).
    assert (table["value_ratio"] > 0.85).all()
    assert table["value_ratio"].max() - table["value_ratio"].min() < 0.08
    assert table["call_ratio"].max() - table["call_ratio"].min() < 0.15

"""T2 (paper Fig. 7): BasicReduction vs HistApprox across lifetime skew."""
from _tables import save

from repro.experiments.exp_basic_vs_hist import run


def test_t2_basic_vs_hist(benchmark):
    table = benchmark.pedantic(
        lambda: run(dataset="brightkite", n_steps=600, L=300, pl_values=(1.0, 2.0, 4.0, 8.0), k=10, eps=0.1),
        rounds=1,
        iterations=1,
    )
    save("t2_basic_vs_hist", table)
    # Paper: HA within 2% of BR's value...
    assert (table["value_ratio"] > 0.95).all()
    # ...BR's cost falls as lifetimes shorten (larger p)...
    assert table["br_calls"].iloc[-1] < table["br_calls"].iloc[0]
    # ...and HA needs a small fraction of BR's oracle calls.
    assert (table["call_ratio"] < 0.5).all()
    assert table["call_ratio"].iloc[0] < 0.25  # long-lifetime regime gap

"""T7 (paper Fig. 13): solution quality of HistApprox / DIM / IMM / TIM+ /
Random relative to Greedy."""
from _tables import save

from repro.experiments.exp_baselines import quality_table


def test_t7_baseline_quality(benchmark):
    table = benchmark.pedantic(
        lambda: quality_table(
            datasets=("brightkite", "twitter-higgs"), k_values=(10, 40),
            n_steps=600, L=1000, p=0.001, eps=0.3, query_every=30,
            rr_max_sets=6000,
        ),
        rounds=1,
        iterations=1,
    )
    save("t7_baseline_quality", table)
    # Paper: HistApprox, IMM and TIM+ all find high-quality solutions...
    assert (table["histapprox"] > 0.85).all()
    for algo in ("imm", "tim+"):
        assert (table[algo] > 0.7).all(), algo
    # ...every principled method beats Random...
    for algo in ("histapprox", "imm", "tim+", "dim"):
        assert table[algo].mean() > table["random"].mean(), algo
    # ...and DIM is the least stable of the index methods (paper: "DIM
    # seems not so stable").
    assert table["dim"].min() < min(table["imm"].min(), table["tim+"].min())

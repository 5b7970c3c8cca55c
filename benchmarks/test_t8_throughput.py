"""T8 (paper Fig. 14): maximum stream-processing throughput per method."""
from _tables import save

from repro.experiments.exp_baselines import throughput_table


def test_t8_throughput(benchmark):
    table = benchmark.pedantic(
        lambda: throughput_table(
            dataset="brightkite", n_steps=400, k=10, L=1000, p=0.001,
            eps=0.3, rr_max_sets=300,
        ),
        rounds=1,
        iterations=1,
    )
    save("t8_throughput", table)
    tp = table.set_index("algo")["throughput_eps"]
    # Paper: HistApprox fastest, then Greedy and DIM, static rebuilders
    # (IMM/TIM+) slowest. In this Python implementation HistApprox and
    # Greedy are a near-tie on wall-clock (the oracle is so cheap that
    # driver bookkeeping dominates; by the paper's implementation-
    # independent oracle-call metric — T4 — HistApprox is 4-5x cheaper).
    assert tp["histapprox"] >= 0.9 * tp.max()
    assert min(tp["histapprox"], tp["greedy"]) > tp["dim"]
    assert tp["dim"] > max(tp["imm"], tp["tim+"])

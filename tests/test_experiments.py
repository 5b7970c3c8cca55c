"""Integration tests: every experiment table runs at tiny scale and shows
the paper's qualitative shape (the full-scale numbers live in
EXPERIMENTS.md / benchmarks)."""
import pandas as pd
import pytest

from repro.experiments.exp_baselines import quality_table, throughput_table
from repro.experiments.exp_basic_vs_hist import run as basic_vs_hist
from repro.experiments.exp_k_l import vary_k, vary_l
from repro.experiments.exp_quality import efficiency_table, quality_table as qtable, sweep


@pytest.fixture(scope="module")
def t2():
    return basic_vs_hist(n_steps=150, L=40, pl_values=(1.0, 4.0), k=3, eps=0.1)


@pytest.fixture(scope="module")
def t34():
    return sweep(
        datasets=("brightkite", "twitter-hk"),
        eps_values=(0.1, 0.2),
        n_steps=150,
        k=3,
        L=100,
        p=0.01,
        query_every=10,
    )


class TestT2BasicVsHist(object):
    def test_columns(self, t2):
        assert {"p", "br_value", "ha_value", "br_calls", "ha_calls",
                "value_ratio", "call_ratio"} <= set(t2.columns)

    def test_value_close(self, t2):
        assert (t2["value_ratio"] > 0.9).all()

    def test_hist_cheaper(self, t2):
        assert (t2["call_ratio"] < 0.8).all()

    def test_br_calls_decrease_with_p(self, t2):
        assert t2["br_calls"].iloc[-1] < t2["br_calls"].iloc[0]


class TestT3T4QualityEfficiency:
    def test_rows(self, t34):
        assert len(t34) == 4  # 2 datasets x 2 eps

    def test_hist_between_random_and_greedy(self, t34):
        assert (t34["value_ratio"] <= 1.02).all()
        assert (t34["value_ratio"] > t34["random_ratio"]).all()

    def test_hist_quality_high(self, t34):
        assert (t34["value_ratio"] > 0.8).all()

    def test_hist_cheaper_than_greedy(self, t34):
        assert (t34["call_ratio"] < 1.0).all()

    def test_pivots(self, t34):
        q = qtable(t34)
        e = efficiency_table(t34)
        assert q.shape == (2, 2) and e.shape == (2, 2)


class TestT5T6KAndL:
    def test_vary_k_shape(self):
        t5 = vary_k(
            dataset="brightkite", k_values=(2, 6), n_steps=120, L=60, p=0.01,
            eps=0.2, query_every=10,
        )
        assert list(t5["k"]) == [2, 6]
        assert (t5["value_ratio"] > 0.75).all()
        # quality holds at every k; the efficiency edge (call_ratio well
        # under 1) and its k-dependence need paper-scale graphs — asserted
        # loosely here, measured properly in benchmarks/EXPERIMENTS.md T5.
        assert (t5["call_ratio"] < 1.5).all()

    def test_vary_l_insensitive(self):
        t6 = vary_l(
            dataset="brightkite", l_values=(60, 240), n_steps=120, p=0.05,
            k=3, eps=0.2, query_every=10,
        )
        assert list(t6["L"]) == [60, 240]
        a, b = t6["value_ratio"]
        assert abs(a - b) < 0.15  # L barely matters


class TestT7T8Baselines:
    def test_quality_table(self):
        t7 = quality_table(
            datasets=("brightkite",), k_values=(3,), n_steps=120, L=60,
            p=0.01, eps=0.3, query_every=30, rr_max_sets=400,
        )
        row = t7.iloc[0]
        for algo in ("histapprox", "dim", "imm", "tim+", "random"):
            assert 0 < row[algo] <= 1.05
        assert row["histapprox"] > row["random"]

    def test_throughput_table(self):
        t8 = throughput_table(
            dataset="brightkite", n_steps=40, k=3, L=60, p=0.01, rr_max_sets=200,
        )
        assert set(t8["algo"]) == {"histapprox", "greedy", "dim", "imm", "tim+"}
        assert (t8["throughput_eps"] > 0).all()
        tp = t8.set_index("algo")["throughput_eps"]
        # static rebuilders are the slowest family (paper Fig. 14)
        assert tp["histapprox"] > min(tp["imm"], tp["tim+"])

"""Tests for RR-set machinery (repro.rrset.rr)."""
import numpy as np
import pandas as pd
import pytest

from repro.ic.probabilities import ic_probabilities_pandas
from repro.rrset.rr import ICGraph, max_cover, sample_rr_sets, spark_sample_rr_sets


def ic_frame(edges: list[tuple[int, int, float]]) -> pd.DataFrame:
    return pd.DataFrame(edges, columns=["u", "v", "p"])


class TestICGraph:
    def test_nodes_universe(self):
        g = ICGraph(ic_frame([(1, 2, 0.5), (3, 2, 0.5)]))
        assert g.nodes == [1, 2, 3] and g.n == 3

    def test_rr_set_contains_root(self):
        g = ICGraph(ic_frame([(1, 2, 0.5)]))
        rng = np.random.default_rng(0)
        assert 2 in g.rr_set(2, rng)

    def test_deterministic_edges_always_traversed(self):
        g = ICGraph(ic_frame([(1, 2, 1.0), (0, 1, 1.0)]))
        rng = np.random.default_rng(0)
        assert g.rr_set(2, rng) == {0, 1, 2}

    def test_zero_prob_edges_never_traversed(self):
        g = ICGraph(ic_frame([(1, 2, 0.0)]))
        for s in range(20):
            assert g.rr_set(2, np.random.default_rng(s)) == {2}

    def test_empirical_membership_probability(self):
        """For a single edge u->v with prob p, u lands in v's RR set with
        frequency ~p."""
        p = 0.3
        g = ICGraph(ic_frame([(1, 2, p)]))
        rng = np.random.default_rng(1)
        hits = sum(1 in g.rr_set(2, rng) for _ in range(20_000))
        assert hits / 20_000 == pytest.approx(p, abs=0.02)


class TestSampling:
    def test_count_and_determinism(self):
        g = ICGraph(ic_frame([(1, 2, 0.5), (2, 3, 0.5), (4, 3, 0.9)]))
        a = sample_rr_sets(g, 50, seed=3)
        b = sample_rr_sets(g, 50, seed=3)
        assert len(a) == 50 and a == b

    def test_seed_changes_sample(self):
        g = ICGraph(ic_frame([(1, 2, 0.5), (2, 3, 0.5), (4, 3, 0.9)]))
        assert sample_rr_sets(g, 50, seed=3) != sample_rr_sets(g, 50, seed=4)

    def test_empty_graph(self):
        assert sample_rr_sets(ICGraph(ic_frame([])), 10) == []

    def test_spark_sampler_identical_to_local(self, spark):
        rng = np.random.default_rng(0)
        raw = pd.DataFrame(
            {"u": rng.integers(0, 15, 120), "v": rng.integers(15, 30, 120)}
        )
        g = ICGraph(ic_probabilities_pandas(raw))
        local = sample_rr_sets(g, 40, seed=9)
        dist = spark_sample_rr_sets(spark, g, 40, seed=9)
        assert local == dist


class TestMaxCover:
    def test_simple_cover(self):
        rr = [frozenset({1, 2}), frozenset({2}), frozenset({3})]
        seeds, frac = max_cover(rr, 1)
        assert seeds == frozenset({2}) and frac == pytest.approx(2 / 3)

    def test_two_seeds_cover_all(self):
        rr = [frozenset({1}), frozenset({1, 2}), frozenset({3})]
        seeds, frac = max_cover(rr, 2)
        assert seeds == frozenset({1, 3}) and frac == 1.0

    def test_stops_when_everything_covered(self):
        rr = [frozenset({1})] * 5
        seeds, frac = max_cover(rr, 3)
        assert seeds == frozenset({1}) and frac == 1.0

    def test_empty(self):
        assert max_cover([], 3) == (frozenset(), 0.0)

    def test_k_zero(self):
        assert max_cover([frozenset({1})], 0)[0] == frozenset()

    @pytest.mark.parametrize("seed", range(5))
    def test_greedy_at_least_topk_singleton(self, seed):
        """Greedy coverage >= best single node's coverage for k>=1."""
        rng = np.random.default_rng(seed)
        rr = [frozenset(rng.integers(0, 12, rng.integers(1, 5)).tolist()) for _ in range(40)]
        _, frac1 = max_cover(rr, 1)
        _, frac3 = max_cover(rr, 3)
        assert frac3 >= frac1

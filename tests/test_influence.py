"""Unit tests for the counting influence oracle (repro.tdn.influence)."""
import numpy as np
import pytest

from repro.tdn.graph import DiGraph
from repro.tdn.influence import CallCounter, InfluenceOracle, brute_force_opt


def chain_graph(n: int) -> DiGraph:
    g = DiGraph()
    for i in range(n - 1):
        g.add_edge(i, i + 1)
    return g


class TestOracle:
    def test_spread_counts_reachable(self):
        o = InfluenceOracle(chain_graph(5))
        assert o.spread((0,)) == 5
        assert o.spread((4,)) == 1
        assert o.spread((2, 3)) == 3

    def test_spread_of_missing_node_is_one(self):
        o = InfluenceOracle(chain_graph(3))
        assert o.spread((99,)) == 1

    def test_every_evaluation_billed(self):
        o = InfluenceOracle(chain_graph(4))
        o.spread((0,))
        o.spread((0,))  # cached BFS, still billed
        o.marginal_gain(frozenset((0,)), 3)
        assert o.oracle_calls == 3

    def test_shared_counter(self):
        c = CallCounter()
        o1 = InfluenceOracle(chain_graph(3), c)
        o2 = InfluenceOracle(chain_graph(4), c)
        o1.spread((0,))
        o2.spread((0,))
        assert c.calls == 2

    def test_marginal_gain_definition(self):
        g = chain_graph(6)
        o = InfluenceOracle(g)
        for base in [frozenset(), frozenset((0,)), frozenset((4,))]:
            for v in range(6):
                expect = len(g.reachable(base | {v})) - len(g.reachable(base))
                assert o.marginal_gain(base, v) == expect

    def test_marginal_gain_zero_if_already_reached(self):
        o = InfluenceOracle(chain_graph(5))
        assert o.marginal_gain(frozenset((0,)), 3) == 0

    def test_cache_invalidated_on_mutation(self):
        g = chain_graph(3)
        o = InfluenceOracle(g)
        assert o.spread((0,)) == 3
        g.add_edge(2, 7)
        assert o.spread((0,)) == 4

    @pytest.mark.parametrize("seed", range(5))
    def test_submodularity_and_monotonicity(self, seed):
        rng = np.random.default_rng(seed)
        g = DiGraph()
        for _ in range(40):
            u, v = (int(x) for x in rng.integers(0, 15, 2))
            if u != v:
                g.add_edge(u, v)
        o = InfluenceOracle(g)
        nodes = sorted(g.nodes())
        s = frozenset(nodes[:2])
        t = s | frozenset(nodes[2:4])
        for v in nodes[4:8]:
            assert o.marginal_gain(s, v) >= o.marginal_gain(t, v)  # submodular
        assert o.spread(t) >= o.spread(s)  # monotone


class TestBruteForce:
    def test_chain_optimum(self):
        g = chain_graph(5)
        s, val = brute_force_opt(g, 1)
        assert s == frozenset((0,)) and val == 5

    def test_two_chains(self):
        g = DiGraph()
        for i in range(3):
            g.add_edge(i, i + 1)
        for i in range(10, 13):
            g.add_edge(i, i + 1)
        s, val = brute_force_opt(g, 2)
        assert s == frozenset((0, 10)) and val == 8

    def test_k_larger_than_nodes(self):
        g = chain_graph(3)
        _, val = brute_force_opt(g, 10)
        assert val == 3

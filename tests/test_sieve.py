"""Unit tests for the threshold sieve (repro.core.sieve)."""
import math

import numpy as np
import pytest

from repro.core.sieve import ThresholdSieve
from repro.tdn.graph import DiGraph
from repro.tdn.influence import CallCounter, InfluenceOracle, brute_force_opt


def random_graph(seed: int, n_nodes: int = 18, n_edges: int = 45) -> DiGraph:
    rng = np.random.default_rng(seed)
    g = DiGraph()
    made = 0
    while made < n_edges:
        u, v = (int(x) for x in rng.integers(0, n_nodes, 2))
        if u != v:
            g.add_edge(u, v)
            made += 1
    return g


def run_sieve(g: DiGraph, k: int, eps: float) -> tuple[ThresholdSieve, InfluenceOracle]:
    o = InfluenceOracle(g)
    sv = ThresholdSieve(k, eps, o)
    for v in sorted(g.nodes()):
        sv.process_node(v)
    return sv, o


class TestThresholdMaintenance:
    def test_starts_empty(self):
        sv = ThresholdSieve(3, 0.1, InfluenceOracle(DiGraph()))
        assert sv.sets == {} and sv.best() == (frozenset(), 0.0)

    def test_threshold_grid_covers_delta_to_2k_delta(self):
        g = random_graph(0)
        sv, _ = run_sieve(g, 3, 0.1)
        lo, hi = min(sv.sets), max(sv.sets)
        assert (1.1**lo) >= sv.delta * (1 - 1e-6) / 1.1
        assert (1.1**hi) <= 2 * 3 * sv.delta * (1 + 1e-6) * 1.1
        # grid is contiguous in exponent space
        assert sorted(sv.sets) == list(range(lo, hi + 1))

    def test_delta_is_max_singleton(self):
        g = DiGraph()
        for i in range(4):
            g.add_edge(0, i + 1)  # node 0 reaches 5 nodes
        sv, _ = run_sieve(g, 2, 0.2)
        assert sv.delta == 5.0

    def test_delta_never_decreases(self):
        o = InfluenceOracle(DiGraph())
        o.graph.add_edge(0, 1)
        o.graph.add_edge(0, 2)
        sv = ThresholdSieve(2, 0.1, o)
        sv.process_node(0)
        d0 = sv.delta
        sv.process_node(1)  # singleton value 1 < d0
        assert sv.delta == d0

    def test_sets_capped_at_k(self):
        g = random_graph(1, n_nodes=25, n_edges=80)
        sv, _ = run_sieve(g, 2, 0.1)
        assert all(len(s) <= 2 for s, _ in sv.sets.values())

    def test_invalid_params(self):
        o = InfluenceOracle(DiGraph())
        with pytest.raises(ValueError):
            ThresholdSieve(0, 0.1, o)
        with pytest.raises(ValueError):
            ThresholdSieve(3, 0.0, o)
        with pytest.raises(ValueError):
            ThresholdSieve(3, 1.0, o)


class TestAcceptance:
    def test_accepted_gain_meets_threshold(self):
        """Replay: every member node must have cleared its set's threshold
        at insert time; tracked value equals the sum of accepted gains."""
        g = random_graph(2)
        o = InfluenceOracle(g)
        sv = ThresholdSieve(3, 0.15, o)
        shadow: dict[int, list[float]] = {}
        for v in sorted(g.nodes()):
            before = {i: s for i, (s, _) in sv.sets.items()}
            sv.process_node(v)
            for i, (s, _) in sv.sets.items():
                prev = before.get(i, frozenset())
                if v in s and v not in prev:
                    gain = len(g.reachable(prev | {v})) - len(g.reachable(prev))
                    assert gain >= sv.theta(i) - 1e-9
                    shadow.setdefault(i, []).append(gain)
        for i, (s, val) in sv.sets.items():
            assert val == pytest.approx(sum(shadow.get(i, [])))

    def test_duplicate_node_noop_when_static(self):
        g = random_graph(3)
        sv, _ = run_sieve(g, 3, 0.1)
        snapshot = dict(sv.sets)
        for v in sorted(g.nodes()):
            sv.process_node(v)  # same graph, nodes already considered
        for i, (s, _) in snapshot.items():
            # Sets can only stay equal or grow; members never vanish.
            assert s <= sv.sets[i][0]

    def test_best_refresh_bills_and_updates(self):
        g = random_graph(4)
        o = InfluenceOracle(g)
        sv = ThresholdSieve(3, 0.1, o)
        for v in sorted(g.nodes()):
            sv.process_node(v)
        calls = o.oracle_calls
        s, val = sv.best(refresh=True)
        assert o.oracle_calls > calls
        assert val == len(g.reachable(s))

    def test_copy_shares_nothing_mutable(self):
        g = random_graph(5)
        o = InfluenceOracle(g)
        sv = ThresholdSieve(3, 0.1, o)
        for v in sorted(g.nodes()):
            sv.process_node(v)
        g2 = g.copy()
        c = sv.copy(InfluenceOracle(g2))
        c.process_node(sorted(g.nodes())[0])
        assert sv.delta == c.delta
        # mutating the copy's sets must not leak into the original
        c.sets[min(c.sets)] = (frozenset((999,)), 1.0)
        assert sv.sets[min(sv.sets)][0] != frozenset((999,))


class TestApproximation:
    @pytest.mark.parametrize("seed", range(12))
    @pytest.mark.parametrize("k,eps", [(1, 0.1), (2, 0.1), (3, 0.2)])
    def test_half_minus_eps_guarantee(self, seed, k, eps):
        """SieveStreaming's (1/2-eps) bound on static random graphs."""
        g = random_graph(seed, n_nodes=14, n_edges=30)
        sv, _ = run_sieve(g, k, eps)
        s, _ = sv.best(refresh=True)
        _, opt = brute_force_opt(g, k)
        val = len(g.reachable(s)) if s else 0
        assert val >= (0.5 - eps) * opt - 1e-9

    def test_oracle_call_budget(self):
        """Per node: 1 singleton + at most |Θ| marginals (+ shortcut skips)."""
        g = random_graph(6, n_nodes=20, n_edges=50)
        c = CallCounter()
        o = InfluenceOracle(g, c)
        sv = ThresholdSieve(4, 0.1, o)
        n_thresholds_max = math.ceil(math.log(2 * 4) / math.log(1.1)) + 2
        for v in sorted(g.nodes()):
            sv.process_node(v)
        assert c.calls <= len(g.nodes()) * (1 + n_thresholds_max)

"""Unit tests for BasicReduction (repro.core.basic_reduction)."""
import numpy as np
import pytest

from repro.core.basic_reduction import BasicReduction
from repro.tdn.graph import TDNGraph
from repro.tdn.influence import brute_force_opt


def random_stream(seed: int, T: int = 30, n_nodes: int = 14, L: int = 6):
    rng = np.random.default_rng(seed)
    out = []
    for t in range(1, T + 1):
        u, v = (int(x) for x in rng.integers(0, n_nodes, 2))
        if u == v:
            v = (v + 1) % n_nodes
        out.append((t, u, v, int(rng.integers(1, L + 1))))
    return out


class TestMechanics:
    def test_instance_count_constant(self):
        br = BasicReduction(2, 0.1, L=5)
        assert br.n_instances == 5
        br.step([(1, 2, 3)])
        assert br.n_instances == 5

    def test_head_processed_exactly_alive_edges(self):
        """The paper's invariant: A_1^(t) has processed exactly E_t."""
        L = 6
        br = BasicReduction(2, 0.1, L=L)
        ref = TDNGraph()
        for t, u, v, l in random_stream(0, T=25, L=L):
            ref.advance_to(t)
            ref.add_edges([(u, v, l)], t)
            br.step([(u, v, l)])
            # after step+shift, the new head must hold exactly the edges
            # that are still alive at time t+1
            ref_next = [(uu, vv) for uu, vv, rl in ref.edges_with_lifetime() if rl > 1]
            assert br.head_edge_count() == len(ref_next)

    def test_lifetime_clipped_to_L(self):
        br = BasicReduction(1, 0.1, L=3)
        br.step([(1, 2, 999)])
        assert br.head_edge_count() == 1  # survived the shift => l>=2 after clip

    def test_invalid_L(self):
        with pytest.raises(ValueError):
            BasicReduction(2, 0.1, L=0)

    def test_solution_after_expiry_is_empty(self):
        br = BasicReduction(2, 0.1, L=3)
        br.step([(1, 2, 1)])
        s, val = br.step([])  # edge expired with the shift
        assert s == frozenset() and val == 0.0


class TestApproximation:
    @pytest.mark.parametrize("seed", range(8))
    @pytest.mark.parametrize("k", [1, 2])
    def test_guarantee_on_tdn(self, seed, k):
        """(1/2-eps)-approx vs brute force on the alive graph (Theorem 4)."""
        eps, L = 0.1, 6
        br = BasicReduction(k, eps, L)
        ref = TDNGraph()
        for t, u, v, l in random_stream(seed, L=L):
            ref.advance_to(t)
            ref.add_edges([(u, v, l)], t)
            s, _ = br.step([(u, v, l)])
            _, opt = brute_force_opt(ref.g, k)
            val = len(ref.g.reachable(s)) if s else 0
            assert val >= (0.5 - eps) * opt - 1e-9, (t, val, opt)

    def test_matches_sieve_adn_when_all_lifetimes_maximal(self):
        """With every lifetime = L the TDN is a sliding window of width L;
        within the first L steps it behaves addition-only and the head
        instance sees everything."""
        from repro.core.sieve_adn import SieveADN

        L = 10
        br = BasicReduction(2, 0.1, L=L)
        adn = SieveADN(2, 0.1)
        stream = random_stream(3, T=L - 1, L=1)  # lifetimes overridden below
        for t, u, v, _ in stream:
            s_br, _ = br.step([(u, v, L)])
            adn.process_batch([(u, v)])
        s_adn, _ = adn.solution()
        assert br.head_edge_count() == adn.graph.n_edges

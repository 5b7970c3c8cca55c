"""Unit tests for SieveADN over addition-only streams (repro.core.sieve_adn)."""
import numpy as np
import pytest

from repro.core.sieve_adn import SieveADN
from repro.tdn.graph import DiGraph
from repro.tdn.influence import CallCounter, brute_force_opt


def random_batches(seed: int, n_batches: int = 12, n_nodes: int = 16):
    rng = np.random.default_rng(seed)
    out = []
    for _ in range(n_batches):
        size = int(rng.integers(1, 4))
        batch = []
        while len(batch) < size:
            u, v = (int(x) for x in rng.integers(0, n_nodes, 2))
            if u != v:
                batch.append((u, v))
        out.append(batch)
    return out


class TestMechanics:
    def test_graph_accumulates(self):
        a = SieveADN(2, 0.1)
        a.process_batch([(1, 2)])
        a.process_batch([(2, 3)])
        assert a.graph.n_edges == 2

    def test_self_loops_filtered(self):
        a = SieveADN(2, 0.1)
        assert a.process_batch([(1, 1)]) == set()
        assert a.graph.n_edges == 0

    def test_empty_batch(self):
        a = SieveADN(2, 0.1)
        assert a.process_batch([]) == set()
        assert a.solution() == (frozenset(), 0.0)

    def test_affected_nodes_are_ancestors_plus_endpoints(self):
        a = SieveADN(2, 0.1)
        a.process_batch([(1, 2), (2, 3)])
        # new edge 3->4: ancestors of 3 are {1,2,3}, plus endpoint 4
        affected = a.process_batch([(3, 4)])
        assert affected == {1, 2, 3, 4}

    def test_shared_counter_across_instances(self):
        c = CallCounter()
        a1, a2 = SieveADN(2, 0.1, c), SieveADN(2, 0.1, c)
        a1.process_batch([(1, 2)])
        n1 = c.calls
        a2.process_batch([(1, 2)])
        assert c.calls > n1
        assert a1.oracle_calls == a2.oracle_calls == c.calls

    def test_copy_is_independent(self):
        a = SieveADN(2, 0.1)
        a.process_batch([(1, 2), (3, 4)])
        b = a.copy()
        b.process_batch([(4, 5)])
        assert a.graph.n_edges == 2 and b.graph.n_edges == 3
        assert a.solution()[1] <= b.solution()[1]

    def test_copy_shares_counter(self):
        a = SieveADN(2, 0.1)
        b = a.copy()
        b.process_batch([(1, 2)])
        assert a.oracle_calls == b.oracle_calls


class TestApproximation:
    @pytest.mark.parametrize("seed", range(10))
    @pytest.mark.parametrize("k", [1, 2, 3])
    def test_guarantee_holds_at_every_step(self, seed, k):
        """(1/2-eps)-approx vs brute force after every batch (Theorem 2)."""
        eps = 0.1
        a = SieveADN(k, eps)
        ref = DiGraph()
        for batch in random_batches(seed):
            a.process_batch(batch)
            for u, v in batch:
                ref.add_edge(u, v)
            s, _ = a.solution(refresh=True)
            _, opt = brute_force_opt(ref, k)
            val = len(ref.reachable(s)) if s else 0
            assert val >= (0.5 - eps) * opt - 1e-9

    def test_duplicate_nodes_in_stream_ok(self):
        """Same node arriving many times (the ADN/SSO difference) is fine."""
        a = SieveADN(1, 0.1)
        for i in range(1, 8):
            a.process_batch([(0, i)])  # node 0 re-affected every batch
        s, _ = a.solution(refresh=True)
        assert s == frozenset((0,))
        assert len(a.graph.reachable(s)) == 8

"""Unit tests for HistApprox (repro.core.histapprox)."""
import numpy as np
import pytest

from repro.core.basic_reduction import BasicReduction
from repro.core.histapprox import HistApprox
from repro.tdn.graph import TDNGraph
from repro.tdn.influence import brute_force_opt


def random_stream(seed: int, T: int = 30, n_nodes: int = 14, L: int = 8):
    rng = np.random.default_rng(seed)
    out = []
    for t in range(1, T + 1):
        u, v = (int(x) for x in rng.integers(0, n_nodes, 2))
        if u == v:
            v = (v + 1) % n_nodes
        out.append((t, u, v, int(rng.integers(1, L + 1))))
    return out


class TestMechanics:
    def test_indices_sorted_and_within_L(self):
        ha = HistApprox(2, 0.1, L=8)
        for t, u, v, l in random_stream(0):
            ha.step([(u, v, l)])
            assert ha.indices == sorted(set(ha.indices))
            assert all(1 <= x <= 8 for x in ha.indices)
            assert set(ha.indices) == set(ha.instances)

    def test_fewer_instances_than_L(self):
        L = 12
        ha = HistApprox(2, 0.2, L=L)
        counts = []
        for t, u, v, l in random_stream(1, T=60, L=L):
            ha.step([(u, v, l)])
            counts.append(ha.n_instances)
        assert max(counts) < L  # histogram keeps a strict subset

    def test_empty_step_ok(self):
        ha = HistApprox(2, 0.1, L=5)
        s, val = ha.step([])
        assert s == frozenset() and val == 0.0

    def test_master_graph_tracks_alive_edges(self):
        L = 6
        ha = HistApprox(2, 0.1, L=L)
        ref = TDNGraph()
        for t, u, v, l in random_stream(2, L=L):
            ref.advance_to(t)
            ref.add_edges([(u, v, min(l, L))], t)
            ha.step([(u, v, l)])
            assert ha.master.n_edges == ref.n_edges

    def test_self_loops_filtered(self):
        ha = HistApprox(2, 0.1, L=5)
        ha.step([(3, 3, 2)])
        assert ha.master.n_edges == 0 and ha.n_instances == 0

    def test_lifetime_clipped(self):
        ha = HistApprox(2, 0.1, L=4)
        ha.step([(1, 2, 100)])
        assert ha.indices == [3]  # created at 4, shifted to 3

    def test_shift_terminates_index_one(self):
        ha = HistApprox(2, 0.1, L=3)
        ha.step([(1, 2, 1)])  # creates index 1, terminated at shift
        assert ha.indices == []


class TestRedundancy:
    def test_close_outputs_pruned(self):
        """Identical parallel edge batches at many lifetimes produce
        equal-valued instances; the histogram must collapse them."""
        ha = HistApprox(1, 0.1, L=10)
        batch = [(1, 2, l) for l in range(1, 11)]
        ha.step(batch)
        # outputs of all instances equal -> only endpoints survive
        assert ha.n_instances <= 2

    def test_reduce_redundancy_idempotent(self):
        """A second ReduceRedundancy pass right after a step must remove
        nothing — the histogram is already fully pruned w.r.t. the current
        outputs."""
        eps = 0.15
        ha = HistApprox(2, eps, L=10)
        for t, u, v, l in random_stream(4, T=50, L=10):
            ha.step([(u, v, l)])
            before = list(ha.indices)
            ha._reduce_redundancy()
            assert ha.indices == before


class TestApproximation:
    @pytest.mark.parametrize("seed", range(8))
    @pytest.mark.parametrize("k", [1, 2])
    def test_guarantee_on_tdn(self, seed, k):
        """(1/3-eps)-approx vs brute force at every step (Theorem 7)."""
        eps, L = 0.1, 8
        ha = HistApprox(k, eps, L)
        ref = TDNGraph()
        for t, u, v, l in random_stream(seed, L=L):
            ref.advance_to(t)
            ref.add_edges([(u, v, l)], t)
            s, _ = ha.step([(u, v, l)])
            _, opt = brute_force_opt(ref.g, k)
            val = len(ref.g.reachable(s)) if s else 0
            assert val >= (1.0 / 3.0 - eps) * opt - 1e-9, (t, val, opt)

    @pytest.mark.parametrize("seed", range(4))
    def test_close_to_basic_reduction(self, seed):
        """Fig. 7's headline: value within a few % of BasicReduction using
        far fewer oracle calls."""
        k, eps, L, T = 2, 0.1, 10, 60
        ha, br = HistApprox(k, eps, L), BasicReduction(k, eps, L)
        ref = TDNGraph()
        ha_vals, br_vals = [], []
        for t, u, v, l in random_stream(seed, T=T, L=L):
            ref.advance_to(t)
            ref.add_edges([(u, v, min(l, L))], t)
            s_ha, _ = ha.step([(u, v, l)])
            s_br, _ = br.step([(u, v, l)])
            ha_vals.append(len(ref.g.reachable(s_ha)) if s_ha else 0)
            br_vals.append(len(ref.g.reachable(s_br)) if s_br else 0)
        assert sum(ha_vals) >= 0.9 * sum(br_vals)
        assert ha.oracle_calls < br.oracle_calls

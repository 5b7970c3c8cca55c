"""SieveStreaming threshold sieve (Badanidiyuru et al., KDD'14) as used by
SieveADN (paper §III-A, Alg. 1 lines 4-11).

Lazily maintains thresholds ``Θ = {(1+ε)^i / (2k) : (1+ε)^i ∈ [Δ, 2kΔ]}``
where ``Δ`` is the largest singleton value seen so far. Each threshold
``θ`` owns a candidate set ``S_θ`` (≤ k nodes); an arriving node joins
every ``S_θ`` whose marginal gain clears ``θ``.

Value bookkeeping: the sieve tracks ``f(S_θ)`` incrementally — when ``v``
is accepted with gain ``δ`` the tracked value grows by ``δ``. On an ADN
the true ``f_t(S_θ)`` only grows afterwards, so tracked values are exact
at accept time and a lower bound later; :meth:`best` uses them without
extra oracle calls (HistApprox consults instance outputs every step, and
billing a full re-evaluation per consultation would charge the sieve for
work no implementation does).

A submodularity shortcut skips (without billing) thresholds that the
node's singleton value already fails: ``δ_S(v) ≤ f({v}) < θ`` implies
rejection, so no evaluation is needed. This changes no outcome.
"""
from __future__ import annotations

import math

from repro.tdn.influence import InfluenceOracle


class ThresholdSieve:
    """One SieveStreaming state machine over a fixed oracle."""

    def __init__(self, k: int, eps: float, oracle: InfluenceOracle) -> None:
        if k < 1:
            raise ValueError(f"k must be >= 1, got {k}")
        if not 0 < eps < 1:
            raise ValueError(f"eps must be in (0,1), got {eps}")
        self.k = k
        self.eps = eps
        self.oracle = oracle
        self.delta = 0.0  # max singleton value seen so far
        self._log1e = math.log1p(eps)
        # exponent i -> (S_i, tracked value of S_i)
        self.sets: dict[int, tuple[frozenset[int], float]] = {}

    def theta(self, i: int) -> float:
        """Threshold associated with exponent ``i``."""
        return (1.0 + self.eps) ** i / (2.0 * self.k)

    def _exponent_range(self) -> range:
        """Exponents i with ``(1+ε)^i ∈ [Δ, 2kΔ]`` (paper's lazy Θ).

        A small relative tolerance keeps float log rounding from dropping
        the boundary exponents.
        """
        if self.delta <= 0:
            return range(0)
        lo = math.ceil(math.log(self.delta) / self._log1e - 1e-9)
        hi = math.floor(math.log(2 * self.k * self.delta) / self._log1e + 1e-9)
        return range(lo, hi + 1)

    def _update_thresholds(self, singleton: float) -> None:
        if singleton <= self.delta:
            return
        self.delta = singleton
        valid = self._exponent_range()
        self.sets = {i: sv for i, sv in self.sets.items() if i in valid}
        for i in valid:
            if i not in self.sets:
                self.sets[i] = (frozenset(), 0.0)

    def process_node(self, v: int) -> None:
        """Feed one (possibly repeated) node through every sieve."""
        f_v = self.oracle.spread((v,))  # 1 oracle call
        self._update_thresholds(f_v)
        for i, (s, val) in self.sets.items():
            if len(s) >= self.k or v in s:
                continue
            th = self.theta(i)
            if f_v < th:
                continue  # submodularity shortcut, no oracle call
            gain = self.oracle.marginal_gain(s, v)  # 1 oracle call
            if gain >= th:
                self.sets[i] = (s | {v}, val + gain)

    def best(self, refresh: bool = False) -> tuple[frozenset[int], float]:
        """Highest-value candidate set (``S_{θ*}``, Alg. 1 line 12).

        With ``refresh=True`` every non-empty candidate set is re-evaluated
        against the *current* graph (billed — this is exactly the
        ``argmax_θ f_t(S_θ)`` the paper's query performs; tracked values
        are updated in place). With ``refresh=False`` the tracked values
        are used unbilled — HistApprox's ReduceRedundancy consults outputs
        after every group and no implementation re-evaluates there.
        """
        if not self.sets:
            return frozenset(), 0.0
        if refresh:
            # Neighbouring thresholds often hold the *same* set; evaluate
            # each distinct set once (one oracle call per distinct set).
            vals: dict[frozenset[int], float] = {}
            for i, (s, _) in list(self.sets.items()):
                if not s:
                    continue
                if s not in vals:
                    vals[s] = float(self.oracle.spread(s))
                self.sets[i] = (s, vals[s])
        s, val = max(self.sets.values(), key=lambda sv: sv[1])
        return s, val

    def copy(self, oracle: InfluenceOracle) -> "ThresholdSieve":
        """Clone the sieve state onto a new oracle (HistApprox Alg.3 l.14)."""
        c = ThresholdSieve(self.k, self.eps, oracle)
        c.delta = self.delta
        c.sets = dict(self.sets)  # values are immutable (frozenset, float)
        return c

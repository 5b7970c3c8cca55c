"""Independent-cascade substrate for the RR-set baselines (paper §V-C)."""

from repro.ic.probabilities import ic_probabilities, ic_probabilities_pandas

__all__ = ["ic_probabilities", "ic_probabilities_pandas"]

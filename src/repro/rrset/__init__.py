"""Reverse-reachable (RR) set machinery and the paper's IM baselines.

- :mod:`repro.rrset.rr` — RR-set sampling under the IC model (seeded NumPy
  reference + ``mapInPandas`` distributed sampler) and greedy max-cover.
- :mod:`repro.rrset.imm` — simplified IMM (Tang et al., SIGMOD'15).
- :mod:`repro.rrset.timplus` — simplified TIM+ (Tang et al., SIGMOD'14).
- :mod:`repro.rrset.dim` — simplified DIM (Ohsaka et al., VLDB'16):
  a dynamically maintained RR index.
"""

from repro.rrset.dim import DIMIndex
from repro.rrset.imm import imm_select
from repro.rrset.rr import ICGraph, max_cover, sample_rr_sets
from repro.rrset.timplus import tim_plus_select

__all__ = [
    "ICGraph",
    "sample_rr_sets",
    "max_cover",
    "imm_select",
    "tim_plus_select",
    "DIMIndex",
]

"""T2 — BasicReduction vs HistApprox (Fig. 7) — see DESIGN.md §5 and EXPERIMENTS.md."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.experiments.exp_basic_vs_hist import run


if __name__ == "__main__":
    get_spark("t2_basic_vs_hist")
    emit("T2 — BasicReduction vs HistApprox (Fig. 7)", run(n_steps=600, L=300))

"""T5 — HistApprox vs Greedy across k (Fig. 11) — see DESIGN.md §5 and EXPERIMENTS.md."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.experiments.exp_k_l import vary_k


if __name__ == "__main__":
    get_spark("t5_vary_k")
    emit("T5 — HistApprox vs Greedy across k (Fig. 11)", vary_k())

"""T6 — HistApprox vs Greedy across L (Fig. 12) — see DESIGN.md §5 and EXPERIMENTS.md."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.experiments.exp_k_l import vary_l


if __name__ == "__main__":
    get_spark("t6_vary_l")
    emit("T6 — HistApprox vs Greedy across L (Fig. 12)", vary_l())

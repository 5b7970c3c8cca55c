"""T3 — HistApprox vs Greedy/Random solution quality (Figs. 8-9)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.experiments.exp_quality import quality_table, sweep


if __name__ == "__main__":
    get_spark("t3_quality")
    s = sweep()
    emit("T3 — sweep detail", s)
    emit("T3 — value ratio vs Greedy (Fig. 9)", quality_table(s).reset_index())

"""T4 — HistApprox vs Greedy oracle-call efficiency (Fig. 10)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.experiments.exp_quality import efficiency_table, sweep


if __name__ == "__main__":
    get_spark("t4_efficiency")
    s = sweep()
    emit("T4 — oracle-call ratio vs Greedy (Fig. 10)", efficiency_table(s).reset_index())

"""T7 — baseline quality comparison (Fig. 13) — see DESIGN.md §5 and EXPERIMENTS.md."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.experiments.exp_baselines import quality_table


if __name__ == "__main__":
    get_spark("t7_baseline_quality")
    emit("T7 — baseline quality comparison (Fig. 13)", quality_table())

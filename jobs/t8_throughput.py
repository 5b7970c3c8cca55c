"""T8 — throughput comparison (Fig. 14) — see DESIGN.md §5 and EXPERIMENTS.md."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark

from repro.experiments.exp_baselines import throughput_table


if __name__ == "__main__":
    get_spark("t8_throughput")
    emit("T8 — throughput comparison (Fig. 14)", throughput_table())

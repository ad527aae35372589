"""T3 / Figure 12: all-to-all speedup vs imbalance level."""
from _common import run_job
from repro.experiments import tables

COLS = ["imbalance_level", "algorithm", "network_seconds", "n_phases", "speedup"]


def main():
    return run_job("t3_imbalance", lambda s: tables.t3_imbalance(s), columns=COLS)


if __name__ == "__main__":
    main()

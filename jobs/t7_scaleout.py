"""T7 / Figure 16: speedup when scaling out the number of fragments."""
from _common import run_job
from repro.experiments import tables

COLS = [
    "n_frags",
    "mode",
    "algorithm",
    "network_seconds",
    "planning_seconds",
    "schedule_seconds",
    "n_phases",
    "speedup",
]


def main():
    return run_job("t7_scaleout", lambda s: tables.t7_scaleout(s), columns=COLS)


if __name__ == "__main__":
    main()

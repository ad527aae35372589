"""T5 / Figure 14: robustness to bandwidth underestimation (MODIS-like)."""
from _common import run_job
from repro.experiments import tables

COLS = [
    "setting",
    "underestimation",
    "network_seconds",
    "n_phases",
    "pct_change_vs_topology",
]


def main():
    return run_job(
        "t5_estimation_robustness",
        lambda s: tables.t5_estimation_robustness(s),
        columns=COLS,
    )


if __name__ == "__main__":
    main()

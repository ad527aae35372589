"""T8 / Figure 17 + Table 2: TPC-H and real-data stand-ins; dest_tuples
is Table 2's 'tuples received by the final destination fragment'."""
from _common import run_job
from repro.experiments import tables

COLS = [
    "workload",
    "algorithm",
    "network_seconds",
    "dest_tuples",
    "n_phases",
    "loom_fanin",
    "speedup",
]


def main():
    return run_job(
        "t8_real_datasets", lambda s: tables.t8_real_datasets(s), columns=COLS
    )


if __name__ == "__main__":
    main()

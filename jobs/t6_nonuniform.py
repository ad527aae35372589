"""T6 / Figure 15: nonuniform bandwidth, all-to-one and all-to-all."""
from _common import run_job
from repro.experiments import tables

COLS = ["mode", "algorithm", "network_seconds", "dest_tuples", "n_phases", "speedup"]


def main():
    return run_job("t6_nonuniform", lambda s: tables.t6_nonuniform(s), columns=COLS)


if __name__ == "__main__":
    main()

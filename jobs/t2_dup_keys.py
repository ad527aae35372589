"""T2 / Figure 11: speedup vs tuples per GROUP BY key."""
from _common import run_job
from repro.experiments import tables

COLS = ["dups", "algorithm", "network_seconds", "dest_tuples", "n_phases", "speedup"]


def main():
    return run_job("t2_dup_keys", lambda s: tables.t2_dup_keys(s), columns=COLS)


if __name__ == "__main__":
    main()

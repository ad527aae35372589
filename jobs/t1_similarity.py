"""T1 / Figure 10: speedup vs cross-fragment Jaccard similarity."""
from _common import run_job
from repro.experiments import tables

COLS = ["jaccard", "algorithm", "network_seconds", "dest_tuples", "n_phases", "speedup"]


def main():
    return run_job(
        "t1_similarity", lambda s: tables.t1_similarity(s), columns=COLS
    )


if __name__ == "__main__":
    main()

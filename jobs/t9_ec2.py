"""T9 / Figure 20: EC2 10 Gbps compute-bound setting."""
from _common import run_job
from repro.experiments import tables

COLS = ["algorithm", "network_seconds", "dest_tuples", "n_phases", "speedup"]


def main():
    return run_job("t9_ec2", lambda s: tables.t9_ec2(s), columns=COLS)


if __name__ == "__main__":
    main()

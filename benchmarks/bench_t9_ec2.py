"""T9 / Figure 20 benchmark: EC2 10 Gbps compute-bound setting."""
from benchmarks._shapes import pick, run_once, show
from repro.experiments import tables

COLS = ["algorithm", "network_seconds", "dest_tuples", "n_phases", "speedup"]


def test_bench_t9_ec2(benchmark, spark):
    rows = run_once(benchmark, lambda: tables.t9_ec2(spark))
    show("T9 (Fig. 20) EC2 10 Gbps, compute-bound", rows, COLS)
    rep = pick(rows, algorithm="repart")[0]["speedup"]
    pre = pick(rows, algorithm="preagg_repart")[0]["speedup"]
    g = pick(rows, algorithm="grasp")[0]["speedup"]
    assert pre > rep  # compute-bound: pre-aggregation finally pays off
    assert g > pre  # paper: GRASP 2.2x over Preagg+Repart

"""T6 / Figure 15 benchmark: nonuniform bandwidth."""
from benchmarks._shapes import pick, run_once, show
from repro.experiments import tables

COLS = ["mode", "algorithm", "network_seconds", "dest_tuples", "n_phases", "speedup"]


def test_bench_t6_nonuniform(benchmark, spark):
    rows = run_once(benchmark, lambda: tables.t6_nonuniform(spark))
    show("T6 (Fig. 15) nonuniform bandwidth, 4 machines x 4 fragments", rows, COLS)
    g1 = pick(rows, algorithm="grasp", mode="all_to_one")[0]["speedup"]
    l1 = pick(rows, algorithm="loom", mode="all_to_one")[0]["speedup"]
    assert g1 > 2.0 and g1 > l1  # paper: 16x over Preagg+Repart, 5.6x over LOOM
    ga = pick(rows, algorithm="grasp", mode="all_to_all")[0]["speedup"]
    assert ga > 1.0  # paper: 4.6x all-to-all

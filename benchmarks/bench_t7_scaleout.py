"""T7 / Figure 16 benchmark: scaling out the number of fragments."""
from benchmarks._shapes import pick, run_once, show
from repro.experiments import tables

COLS = ["n_frags", "mode", "algorithm", "network_seconds", "planning_seconds",
        "schedule_seconds", "n_phases", "speedup"]


def test_bench_t7_scaleout(benchmark, spark):
    rows = run_once(benchmark, lambda: tables.t7_scaleout(spark))
    show("T7 (Fig. 16) scale-out, 4 fragments/machine", rows, COLS)
    one = [r for r in rows if r["mode"] == "all_to_one" and r["algorithm"] == "grasp"]
    sp = [r["speedup"] for r in one]
    assert sp[-1] > sp[0]  # all-to-one speedup grows with fragment count
    # Paper 5.3.3: coordinator scheduling cost grows with N (compare the
    # driver-side scheduling wall, free of Spark warm-up noise, on the
    # all-to-all sweep where the effect is strongest).
    sched = [
        r["schedule_seconds"]
        for r in rows
        if r["mode"] == "all_to_all" and r["algorithm"] == "grasp"
    ]
    assert sched[-1] > sched[0]
    g = pick(rows, algorithm="grasp", mode="all_to_one")[-1]["speedup"]
    l = pick(rows, algorithm="loom", mode="all_to_one")[-1]["speedup"]
    assert g > l  # paper: 41x vs 7.5x at the largest size

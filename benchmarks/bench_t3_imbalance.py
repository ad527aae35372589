"""T3 / Figure 12 benchmark: all-to-all speedup vs imbalance level."""
from benchmarks._shapes import pick, run_once, show
from repro.experiments import tables

COLS = ["imbalance_level", "algorithm", "network_seconds", "n_phases", "speedup"]


def test_bench_t3_imbalance(benchmark, spark):
    rows = run_once(benchmark, lambda: tables.t3_imbalance(spark))
    show("T3 (Fig. 12) imbalance sweep, all-to-all", rows, COLS)
    assert "loom" not in {r["algorithm"] for r in rows}
    for algo in ("preagg_repart", "grasp"):
        sp = [r["speedup"] for r in rows if r["algorithm"] == algo]
        assert sp[-1] < sp[0]  # both degrade with imbalance
    g = pick(rows, algorithm="grasp")[-1]["speedup"]
    p = pick(rows, algorithm="preagg_repart")[-1]["speedup"]
    assert g > 0.75 * p  # fluid-model bound: see EXPERIMENTS.md T3 notes

"""T5 / Figure 14 benchmark: robustness to bandwidth underestimation."""
from benchmarks._shapes import run_once, show
from repro.experiments import tables

COLS = ["setting", "underestimation", "network_seconds", "n_phases",
        "pct_change_vs_topology"]


def test_bench_t5_estimation_robustness(benchmark, spark):
    rows = run_once(benchmark, lambda: tables.t5_estimation_robustness(spark))
    show("T5 (Fig. 14) estimation robustness, MODIS-like", rows, COLS)
    for r in rows:
        # Paper: <= 20% response-time change even at 50% underestimation.
        assert abs(r["pct_change_vs_topology"]) <= 25.0

"""T4 / Figure 13 benchmark: bandwidth estimation accuracy (driver-side)."""
from benchmarks._shapes import run_once, show
from repro.experiments import tables

COLS = ["link_type", "theoretical_mbps", "estimated_mbps", "error_pct"]


def test_bench_t4_bandwidth_estimation(benchmark):
    rows = run_once(benchmark, tables.t4_bandwidth_estimation)
    show("T4 (Fig. 13) bandwidth estimation, 8x14 fragments", rows, COLS)
    for r in rows:
        assert r["error_pct"] <= 20.0  # paper: within 20% of theoretical

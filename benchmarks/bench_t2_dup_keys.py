"""T2 / Figure 11 benchmark: speedup vs tuples per GROUP BY key."""
from benchmarks._shapes import pick, run_once, show
from repro.experiments import tables

COLS = ["dups", "algorithm", "network_seconds", "dest_tuples", "n_phases", "speedup"]


def test_bench_t2_dup_keys(benchmark, spark):
    rows = run_once(benchmark, lambda: tables.t2_dup_keys(spark))
    show("T2 (Fig. 11) tuples-per-key sweep, all-to-one", rows, COLS)
    for d in (1, 2, 4, 8):
        g = pick(rows, algorithm="grasp", dups=d)[0]["speedup"]
        assert g >= 1.0  # GRASP never loses to Preagg+Repart
    r8 = pick(rows, algorithm="repart", dups=8)[0]["speedup"]
    assert r8 < 1.0  # preagg pays off once keys repeat locally

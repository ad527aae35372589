"""T1 / Figure 10 benchmark: speedup vs cross-fragment similarity."""
from benchmarks._shapes import pick, run_once, show
from repro.experiments import tables

COLS = ["jaccard", "algorithm", "network_seconds", "dest_tuples", "n_phases", "speedup"]


def test_bench_t1_similarity(benchmark, spark):
    rows = run_once(benchmark, lambda: tables.t1_similarity(spark))
    show("T1 (Fig. 10) similarity sweep, all-to-one", rows, COLS)
    g1 = pick(rows, algorithm="grasp", jaccard=1.0)[0]["speedup"]
    p1 = pick(rows, algorithm="preagg_repart", jaccard=1.0)[0]["speedup"]
    l1 = pick(rows, algorithm="loom", jaccard=1.0)[0]["speedup"]
    assert g1 > p1 and g1 > l1  # paper: 4.1x / 2.2x at J=1

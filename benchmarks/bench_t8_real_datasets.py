"""T8 / Figure 17 + Table 2 benchmark: TPC-H and real-data stand-ins."""
from benchmarks._shapes import pick, run_once, show
from repro.experiments import tables

COLS = ["workload", "algorithm", "network_seconds", "dest_tuples", "n_phases",
        "loom_fanin", "speedup"]


def test_bench_t8_real_datasets(benchmark, spark):
    rows = run_once(benchmark, lambda: tables.t8_real_datasets(spark))
    show("T8 (Fig. 17 + Table 2) real datasets, all-to-one", rows, COLS)
    for wl in {r["workload"] for r in rows}:
        g = pick(rows, workload=wl, algorithm="grasp")[0]
        p = pick(rows, workload=wl, algorithm="preagg_repart")[0]
        assert g["speedup"] > p["speedup"]  # GRASP best on every dataset
    # Table 2 ordering on the MODIS-like dataset: Repart >= Preagg+Repart
    # > LOOM > GRASP in tuples received by the destination.
    modis = [r for r in rows if r["workload"] == "modis"]
    d = {r["algorithm"]: r["dest_tuples"] for r in modis}
    assert d["repart"] >= d["preagg_repart"] > d["loom"] > d["grasp"]

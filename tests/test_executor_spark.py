"""Integration tests: every algorithm executes in Spark and produces the
exact DuckDB answer; costs cross-validate against the exact simulator."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.baselines.repartition import repartition_plan
from repro.core.grasp import plan_aggregation
from repro.core.simulate import simulate_plan
from repro.engine.executor import execute_plan
from repro.engine.state import make_state, preaggregate
from repro.minhash.hashing import HashFamily
from repro.minhash.signatures import compute_signatures
from repro.netsim.topology import Topology
from repro.oracle import assert_equivalent
from repro.experiments.harness import run_algorithm
from repro.workloads.synthetic import (
    dup_keys_workload,
    imbalance_workload,
    similarity_workload,
)

FAM = HashFamily(n=32, seed=7)
N = 4
TOPO = Topology(n_machines=N, frags_per_machine=1, nic_bw=118.0)
ALGOS = ("repart", "preagg_repart", "loom", "grasp")


@pytest.fixture(scope="module")
def sim_wl(spark):
    return similarity_workload(spark, n_frags=N, tuples_per_frag=500, overlap=0.5)


class TestAllToOneCorrectness:
    @pytest.mark.parametrize("algo", ALGOS)
    def test_oracle_similarity_workload(self, spark, sim_wl, algo):
        row, res = run_algorithm(
            sim_wl, algo, TOPO, mode="all_to_one", family=FAM, keep_result=True
        )
        assert_equivalent(res.final_df, sim_wl.sql, r=sim_wl.df)
        res.unpersist()

    @pytest.mark.parametrize("algo", ALGOS)
    def test_oracle_dup_keys_workload(self, spark, algo):
        wl = dup_keys_workload(spark, n_frags=N, tuples_per_frag=600, dups=4)
        row, res = run_algorithm(
            wl, algo, TOPO, mode="all_to_one", family=FAM, keep_result=True
        )
        assert_equivalent(res.final_df, wl.sql, r=wl.df)
        res.unpersist()

    @pytest.mark.parametrize("dest", [0, 2, 3])
    def test_nonzero_destination(self, spark, sim_wl, dest):
        row, res = run_algorithm(
            sim_wl,
            "grasp",
            TOPO,
            mode="all_to_one",
            dest_frag=dest,
            family=FAM,
            keep_result=True,
        )
        assert_equivalent(res.final_df, sim_wl.sql, r=sim_wl.df)
        res.unpersist()


class TestAllToAllCorrectness:
    @pytest.mark.parametrize("algo", ("repart", "preagg_repart", "grasp"))
    def test_oracle_balanced(self, spark, sim_wl, algo):
        row, res = run_algorithm(
            sim_wl, algo, TOPO, mode="all_to_all", family=FAM, keep_result=True
        )
        assert_equivalent(res.final_df, sim_wl.sql, r=sim_wl.df)
        res.unpersist()

    @pytest.mark.parametrize("algo", ("repart", "preagg_repart", "grasp"))
    def test_oracle_skewed_partitioner(self, spark, algo):
        wl = imbalance_workload(spark, n_frags=N, total_tuples=2000, frac0=0.5)
        row, res = run_algorithm(
            wl, algo, TOPO, mode="all_to_all", family=FAM, keep_result=True
        )
        assert_equivalent(res.final_df, wl.sql, r=wl.df)
        res.unpersist()

    def test_result_lands_on_mapped_fragments(self, spark, sim_wl):
        st = preaggregate(
            make_state(
                sim_wl.df, sim_wl.spec, n_frags=N, mode="all_to_all"
            )
        )
        plan = repartition_plan(N, st.dest)
        res = execute_plan(st, plan, TOPO)
        rows = res.cached_df.groupBy("frag", "part").count().collect()
        for r in rows:
            assert st.dest[r["part"]] == r["frag"]
        res.unpersist()


class TestCostAccounting:
    def _exact_sets(self, wl, n_parts=1):
        pdf = wl.df.toPandas()
        sets = [[set() for _ in range(n_parts)] for _ in range(N)]
        for frag, a in zip(pdf["frag"], pdf["a"]):
            part = 0 if n_parts == 1 else None
            sets[int(frag)][part].add(int(a))
        return sets

    def test_executor_matches_exact_simulator(self, spark, sim_wl):
        """Spark-measured transfer sizes == exact set semantics."""
        st = preaggregate(
            make_state(sim_wl.df, sim_wl.spec, n_frags=N, mode="all_to_one")
        )
        st.df.persist()
        coord = compute_signatures(st.df, FAM, n_frags=N, n_parts=1)
        plan = plan_aggregation(
            coord, np.full((N, N), 118.0), st.dest, w=st.tuple_bytes
        )
        res = execute_plan(st, plan, TOPO)
        sim = simulate_plan(
            self._exact_sets(sim_wl), plan, st.dest, TOPO, w=st.tuple_bytes
        )
        assert res.total_tuples_sent == sim.total_tuples_sent
        assert res.dest_tuples == sim.dest_tuples
        assert res.network_seconds == pytest.approx(sim.network_seconds)
        assert res.phase_seconds == pytest.approx(sim.phase_seconds)
        res.unpersist()
        st.df.unpersist()

    def test_repart_dest_tuples_equals_remote_rows(self, spark, sim_wl):
        st = preaggregate(
            make_state(sim_wl.df, sim_wl.spec, n_frags=N, mode="all_to_one")
        )
        remote = st.df.filter(F.col("frag") != 0).count()
        plan = repartition_plan(N, st.dest)
        res = execute_plan(st, plan, TOPO)
        assert res.dest_tuples == remote
        assert res.total_tuples_sent == remote
        res.unpersist()

    def test_incomplete_plan_raises(self, spark, sim_wl):
        st = preaggregate(
            make_state(sim_wl.df, sim_wl.spec, n_frags=N, mode="all_to_one")
        )
        # Only fragment 1 ships its data: 2 and 3 never do.
        from repro.core.plan import Phase, Plan, Transfer

        bad = Plan(phases=[Phase([Transfer(1, 0, 0)])])
        with pytest.raises(RuntimeError, match="incomplete"):
            execute_plan(st, bad, TOPO)

    def test_topology_mismatch_rejected(self, spark, sim_wl):
        st = make_state(sim_wl.df, sim_wl.spec, n_frags=N, mode="all_to_one")
        with pytest.raises(ValueError):
            execute_plan(st, repartition_plan(N, st.dest), Topology(n_machines=2))


class TestReductionBehaviour:
    def test_grasp_ships_fewer_tuples_to_dest_when_similar(self, spark):
        wl = similarity_workload(spark, n_frags=N, tuples_per_frag=800, overlap=1.0)
        r_rep, _ = run_algorithm(wl, "preagg_repart", TOPO, mode="all_to_one", family=FAM)
        r_grasp, _ = run_algorithm(wl, "grasp", TOPO, mode="all_to_one", family=FAM)
        # Identical fragments: repart ships 3x800; GRASP merges first and
        # ships far less into the destination link (Table 2 behaviour).
        assert r_grasp.dest_tuples < r_rep.dest_tuples
        assert r_grasp.network_seconds < r_rep.network_seconds

    def test_preagg_beats_repart_with_dups(self, spark):
        wl = dup_keys_workload(spark, n_frags=N, tuples_per_frag=1000, dups=8)
        r_raw, _ = run_algorithm(wl, "repart", TOPO, mode="all_to_one", family=FAM)
        r_pre, _ = run_algorithm(wl, "preagg_repart", TOPO, mode="all_to_one", family=FAM)
        assert r_pre.network_seconds < r_raw.network_seconds
        assert r_pre.dest_tuples < r_raw.dest_tuples

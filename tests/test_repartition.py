"""Tests for the repartition baseline plans."""
import numpy as np
import pytest

from repro.baselines.repartition import repartition_plan
from repro.core.simulate import simulate_plan
from repro.netsim.topology import Topology


class TestAllToOne:
    def test_single_phase_n_minus_1_transfers(self):
        plan = repartition_plan(8, np.array([0]))
        assert len(plan) == 1
        assert plan.n_transfers == 7
        assert plan.phases[0].shared_links

    def test_all_senders_target_destination(self):
        plan = repartition_plan(5, np.array([2]))
        assert {t.dst for p in plan for t in p} == {2}
        assert sorted(t.src for p in plan for t in p) == [0, 1, 3, 4]

    def test_figure2_cost(self):
        # The paper's Figure 2: 9 time units for 3 nodes x 3 tuples
        # through the shared destination downlink.
        topo = Topology(n_machines=4, nic_bw=1.0, intra_bw=1.0)
        sets = [[set()], [{1, 2, 3}], [{4, 5, 6}], [{7, 8, 9}]]
        plan = repartition_plan(4, np.array([0]))
        sim = simulate_plan(sets, plan, np.array([0]), topo, w=1e6)
        assert sim.network_seconds == pytest.approx(9.0)
        assert sim.completed(np.array([0]))


class TestAllToAll:
    def test_transfer_count(self):
        dest = np.arange(4)
        plan = repartition_plan(4, dest)
        assert plan.n_transfers == 4 * 3

    def test_no_self_destination_sends(self):
        dest = np.arange(4)
        plan = repartition_plan(4, dest)
        for p in plan:
            for t in p:
                assert t.src != dest[t.part]
                assert t.dst == dest[t.part]

    def test_completion(self):
        rng = np.random.default_rng(1)
        n = 4
        sets = [
            [set(map(int, rng.integers(0, 30, 8))) for _ in range(n)]
            for _ in range(n)
        ]
        dest = np.arange(n)
        topo = Topology(n_machines=n, nic_bw=1.0, intra_bw=1.0)
        plan = repartition_plan(n, dest)
        sim = simulate_plan(sets, plan, dest, topo, w=1e6)
        assert sim.completed(dest)

    def test_algorithm_label(self):
        plan = repartition_plan(3, np.array([0]), algorithm="preagg_repart")
        assert plan.algorithm == "preagg_repart"

    def test_multiple_partitions_per_destination(self):
        dest = np.array([0, 1, 0])  # partition 2 also lands on frag 0
        plan = repartition_plan(2, dest)
        parts_to_0 = {t.part for p in plan for t in p if t.dst == 0}
        assert parts_to_0 == {0, 2}

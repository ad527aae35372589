"""Unit tests for the star-topology cluster model."""
import pytest

from repro.netsim.topology import Topology


class TestConstruction:
    def test_defaults(self):
        t = Topology(n_machines=4)
        assert t.n_frags == 4
        assert t.is_uniform()

    @pytest.mark.parametrize("kw", [
        {"n_machines": 0},
        {"n_machines": 2, "frags_per_machine": 0},
        {"n_machines": 2, "nic_bw": 0},
        {"n_machines": 2, "intra_bw": -1},
    ])
    def test_invalid_rejected(self, kw):
        with pytest.raises(ValueError):
            Topology(**kw)

    def test_n_frags(self):
        assert Topology(n_machines=3, frags_per_machine=14).n_frags == 42


class TestMachineMapping:
    def test_machine_of(self):
        t = Topology(n_machines=2, frags_per_machine=3)
        assert [t.machine_of(f) for f in range(6)] == [0, 0, 0, 1, 1, 1]

    def test_machine_of_out_of_range(self):
        t = Topology(n_machines=2, frags_per_machine=3)
        with pytest.raises(ValueError):
            t.machine_of(6)
        with pytest.raises(ValueError):
            t.machine_of(-1)

    def test_same_machine(self):
        t = Topology(n_machines=2, frags_per_machine=2)
        assert t.same_machine(0, 1)
        assert not t.same_machine(1, 2)


class TestLinkBandwidth:
    def test_intra_vs_cross(self):
        t = Topology(n_machines=2, frags_per_machine=2, nic_bw=118, intra_bw=2000)
        assert t.link_bandwidth(0, 1) == 2000
        assert t.link_bandwidth(0, 2) == 118

    def test_self_link_rejected(self):
        t = Topology(n_machines=2)
        with pytest.raises(ValueError):
            t.link_bandwidth(1, 1)

    def test_uniform_when_single_frag_per_machine(self):
        t = Topology(n_machines=8, frags_per_machine=1, nic_bw=118, intra_bw=9999)
        assert t.is_uniform()

    def test_nonuniform(self):
        t = Topology(n_machines=2, frags_per_machine=2, nic_bw=118, intra_bw=2000)
        assert not t.is_uniform()

    def test_equal_bandwidths_uniform(self):
        t = Topology(n_machines=2, frags_per_machine=2, nic_bw=118, intra_bw=118)
        assert t.is_uniform()

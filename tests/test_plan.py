"""Unit tests for plan data structures and their invariants."""
import pytest

from repro.core.plan import Phase, Plan, Transfer


class TestTransfer:
    def test_basic_fields(self):
        t = Transfer(1, 2, 0)
        assert (t.src, t.dst, t.part) == (1, 2, 0)

    def test_self_transfer_rejected(self):
        with pytest.raises(ValueError, match="self-transfer"):
            Transfer(3, 3, 0)

    @pytest.mark.parametrize("src,dst,part", [(-1, 0, 0), (0, -2, 0), (0, 1, -1)])
    def test_negative_ids_rejected(self, src, dst, part):
        with pytest.raises(ValueError, match="negative"):
            Transfer(src, dst, part)

    def test_hashable_and_equal(self):
        assert Transfer(1, 2, 3) == Transfer(1, 2, 3)
        assert len({Transfer(1, 2, 3), Transfer(1, 2, 3)}) == 1

    def test_ordering(self):
        assert Transfer(0, 1, 0) < Transfer(1, 2, 0)


class TestPhase:
    def test_valid_phase(self):
        p = Phase([Transfer(1, 0, 0), Transfer(3, 2, 0)])
        p.validate()

    def test_duplicate_transfer_rejected(self):
        p = Phase([Transfer(1, 0, 0), Transfer(1, 0, 0)])
        with pytest.raises(ValueError, match="duplicate"):
            p.validate()

    def test_double_send_rejected(self):
        p = Phase([Transfer(1, 0, 0), Transfer(1, 2, 1)])
        with pytest.raises(ValueError, match="sends to more than one"):
            p.validate()

    def test_double_receive_rejected(self):
        p = Phase([Transfer(1, 0, 0), Transfer(2, 0, 1)])
        with pytest.raises(ValueError, match="receives from more than one"):
            p.validate()

    def test_shared_phase_allows_fan_in(self):
        p = Phase([Transfer(1, 0, 0), Transfer(2, 0, 0)], shared_links=True)
        p.validate()

    def test_send_and_receive_same_partition_rejected(self):
        # v2 receives partition 0 and sends partition 0: forbidden even
        # in shared phases (Section 2.2).
        p = Phase([Transfer(1, 2, 0), Transfer(2, 3, 0)], shared_links=True)
        with pytest.raises(ValueError, match="same partition"):
            p.validate()

    def test_send_and_receive_different_partition_ok(self):
        p = Phase([Transfer(1, 2, 0), Transfer(2, 1, 1)])
        p.validate()

    def test_len_and_iter(self):
        ts = [Transfer(1, 0, 0), Transfer(3, 2, 0)]
        p = Phase(ts)
        assert len(p) == 2
        assert list(p) == ts


class TestPlan:
    def test_empty_plan_valid(self):
        Plan().validate()

    def test_two_phase_plan(self):
        plan = Plan(
            phases=[
                Phase([Transfer(1, 0, 0), Transfer(3, 2, 0)]),
                Phase([Transfer(2, 0, 0)]),
            ]
        )
        plan.validate()
        assert len(plan) == 2
        assert plan.n_transfers == 3

    def test_resend_after_emptying_rejected(self):
        plan = Plan(
            phases=[Phase([Transfer(1, 0, 0)]), Phase([Transfer(1, 2, 0)])]
        )
        with pytest.raises(ValueError, match="re-sends"):
            plan.validate()

    def test_resend_after_refill_allowed(self):
        # v1 empties partition 0, receives it back from v2, re-sends it.
        plan = Plan(
            phases=[
                Phase([Transfer(1, 0, 0)]),
                Phase([Transfer(2, 1, 0)]),
                Phase([Transfer(1, 0, 0)]),
            ]
        )
        plan.validate()

    def test_other_partition_unaffected(self):
        plan = Plan(
            phases=[Phase([Transfer(1, 0, 0)]), Phase([Transfer(1, 0, 1)])]
        )
        plan.validate()

    def test_phase_error_surfaces(self):
        plan = Plan(phases=[Phase([Transfer(1, 0, 0), Transfer(1, 2, 1)])])
        with pytest.raises(ValueError):
            plan.validate()

"""Repartition-based aggregation baselines (Section 5.1.1).

Both ``Repart`` and ``Preagg+Repart`` use the same *plan*: a single
phase in which every fragment sends each partition directly to that
partition's destination, all transfers concurrent and sharing links
(the executor costs the phase with Eq. 9). The two baselines differ
only in whether the engine pre-aggregates locally first, which the
harness controls.
"""
from __future__ import annotations

import numpy as np

from repro.core.plan import Phase, Plan, Transfer


def repartition_plan(
    n_frags: int, dest: np.ndarray, *, algorithm: str = "repart"
) -> Plan:
    """One shared-links phase: ``v -> M(l)`` for every fragment ``v`` and
    partition ``l`` with ``v != M(l)``.

    Fragments that happen to hold no data for a partition still appear
    (the executor observes zero bytes for them — harmless), so the plan
    needs no cardinality information, exactly like a hash repartition.
    """
    dest = np.asarray(dest, dtype=np.int64)
    transfers = [
        Transfer(v, int(dest[l]), l)
        for l in range(len(dest))
        for v in range(n_frags)
        if v != dest[l]
    ]
    plan = Plan(phases=[Phase(transfers=transfers, shared_links=True)], algorithm=algorithm)
    plan.validate()
    return plan

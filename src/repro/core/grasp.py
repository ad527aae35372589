"""The GRASP planner: Algorithm 2 pair selection and the phase loop.

Given the coordinator arrays (``Card``, ``MinH``), the estimated
bandwidth matrix ``B`` and the partition-destination mapping ``M``,
:func:`plan_aggregation` produces the full multi-phase :class:`Plan`
before any data moves (Steps 3–8 of Figure 5). All arithmetic runs on
the driver over numpy arrays — the paper's coordinator is likewise a
single node operating on collected signatures.
"""
from __future__ import annotations

import time

import numpy as np

from repro.core.cost_model import cost_matrix
from repro.core.plan import Phase, Plan, Transfer
from repro.minhash.estimate import CoordinatorState, update


def select_phase(
    c: np.ndarray, state: CoordinatorState, dest: np.ndarray
) -> Phase:
    """Algorithm 2: greedily pick transfers for one phase.

    Repeatedly takes the globally cheapest viable ``(s -> t, l)`` entry
    of ``C_i``, then removes ``s`` from the sender candidates, ``t`` from
    the receiver candidates, and both from partition ``l``'s candidates —
    enforcing one send and one receive per node per phase, and no
    same-partition send+receive. Each pick immediately applies
    ``UPDATE(s, t, l)`` to the coordinator ``state`` (the estimated
    post-transfer sizes feed the next phase's ``C``). Entries already
    picked this phase are never re-examined because their nodes leave
    the candidate sets.
    """
    m, n, _ = c.shape
    send_ok = np.ones(n, dtype=bool)
    recv_ok = np.ones(n, dtype=bool)
    part_ok = np.ones((m, n), dtype=bool)
    phase = Phase()
    masked = c.copy()
    while send_ok.any() and recv_ok.any():
        mask = (
            part_ok[:, :, None]
            & part_ok[:, None, :]
            & send_ok[None, :, None]
            & recv_ok[None, None, :]
        )
        view = np.where(mask, masked, np.inf)
        flat = np.argmin(view)
        l, s, t = np.unravel_index(flat, view.shape)
        if not np.isfinite(view[l, s, t]):
            break
        phase.transfers.append(Transfer(int(s), int(t), int(l)))
        send_ok[s] = False
        recv_ok[t] = False
        part_ok[l, s] = False
        part_ok[l, t] = False
        update(state, int(s), int(t), int(l))
    phase.validate()
    return phase


def aggregation_done(state: CoordinatorState, dest: np.ndarray) -> bool:
    """Eq. 2 / Eq. 7: every partition's data sits only at its destination."""
    remaining = state.card.copy()
    remaining[dest, np.arange(state.n_parts)] = 0.0
    return bool(np.all(remaining <= 0))


def plan_aggregation(
    state: CoordinatorState,
    bandwidth: np.ndarray,
    dest: np.ndarray,
    *,
    w: float,
    max_phases: int | None = None,
) -> Plan:
    """Produce the complete GRASP aggregation plan.

    ``state`` is consumed (mutated through the planner's UPDATE calls) —
    pass ``state.copy()`` to keep the original. All-to-one aggregation is
    the single-partition case ``dest = [v*]``.
    """
    dest = np.asarray(dest, dtype=np.int64)
    limit = max_phases if max_phases is not None else state.n_frags * state.n_parts + 1
    t0 = time.perf_counter()
    plan = Plan(algorithm="grasp")
    while not aggregation_done(state, dest):
        if len(plan.phases) >= limit:
            raise RuntimeError(
                f"planner exceeded {limit} phases — no progress being made"
            )
        c = cost_matrix(state, bandwidth, dest, w)
        phase = select_phase(c, state, dest)
        if not phase.transfers:
            raise RuntimeError("no viable transfer found but aggregation incomplete")
        plan.phases.append(phase)
    plan.planning_seconds = time.perf_counter() - t0
    plan.validate()
    return plan

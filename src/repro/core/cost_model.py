"""Eq. 5 transfer cost and the Eq. 8 one-phase-lookahead cost matrix.

The coordinator builds, at the start of every phase ``P_i``, a matrix
``C_i[l, s, t]`` — the heuristic cost of node ``s`` sending its share of
partition ``l`` to node ``t`` in this phase:

    C_i = inf                      if s == t, s == M(l), X^l(s) empty,
                                   or (X^l(t) empty and t != M(l))
    C_i = COST(s->t)               if t == M(l)   (never re-transmitted)
    C_i = COST(s->t) + E_i(s,t,l)  otherwise

with ``COST(s->t) = |X^l(s)| * w / B(s->t)`` (Eq. 5) and
``E_i = ESTCARD(s,t,l) * w / B(s->t)`` the anticipated cost of shipping
the union in the next phase. The case order follows DESIGN.md: the
final destination may receive even when empty (Section 2.1 constraint).
"""
from __future__ import annotations

import numpy as np

from repro.minhash.estimate import CoordinatorState, all_pairs_union_card

MB = 1e6


def transfer_seconds(n_tuples: float, w: float, bw_mbps: float) -> float:
    """Eq. 5: seconds to ship ``n_tuples`` tuples of ``w`` bytes at
    ``bw_mbps`` MB/s."""
    if bw_mbps <= 0:
        raise ValueError("bandwidth must be positive")
    return n_tuples * w / (bw_mbps * MB)


def cost_matrix(
    state: CoordinatorState,
    bandwidth: np.ndarray,
    dest: np.ndarray,
    w: float,
) -> np.ndarray:
    """Build ``C_i`` for every partition: shape (L, N, N), row = sender.

    ``bandwidth`` is the planner's *estimated* B matrix (N, N) in MB/s;
    ``dest`` maps each partition to its final destination fragment
    (``M`` of Section 2.2); ``w`` is the tuple width in bytes.
    """
    n, m = state.n_frags, state.n_parts
    if bandwidth.shape != (n, n):
        raise ValueError(f"bandwidth shape {bandwidth.shape} != ({n}, {n})")
    if dest.shape != (m,):
        raise ValueError(f"dest shape {dest.shape} != ({m},)")

    c = np.empty((m, n, n), dtype=np.float64)
    eye = np.eye(n, dtype=bool)
    inv_bw = np.where(np.isfinite(bandwidth) & (bandwidth > 0), 1.0 / (bandwidth * MB), 0.0)
    for l in range(m):
        card_l = state.card[:, l]  # (N,)
        cost = card_l[:, None] * w * inv_bw  # COST(s->t), Eq. 5
        union = all_pairs_union_card(state, l)
        e = union * w * inv_bw
        cl = cost + e
        # t == M(l): pay only the transfer, never re-shipped.
        cl[:, dest[l]] = cost[:, dest[l]]
        # Empty receivers are useless targets — except the destination.
        empty = card_l <= 0
        recv_block = empty.copy()
        recv_block[dest[l]] = False
        cl[:, recv_block] = np.inf
        # Empty or destination senders never send; no self transfers.
        cl[empty, :] = np.inf
        cl[dest[l], :] = np.inf
        cl[eye] = np.inf
        c[l] = cl
    return c

"""Algorithm 1 of the paper: ESTCARD and UPDATE over the coordinator's
``Card`` and ``MinH`` arrays, plus vectorised all-pairs variants used to
build the Eq. 8 cost matrix.

``Card`` has shape (N, L) — estimated distinct-key count of partition
``l`` on fragment ``v``. ``MinH`` has shape (N, L, n) — the minhash
signature of each (fragment, partition) set; empty sets hold
:data:`repro.minhash.hashing.EMPTY_SLOT` in every slot.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.minhash.hashing import EMPTY_SLOT, HashFamily, signature


@dataclass
class CoordinatorState:
    """Driver-side planning state: the two arrays of Section 3.3."""

    card: np.ndarray  # (N, L) float64
    minh: np.ndarray  # (N, L, n) int64

    def __post_init__(self) -> None:
        if self.card.ndim != 2 or self.minh.ndim != 3:
            raise ValueError("card must be (N, L); minh must be (N, L, n)")
        if self.card.shape != self.minh.shape[:2]:
            raise ValueError(
                f"shape mismatch: card {self.card.shape} vs minh {self.minh.shape}"
            )
        self.card = self.card.astype(np.float64, copy=True)
        self.minh = self.minh.astype(np.int64, copy=True)

    @property
    def n_frags(self) -> int:
        return self.card.shape[0]

    @property
    def n_parts(self) -> int:
        return self.card.shape[1]

    def copy(self) -> "CoordinatorState":
        return CoordinatorState(self.card.copy(), self.minh.copy())

    @classmethod
    def from_key_sets(
        cls,
        key_sets: list[list[np.ndarray]],
        family: HashFamily,
        *,
        spread: bool = True,
    ) -> "CoordinatorState":
        """Build exact Card and true minhash signatures from explicit key
        sets — ``key_sets[v][l]`` is the key array of partition l on
        fragment v. Driver-side reference path (tests and tiny inputs);
        production inputs come from ``repro.minhash.signatures``.
        """
        n, m = len(key_sets), len(key_sets[0])
        card = np.zeros((n, m))
        minh = np.full((n, m, family.n), EMPTY_SLOT, dtype=np.int64)
        for v in range(n):
            if len(key_sets[v]) != m:
                raise ValueError("ragged key_sets")
            for l in range(m):
                keys = np.unique(np.asarray(key_sets[v][l]))
                card[v, l] = len(keys)
                minh[v, l] = signature(keys, family, spread=spread)
        return cls(card, minh)


def est_jaccard(sig_s: np.ndarray, sig_t: np.ndarray) -> float:
    """Estimated Jaccard similarity: fraction of agreeing signature slots."""
    if sig_s.shape != sig_t.shape:
        raise ValueError("signature length mismatch")
    return float(np.mean(sig_s == sig_t))


def est_card(state: CoordinatorState, s: int, t: int, l: int) -> float:
    """ESTCARD(s, t, l): estimated ``|X^l(s) ∪ X^l(t)|``.

    Paper formula ``(|S| + |T|) / (1 + J)`` with the estimate clamped to
    the always-valid set bounds ``[max(|S|,|T|), |S|+|T|]`` (deviation
    noted in DESIGN.md — clamping can only improve the estimator).
    """
    cs, ct = state.card[s, l], state.card[t, l]
    j = est_jaccard(state.minh[s, l], state.minh[t, l])
    raw = (cs + ct) / (1.0 + j)
    return float(np.clip(raw, max(cs, ct), cs + ct))


def update(state: CoordinatorState, s: int, t: int, l: int) -> None:
    """UPDATE(s, t, l): apply the planned ``s -> t`` transfer of partition
    ``l`` to the coordinator arrays — ``t`` now holds the estimated
    union (signature = pairwise min), ``s`` is emptied.
    """
    state.card[t, l] = est_card(state, s, t, l)
    state.card[s, l] = 0.0
    np.minimum(state.minh[t, l], state.minh[s, l], out=state.minh[t, l])
    state.minh[s, l] = EMPTY_SLOT


def all_pairs_union_card(state: CoordinatorState, l: int) -> np.ndarray:
    """Vectorised ESTCARD for every (s, t) pair of one partition.

    Returns an (N, N) array ``U[s, t] ≈ |X^l(s) ∪ X^l(t)|`` with the same
    clamping as :func:`est_card`. Used by the Eq. 8 cost-matrix builder.
    """
    sig = state.minh[:, l, :]  # (N, n)
    j = np.mean(sig[:, None, :] == sig[None, :, :], axis=2)  # (N, N)
    c = state.card[:, l]
    raw = (c[:, None] + c[None, :]) / (1.0 + j)
    lo = np.maximum(c[:, None], c[None, :])
    hi = c[:, None] + c[None, :]
    return np.clip(raw, lo, hi)

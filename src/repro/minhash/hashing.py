"""Universal hash family for minhash (Section 3.3 of the paper).

The paper's example uses ``h(x) = (a*x + b) mod p``; we use the same
family with the Mersenne prime ``p = 2^31 - 1``. Keys are first spread
with ``xxhash64`` (in Spark) or a splitmix64 finalizer (in numpy) and
reduced mod p, so ``a*x + b < 2^62`` always fits in a signed 64-bit
integer — this lets the signature computation run as plain Spark SQL
``min()`` aggregates without bigint overflow.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

MERSENNE_P = (1 << 31) - 1
#: Signature value of the empty set: ``min`` over zero elements.
EMPTY_SLOT = MERSENNE_P


@dataclass(frozen=True)
class HashFamily:
    """``n`` independent hashes ``h_j(x) = (a_j * x + b_j) mod p``.

    ``a`` in [1, p), ``b`` in [0, p), drawn deterministically from
    ``seed``. The paper uses n=100 (signatures < 1 KB, estimate within
    10% of truth with 95% probability).
    """

    n: int = 100
    seed: int = 0

    def __post_init__(self) -> None:
        if self.n < 1:
            raise ValueError("need at least one hash function")

    @property
    def params(self) -> tuple[np.ndarray, np.ndarray]:
        """The (a, b) coefficient arrays, each of length ``n``."""
        g = np.random.default_rng(self.seed)
        a = g.integers(1, MERSENNE_P, self.n, dtype=np.int64)
        b = g.integers(0, MERSENNE_P, self.n, dtype=np.int64)
        return a, b


def _splitmix64(x: np.ndarray) -> np.ndarray:
    """The splitmix64 finalizer: a strong 64-bit mixing function.

    Used as the driver-side stand-in for a generic key -> int64 spread
    (Spark-side code uses ``xxhash64``; the two need not match because a
    signature array is only ever compared against signatures produced by
    the same path).
    """
    z = (x.astype(np.uint64) + np.uint64(0x9E3779B97F4A7C15))
    z = (z ^ (z >> np.uint64(30))) * np.uint64(0xBF58476D1CE4E5B9)
    z = (z ^ (z >> np.uint64(27))) * np.uint64(0x94D049BB133111EB)
    return z ^ (z >> np.uint64(31))


def spread_keys(keys: np.ndarray) -> np.ndarray:
    """Map raw int keys to [0, p) with a strong mix (driver-side path)."""
    return (_splitmix64(np.asarray(keys, dtype=np.int64)) % np.uint64(MERSENNE_P)).astype(
        np.int64
    )


def signature(keys: np.ndarray, family: HashFamily, *, spread: bool = True) -> np.ndarray:
    """Minhash signature of a key set: ``sig[j] = min_x h_j(x)``.

    An empty set yields a vector of :data:`EMPTY_SLOT`. Duplicate keys
    are harmless (min is idempotent). With ``spread=False`` keys are
    reduced ``key mod p`` directly — the mode used when cross-checking
    against the Spark signature path, which spreads with ``xxhash64``
    instead of splitmix64 (signatures are only ever compared within one
    path; see ``repro.minhash.signatures``).
    """
    if len(keys) == 0:
        return np.full(family.n, EMPTY_SLOT, dtype=np.int64)
    a, b = family.params
    # a < p < 2^31 and x < p < 2^31 keep a*x + b < 2^62: exact in int64,
    # matching what the Spark SQL expression computes.
    x = (
        spread_keys(np.asarray(keys))
        if spread
        else np.asarray(keys, dtype=np.int64) % MERSENNE_P
    )
    hv = (x[:, None] * a[None, :] + b[None, :]) % MERSENNE_P
    return hv.min(axis=0).astype(np.int64)

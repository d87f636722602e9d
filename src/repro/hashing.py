"""Deterministic vectorized hashing — the "fusion" trick.

InfuserMG [32] observed that a sampled graph never needs to be stored:
whether edge ``e`` survives in sketch ``r`` can be decided by a hash of
``(e, r)``, so the sketch id alone reconstructs the sampled graph. PaC-IM
adopts the same idea (paper Sec. 2, Alg. 3 ``Sample``). We implement it
with a splitmix64 finalizer over uint64 numpy arrays so the same bits are
produced on the driver and inside every pandas-UDF task.

All public functions are pure and vectorized; overflow wraps mod 2**64
(C semantics), which numpy guarantees for unsigned dtypes.
"""
from __future__ import annotations

import numpy as np

_M1 = np.uint64(0xBF58476D1CE4E5B9)
_M2 = np.uint64(0x94D049BB133111EB)
_GOLDEN = np.uint64(0x9E3779B97F4A7C15)
_TWO64 = float(2.0**64)


def splitmix64(x: np.ndarray | int) -> np.ndarray:
    """splitmix64 finalizer: a high-quality 64-bit mixing function."""
    x = np.asarray(x, dtype=np.uint64)
    with np.errstate(over="ignore"):
        x = (x ^ (x >> np.uint64(30))) * _M1
        x = (x ^ (x >> np.uint64(27))) * _M2
        return x ^ (x >> np.uint64(31))


def edge_key(u: np.ndarray | int, v: np.ndarray | int) -> np.ndarray:
    """Canonical 64-bit identity of an *undirected* edge.

    Both arc directions (u, v) and (v, u) map to the same key, so a
    sampled graph is consistent no matter which endpoint starts a BFS.
    """
    u = np.asarray(u, dtype=np.uint64)
    v = np.asarray(v, dtype=np.uint64)
    lo = np.minimum(u, v)
    hi = np.maximum(u, v)
    with np.errstate(over="ignore"):
        return splitmix64((lo << np.uint64(32)) ^ hi)


def u01(key: np.ndarray | int, salt: int) -> np.ndarray:
    """Uniform [0, 1) double derived from ``key`` and an integer ``salt``.

    ``salt`` is the sketch / simulation id (plus a stream offset chosen by
    the caller so sketches, RR sets, and MC simulations never share
    randomness).
    """
    key = np.asarray(key, dtype=np.uint64)
    with np.errstate(over="ignore"):
        mixed = splitmix64(key ^ splitmix64(np.uint64(salt) * _GOLDEN + _GOLDEN))
    return mixed.astype(np.float64) / _TWO64


# Disjoint salt streams. Each consumer offsets its logical id by one of
# these so e.g. sketch 3 and MC simulation 3 see independent coin flips.
SALT_SKETCH = 0x10_0000
SALT_SIM = 0x20_0000
SALT_RR = 0x30_0000
SALT_PROB = 0x40_0000  # per-edge base probability (Uniform model)

"""Counter-based deterministic randomness shared by every walk engine.

The paper (Appendix B) argues GraSorw's scheduling is *correct* because it
only reorders walk updates. We make that claim mechanically checkable: the
random draw for step ``hop`` of walk ``walk_id`` is a pure function
``unit_hash(seed, walk_id, hop, salt)`` of the walk identity, not of the
execution order. Every engine — the five driver engines, the in-memory
reference walker, and the Spark iterative-join engine — therefore produces
bit-identical trajectories, and tests assert exact equality.

The hash is two rounds of splitmix64 over uint64 with wraparound; the Spark
engine applies the *same numpy kernel* through a pandas UDF, so there is no
cross-language reimplementation to drift.
"""
from __future__ import annotations

import numpy as np

_GAMMA = np.uint64(0x9E3779B97F4A7C15)
_M1 = np.uint64(0xBF58476D1CE4E5B9)
_M2 = np.uint64(0x94D049BB133111EB)
_TWO53 = float(1 << 53)


def _mix(x: np.ndarray) -> np.ndarray:
    """One splitmix64 output round (finalizer) over a uint64 array."""
    z = (x + _GAMMA).astype(np.uint64)
    z = (z ^ (z >> np.uint64(30))) * _M1
    z = (z ^ (z >> np.uint64(27))) * _M2
    return z ^ (z >> np.uint64(31))


from functools import lru_cache


@lru_cache(maxsize=256)
def _base(seed: int, salt: int) -> np.uint64:
    """Pre-mixed (seed, salt) key — constant per task, computed once."""
    s = np.uint64(int(seed) & 0xFFFFFFFFFFFFFFFF)
    with np.errstate(over="ignore"):
        return _mix(np.atleast_1d(s + np.uint64(salt & 0xFFFFFFFFFFFFFFFF) * _GAMMA))[0]


def hash_u64(seed: int, walk_id: np.ndarray, hop: np.ndarray, salt: int = 0) -> np.ndarray:
    """Deterministic 64-bit hash of (seed, walk_id, hop, salt).

    ``walk_id`` and ``hop`` may be scalars or equal-length integer arrays;
    broadcasting follows numpy rules. Output dtype is uint64. Two splitmix64
    finalizer rounds over the pre-mixed (seed, salt) base.
    """
    scalar = np.ndim(walk_id) == 0 and np.ndim(hop) == 0
    w = np.atleast_1d(np.asarray(walk_id)).astype(np.uint64)
    h = np.atleast_1d(np.asarray(hop)).astype(np.uint64)
    with np.errstate(over="ignore"):
        x = _mix(_mix(_base(seed, salt) ^ w) + h * _M2)
    return x[0] if scalar else x


def unit_hash(seed: int, walk_id, hop, salt: int = 0) -> np.ndarray:
    """Deterministic uniform double in [0, 1) from (seed, walk_id, hop, salt).

    Uses the top 53 bits of :func:`hash_u64` so the value is exactly
    representable as a double and identical wherever the kernel runs.
    """
    bits = hash_u64(seed, walk_id, hop, salt) >> np.uint64(11)
    return bits.astype(np.float64) / _TWO53

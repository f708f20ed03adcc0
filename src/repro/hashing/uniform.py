"""Fibonacci (Knuth multiplicative) hashing to the unit interval.

The paper's ``h_u`` maps integers uniformly to [0, 1). We follow Knuth
(TAOCP v3): multiply by the 64-bit golden-ratio constant and take the
wrapped product as a 64-bit fraction. The mapping is deterministic, so
every sketch builder (numpy core and Spark layer) selects *identical*
samples for identical inputs.
"""
from __future__ import annotations

import numpy as np

_GOLDEN64 = np.uint64(0x9E3779B97F4A7C15)
_INV_2_64 = float(2.0**-64)


def fibonacci_u01(x: np.ndarray) -> np.ndarray:
    """Map 32-bit integer hashes to floats uniform in [0, 1)."""
    x = np.asarray(x, dtype=np.uint64)
    with np.errstate(over="ignore"):
        mixed = x * _GOLDEN64
    return mixed.astype(np.float64) * _INV_2_64

"""Canonical byte encoding of join-key values for hashing.

Join keys may arrive as integers, floats that happen to be integral
(a common artifact of pandas NULL-handling), or strings. Both sides of
a join must hash identical logical values to identical bytes, so we
canonicalise before hashing:

* integer dtypes           -> 8-byte little-endian two's complement
* float dtypes, integral   -> same 8-byte integer encoding
* everything else          -> UTF-8 bytes of ``str(value)``

The integer fast path is fully vectorized; the string path pads to the
max length for :func:`repro.hashing.murmur3.murmur3_32_batch`.
"""
from __future__ import annotations

import numpy as np


def encode_values(values: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Return ``(padded_uint8_matrix, lengths)`` for an array of key values."""
    values = np.asarray(values)
    if values.dtype.kind in "iu":
        as_int = values.astype(np.int64)
        return as_int.view(np.uint8).reshape(-1, 8).copy(), np.full(len(values), 8)
    if values.dtype.kind == "f":
        finite = np.isfinite(values)
        integral = finite & (np.floor(values) == values) & (np.abs(values) < 2**62)
        if integral.all():
            as_int = values.astype(np.int64)
            return as_int.view(np.uint8).reshape(-1, 8).copy(), np.full(len(values), 8)
    # Generic path: canonical string form. Integral floats still print
    # as integers so that 1, 1.0 and "1" disagree only with "1" (string
    # keys are compared as strings by the join anyway).
    strs = []
    for v in values.tolist():
        if isinstance(v, float) and np.isfinite(v) and v == int(v) and abs(v) < 2**62:
            strs.append(str(int(v)))
        else:
            strs.append(str(v))
    bs = [s.encode("utf-8") for s in strs]
    lengths = np.fromiter((len(b) for b in bs), dtype=np.int64, count=len(bs))
    width = max(4, int(lengths.max(initial=1)))
    padded = np.zeros((len(bs), width), dtype=np.uint8)
    for i, b in enumerate(bs):
        padded[i, : len(b)] = np.frombuffer(b, dtype=np.uint8)
    return padded, lengths

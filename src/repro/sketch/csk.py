"""CSK — Correlation Sketches baseline, extended to MI (paper §V).

Correlation Sketches (Santos et al., SIGMOD 2021) perform KMV
coordinated sampling over *distinct* join keys and keep one value per
key. They "do not prescribe how to handle repeated join keys"; per the
paper's baseline setup we keep the **first value seen** for each key on
both sides — no aggregation function is applied, so repeated-key
information on either table is simply dropped.
"""
from __future__ import annotations

import numpy as np

from repro import hashing

from .base import Sketch, aggregate_cand


def _first_value_kmv(keys: np.ndarray, values: np.ndarray, n: int) -> Sketch:
    firsts = aggregate_cand(keys, values, "first")
    kh = hashing.hash_keys(firsts["key"].to_numpy())
    u = hashing.u01(kh)
    idx = np.argsort(u, kind="stable")[:n]
    return Sketch(kh[idx], firsts["value"].to_numpy()[idx])


def train_sketch(keys: np.ndarray, values: np.ndarray, n: int) -> Sketch:
    return _first_value_kmv(np.asarray(keys), np.asarray(values), n)


def cand_sketch(keys: np.ndarray, values: np.ndarray, n: int, agg: str = "avg") -> Sketch:
    """CSK ignores AGG by design: first value seen per key."""
    return _first_value_kmv(np.asarray(keys), np.asarray(values), n)

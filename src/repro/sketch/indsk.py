"""INDSK — independent (uncoordinated) sampling baseline (paper §V).

Each table is sampled *independently*: the train side keeps a uniform
n-subset of its rows, the candidate side (after aggregation) a uniform
n-subset of its keys, using hash streams salted differently per side
so the selections share nothing. The expected sketch-join size is
quadratically small (Section IV's naive-Bernoulli argument), which is
why coordinated sketches dominate it in Table I.

We realize "Bernoulli sampling with expected size n" as a bottom-n
uniform sample without replacement (deterministic given the salt),
which bounds the sketch at exactly n rows — the same size contract as
the other sketches — without changing the uncoordinated behaviour that
the experiment measures.
"""
from __future__ import annotations

import numpy as np

from repro import hashing
from repro.hashing.murmur3 import murmur3_32_u32pair

from .base import Sketch, aggregate_cand

_SALT_TRAIN = 0xA5A5A5A5
_SALT_CAND = 0x5A5A5A5A


def train_sketch(keys: np.ndarray, values: np.ndarray, n: int) -> Sketch:
    """Uniform n-subset of rows, independent of keys and of the cand side."""
    keys = np.asarray(keys)
    values = np.asarray(values)
    kh = hashing.hash_keys(keys)
    rid = np.arange(len(keys), dtype=np.uint32)
    u = hashing.u01(murmur3_32_u32pair(rid, np.full(len(keys), _SALT_TRAIN, np.uint32)))
    idx = np.argsort(u, kind="stable")[:n]
    return Sketch(kh[idx], values[idx])


def cand_sketch(keys: np.ndarray, values: np.ndarray, n: int, agg: str = "avg") -> Sketch:
    """Aggregate per key, then a uniform n-subset of keys (own salt)."""
    aggdf = aggregate_cand(keys, values, agg)
    kh = hashing.hash_keys(aggdf["key"].to_numpy())
    u = hashing.u01(murmur3_32_u32pair(kh, np.full(len(kh), _SALT_CAND, np.uint32)))
    idx = np.argsort(u, kind="stable")[:n]
    return Sketch(kh[idx], aggdf["value"].to_numpy()[idx])

"""Shared sketch machinery (paper Section IV, "Approach Overview").

A sketch is a bounded set of tuples ``<h(k), value>``. All five
sketching methods (TUPSK, LV2SK, PRISK, INDSK, CSK) differ only in how
they *select* rows; selection is a deterministic function of the hash
substrate, so the numpy core here and the Spark DataFrame layer in
``repro.core.pipeline`` produce byte-identical sketches — the tests
assert this.

The candidate (right) side of an augmentation join must be reduced to
one value per key by a featurization function AGG (paper Section
III-B); :func:`aggregate_cand` implements AVG / COUNT / MODE / FIRST
with first-appearance tie-breaking so results are order-stable.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro import hashing

#: Featurization functions supported for the candidate table.
AGG_FUNCTIONS = ("avg", "count", "mode", "first")


@dataclass
class Sketch:
    """A bounded sample of ``<h(k), value>`` tuples for one column pair."""

    key_hash: np.ndarray  # uint32 h(k)
    values: np.ndarray  # the sampled X or Y values

    def __post_init__(self) -> None:
        if len(self.key_hash) != len(self.values):
            raise ValueError("key_hash and values must align")
        # Canonical order: by (key_hash, value-position) for stable
        # cross-engine comparison.
        order = np.argsort(self.key_hash, kind="stable")
        self.key_hash = np.asarray(self.key_hash, dtype=np.uint32)[order]
        self.values = np.asarray(self.values)[order]

    def __len__(self) -> int:
        return len(self.key_hash)


def occurrence_index(keys: np.ndarray) -> np.ndarray:
    """1-based occurrence index j of each key value, in row order.

    Row i gets j = (number of earlier rows with the same key) + 1;
    the pair <k, j> uniquely identifies a row (paper Section IV-B).
    """
    codes, _ = pd.factorize(np.asarray(keys), use_na_sentinel=False)
    return (pd.Series(codes).groupby(codes).cumcount() + 1).to_numpy(np.int64)


def aggregate_cand(keys: np.ndarray, values: np.ndarray, agg: str) -> pd.DataFrame:
    """Apply the featurization AGG per key: T_cand[K_Z, Z] -> T_aug[K_X, X].

    Returns a DataFrame [key, value] with one row per distinct key, in
    first-appearance order of the key.
    """
    if agg not in AGG_FUNCTIONS:
        raise ValueError(f"unknown AGG {agg!r}; choose from {AGG_FUNCTIONS}")
    df = pd.DataFrame({"key": np.asarray(keys), "value": np.asarray(values)})
    g = df.groupby("key", sort=False)["value"]
    if agg == "avg":
        out = g.mean()
    elif agg == "count":
        out = g.size()
    elif agg == "mode":
        # Most frequent value; ties broken by earliest first appearance
        # (same contract as the Spark implementation in
        # repro.core.fulljoin.featurize).
        def _mode_first_seen(s: pd.Series):
            counts = s.value_counts()
            best = counts.max()
            top = set(counts[counts == best].index)
            for v in s:
                if v in top:
                    return v

        out = g.agg(_mode_first_seen)
    else:  # first
        out = g.first()
    return pd.DataFrame({"key": out.index.to_numpy(), "value": out.to_numpy()})


def join_sketches(train: Sketch, cand: Sketch) -> tuple[np.ndarray, np.ndarray]:
    """Join two sketches on their hashed keys (paper's S_join).

    The candidate sketch has unique hashed keys (aggregation or
    first-value selection guarantees it), so this is a many-to-one
    lookup. Returns the paired sample (y_values, x_values) that feeds
    the MI estimator.
    """
    t = pd.DataFrame({"kh": train.key_hash.astype(np.int64), "y": train.values})
    c = pd.DataFrame({"kh": cand.key_hash.astype(np.int64), "x": cand.values})
    if c["kh"].duplicated().any():
        # 32-bit hash collisions between distinct keys can, very
        # rarely, leave duplicate hashes on the aggregated side; keep
        # the first to preserve the many-to-one join contract.
        c = c.drop_duplicates("kh", keep="first")
    j = t.merge(c, on="kh", how="inner", sort=True)
    return j["y"].to_numpy(), j["x"].to_numpy()

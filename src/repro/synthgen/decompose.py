"""Decompose a post-join (X, Y) sample into joinable tables (paper §V-A).

Two key-generation regimes:

* **KeyInd** — unique sequential keys on both sides (one-to-one join),
  maximum independence between the join key and the data values.
* **KeyDep** — the join key *is* the X value (many-to-one join), the
  strongest possible dependence between key and feature. Only valid
  when X is discrete. The left table then carries repeated keys whose
  frequencies follow the marginal distribution of X — exactly the
  regime in which the paper shows LV2SK's non-uniform sampling biases
  MI estimates (Sections IV-B, V-B3).

Both regimes recover (X, Y) exactly when the tables are re-joined,
which the tests verify through the DuckDB oracle.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass
class TablePair:
    """A (T_train, T_cand) pair plus ground truth about their join.

    ``train`` has columns [rid, key, y]; ``cand`` has [rid, key, x].
    ``rid`` is a stable row id (the sketches use it for occurrence
    ordering and reproducibility across execution engines).
    """

    train: pd.DataFrame
    cand: pd.DataFrame
    keygen: str  # "keyind" | "keydep"


def keyind(x: np.ndarray, y: np.ndarray) -> TablePair:
    """One-to-one decomposition with unique sequential keys."""
    n = len(x)
    keys = np.arange(n).astype(str)
    train = pd.DataFrame({"rid": np.arange(n), "key": keys, "y": y})
    cand = pd.DataFrame({"rid": np.arange(n), "key": keys, "x": x})
    return TablePair(train=train, cand=cand, keygen="keyind")


def keydep(x: np.ndarray, y: np.ndarray) -> TablePair:
    """Many-to-one decomposition: the join key equals the X value.

    T_cand holds one row per distinct X value (the aggregated mapping
    k -> x the paper describes: "a single value in K_X for all the
    occurrences of a value in X").
    """
    x = np.asarray(x)
    if x.dtype.kind == "f" and not np.all(np.floor(x) == x):
        raise ValueError("KeyDep requires discrete X values")
    n = len(x)
    keys = x.astype(np.int64).astype(str)
    train = pd.DataFrame({"rid": np.arange(n), "key": keys, "y": y})
    uniq = pd.unique(keys)  # first-appearance order, deterministic
    cand = pd.DataFrame(
        {
            "rid": np.arange(len(uniq)),
            "key": uniq,
            "x": pd.Series(uniq).astype(np.int64).to_numpy(),
        }
    )
    return TablePair(train=train, cand=cand, keygen="keydep")


def decompose(x: np.ndarray, y: np.ndarray, keygen: str) -> TablePair:
    if keygen == "keyind":
        return keyind(x, y)
    if keygen == "keydep":
        return keydep(x, y)
    raise ValueError(f"unknown keygen {keygen!r}")

"""Sampling-based MI sketches (paper Section IV and the §V baselines).

``METHODS`` maps a sketch name to its (train_sketch, cand_sketch)
builder pair; all builders share the signature
``train_sketch(keys, values, n)`` and
``cand_sketch(keys, values, n, agg)``.
"""
from . import csk, indsk, lv2sk, prisk, tupsk
from .base import AGG_FUNCTIONS, Sketch, aggregate_cand, join_sketches, occurrence_index

METHODS = {
    "tupsk": (tupsk.train_sketch, tupsk.cand_sketch),
    "lv2sk": (lv2sk.train_sketch, lv2sk.cand_sketch),
    "prisk": (prisk.train_sketch, prisk.cand_sketch),
    "indsk": (indsk.train_sketch, indsk.cand_sketch),
    "csk": (csk.train_sketch, csk.cand_sketch),
}

__all__ = [
    "AGG_FUNCTIONS",
    "Sketch",
    "aggregate_cand",
    "join_sketches",
    "occurrence_index",
    "METHODS",
    "csk",
    "indsk",
    "lv2sk",
    "prisk",
    "tupsk",
]


def build_pair(
    method: str,
    train_keys,
    train_values,
    cand_keys,
    cand_values,
    n: int,
    agg: str = "avg",
) -> tuple[Sketch, Sketch]:
    """Build the (S_train, S_cand) sketch pair for one table pair."""
    train_fn, cand_fn = METHODS[method]
    return train_fn(train_keys, train_values, n), cand_fn(cand_keys, cand_values, n, agg)

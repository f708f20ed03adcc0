"""Synthetic open-data corpora + type inference (paper Section V-C)."""
from .corpus import NYC, SPECS, WBF, CollectionSpec, PairTables, generate_collection, generate_pair, tall_frames
from .typeinfer import cast_column, is_numeric_column

__all__ = [
    "NYC",
    "SPECS",
    "WBF",
    "CollectionSpec",
    "PairTables",
    "generate_collection",
    "generate_pair",
    "tall_frames",
    "cast_column",
    "is_numeric_column",
]

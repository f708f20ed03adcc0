"""Synthetic benchmark generators (paper Section V-A)."""
from . import cdunif, trinomial
from .decompose import TablePair, decompose, keydep, keyind
from .trinomial import TrinomialParams, choose_params

__all__ = [
    "cdunif",
    "trinomial",
    "TablePair",
    "decompose",
    "keydep",
    "keyind",
    "TrinomialParams",
    "choose_params",
]

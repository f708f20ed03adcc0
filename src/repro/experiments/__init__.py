"""Experiment harnesses, one per published table / result section."""
from . import fulljoin_accuracy, table1, table2, timing

__all__ = ["fulljoin_accuracy", "table1", "table2", "timing"]

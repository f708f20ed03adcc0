"""The paper's core pipeline on Spark: featurization + full joins
(``fulljoin``), distributed sketch construction (``pipeline``), and the
batched pair-evaluation harness (``sweep``)."""
from . import evaluate, fulljoin, pipeline, sweep

__all__ = ["evaluate", "fulljoin", "pipeline", "sweep"]

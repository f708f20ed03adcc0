"""CDUnif synthetic benchmark (paper Section V-A, following Gao et al.).

X ~ Uniform over the integers {0, ..., m-1}; Y | X ~ Uniform[X, X+2].
X is discrete, Y continuous; the true MI has the closed form
``log m - (m-1) log 2 / m`` (nats).
"""
from __future__ import annotations

import numpy as np

from repro.mi.true_mi import cdunif_true_mi


def sample(
    m: int, n_rows: int, rng: np.random.Generator
) -> tuple[np.ndarray, np.ndarray, float]:
    """Draw (X, Y) and return them with the analytic true MI."""
    if m < 1:
        raise ValueError("m must be >= 1")
    x = rng.integers(0, m, n_rows).astype(np.int64)
    y = x + rng.uniform(0.0, 2.0, n_rows)
    return x, y, cdunif_true_mi(m)

"""k-NN mutual information estimators (paper Section II).

Implemented from the primary sources, in numpy (no scipy offline):

* :func:`mi_ksg` — Kraskov, Stögbauer & Grassberger (2004), algorithm 1,
  for continuous-continuous pairs.
* :func:`mi_mixed_ksg` — Gao, Kannan, Oh & Viswanath (NeurIPS 2017),
  for discrete-continuous *mixtures* in either variable; recovers the
  plug-in estimator on purely discrete regions.
* :func:`mi_dc_ksg` — Ross (PLoS ONE 2014), for a discrete X paired
  with a continuous Y.

All estimators use the Chebyshev (max) metric in the joint space and
natural logs, default ``k = 3``, and clip estimates at 0. Joint k-NN
distances are computed with chunked brute force (samples here are
sketches of <= a few thousand points, or full joins of a few tens of
thousands — exact brute force in float64 blocks is fast enough and has
no tie-breaking surprises). Marginal neighborhood counts use
sort + searchsorted, O(n log n).
"""
from __future__ import annotations

import numpy as np

from .special import digamma

_CHUNK = 256


def _as_float_col(a: np.ndarray) -> np.ndarray:
    return np.asarray(a, dtype=np.float64).reshape(-1)


def _joint_knn(x: np.ndarray, y: np.ndarray, k: int) -> tuple[np.ndarray, np.ndarray]:
    """Per-point k-th NN Chebyshev distance in (x, y), and count of
    exact duplicates (d_ij == 0, j != i)."""
    n = len(x)
    rho = np.empty(n)
    zeros = np.empty(n, dtype=np.int64)
    for s in range(0, n, _CHUNK):
        e = min(s + _CHUNK, n)
        d = np.abs(x[s:e, None] - x[None, :])
        np.maximum(d, np.abs(y[s:e, None] - y[None, :]), out=d)
        rows = np.arange(s, e)
        d[rows - s, rows] = np.inf  # exclude self
        zeros[s:e] = (d == 0.0).sum(axis=1)
        rho[s:e] = np.partition(d, k - 1, axis=1)[:, k - 1]
    return rho, zeros


def _marginal_count(a: np.ndarray, radius: np.ndarray, *, inclusive: bool) -> np.ndarray:
    """#{j != i : |a_j - a_i| < radius_i}  (or <= when inclusive)."""
    order = np.sort(a)
    if inclusive:
        hi = np.searchsorted(order, a + radius, side="right")
        lo = np.searchsorted(order, a - radius, side="left")
    else:
        hi = np.searchsorted(order, a + radius, side="left")
        lo = np.searchsorted(order, a - radius, side="right")
    count = hi - lo
    # Self is inside its own neighborhood whenever it qualifies
    # (always for inclusive; for strict only when radius > 0).
    self_in = np.ones_like(count) if inclusive else (radius > 0).astype(count.dtype)
    return count - self_in


def mi_ksg(x: np.ndarray, y: np.ndarray, k: int = 3) -> float:
    """KSG algorithm-1 estimate of I(X;Y) for continuous samples, nats."""
    x, y = _as_float_col(x), _as_float_col(y)
    n = len(x)
    if n != len(y):
        raise ValueError("x and y must be the same length")
    if n <= k:
        return 0.0
    rho, _ = _joint_knn(x, y, k)
    nx = _marginal_count(x, rho, inclusive=False)
    ny = _marginal_count(y, rho, inclusive=False)
    est = digamma(k) + digamma(n) - np.mean(digamma(nx + 1.0) + digamma(ny + 1.0))
    return max(0.0, float(est))


def mi_mixed_ksg(x: np.ndarray, y: np.ndarray, k: int = 3) -> float:
    """Gao et al. mixed-KSG estimate of I(X;Y), nats.

    Handles repeated values (discrete components) by switching to the
    plug-in count k~_i at points whose k-th neighbor distance is 0.
    """
    x, y = _as_float_col(x), _as_float_col(y)
    n = len(x)
    if n != len(y):
        raise ValueError("x and y must be the same length")
    if n <= k:
        return 0.0
    rho, zeros = _joint_knn(x, y, k)
    is_tie = rho == 0.0
    # Counting conventions follow Gao et al.'s reference implementation
    # (wgao9/mixed_KSG): counts include the point itself; at tied points
    # (rho == 0) the ball is the tie set, elsewhere it is the open ball
    # of radius rho; psi() replaces the paper's log(n+1).
    k_tilde = np.where(is_tie, zeros + 1.0, float(k))
    nx_strict = _marginal_count(x, rho, inclusive=False) + 1.0
    ny_strict = _marginal_count(y, rho, inclusive=False) + 1.0
    nx_tie = _marginal_count(x, np.zeros_like(rho), inclusive=True) + 1.0
    ny_tie = _marginal_count(y, np.zeros_like(rho), inclusive=True) + 1.0
    nx = np.where(is_tie, nx_tie, nx_strict)
    ny = np.where(is_tie, ny_tie, ny_strict)
    est = np.mean(digamma(k_tilde) + np.log(n) - digamma(nx) - digamma(ny))
    return max(0.0, float(est))


def mi_dc_ksg(x_discrete: np.ndarray, y: np.ndarray, k: int = 3) -> float:
    """Ross's discrete-continuous estimate of I(X;Y), nats.

    ``x_discrete`` may hold any hashable values (strings, ints); ``y``
    must be numeric. Points whose discrete class has a single member
    carry no neighbor information and are excluded, as in Ross's
    reference implementation.
    """
    import pandas as pd

    y = _as_float_col(y)
    x_codes, _ = pd.factorize(np.asarray(x_discrete), use_na_sentinel=False)
    n = len(y)
    if n != len(x_codes):
        raise ValueError("x and y must be the same length")
    if n <= k:
        return 0.0
    class_counts = np.bincount(x_codes)
    n_xi = class_counts[x_codes]
    usable = n_xi > 1
    if usable.sum() == 0:
        return 0.0
    radius = np.zeros(n)
    k_eff = np.minimum(k, n_xi - 1).astype(np.float64)
    for c in np.nonzero(class_counts > 1)[0]:
        members = np.nonzero(x_codes == c)[0]
        yc = y[members]
        kc = int(min(k, len(yc) - 1))
        # 1-d exact k-NN distance within the class via pairwise |.|
        # (classes are small relative to n; chunk if large).
        for s in range(0, len(yc), _CHUNK):
            e = min(s + _CHUNK, len(yc))
            d = np.abs(yc[s:e, None] - yc[None, :])
            d[np.arange(e - s), np.arange(s, e)] = np.inf
            radius[members[s:e]] = np.partition(d, kc - 1, axis=1)[:, kc - 1]
    m = _marginal_count(y, radius, inclusive=True)
    u = usable
    est = (
        digamma(n)
        - np.mean(digamma(n_xi[u].astype(np.float64)))
        + np.mean(digamma(np.maximum(k_eff[u], 1.0)))
        - np.mean(digamma(np.maximum(m[u].astype(np.float64), 1.0)))
    )
    return max(0.0, float(est))

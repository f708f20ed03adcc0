"""Analytic ("true") mutual information for the synthetic benchmark.

The paper's synthetic evaluation (Section V-A) generates (X, Y) from
two families whose MI is known analytically:

* **Trinomial** — (X, Y) are the first two counts of a
  Multinomial(m, <p1, p2>). The paper *selects parameters* via the
  bivariate-normal closed form ``-0.5 ln(1 - r^2)`` (central limit
  approximation) but computes the *reported* true MI exactly from the
  open-form multinomial entropies; we do the same here with
  lgamma-based sums over the joint support.
* **CDUnif** — X ~ U{0..m-1}, Y | X ~ U[X, X+2];
  ``I = ln m - (m-1) ln 2 / m``.

All values in nats.
"""
from __future__ import annotations

import numpy as np

from .special import gammaln


def mi_bivariate_normal(r: float) -> float:
    """Closed-form MI of a bivariate normal with correlation ``r``."""
    return -0.5 * np.log(1.0 - r * r)


def corr_for_mi(i_true: float) -> float:
    """Invert the bivariate-normal formula: |r| achieving MI ``i_true``."""
    return float(np.sqrt(1.0 - np.exp(-2.0 * i_true)))


def binomial_entropy(m: int, p: float) -> float:
    """Exact H(Binomial(m, p)) in nats via the lgamma sum."""
    i = np.arange(m + 1, dtype=np.float64)
    logp = (
        gammaln(m + 1.0)
        - gammaln(i + 1.0)
        - gammaln(m - i + 1.0)
        + i * np.log(p)
        + (m - i) * np.log1p(-p)
    )
    prob = np.exp(logp)
    return float(-(prob * logp).sum())


def trinomial_joint_entropy(m: int, p1: float, p2: float) -> float:
    """Exact H(X, Y) for (X, Y) ~ first two counts of Mult(m, <p1, p2>)."""
    p3 = 1.0 - p1 - p2
    if p3 <= 0:
        raise ValueError("p1 + p2 must be < 1")
    i = np.arange(m + 1, dtype=np.float64)
    ii, jj = np.meshgrid(i, i, indexing="ij")
    mask = ii + jj <= m
    ii, jj = ii[mask], jj[mask]
    kk = m - ii - jj
    logp = (
        gammaln(m + 1.0)
        - gammaln(ii + 1.0)
        - gammaln(jj + 1.0)
        - gammaln(kk + 1.0)
        + ii * np.log(p1)
        + jj * np.log(p2)
        + kk * np.log(p3)
    )
    prob = np.exp(logp)
    return float(-(prob * logp).sum())


def trinomial_true_mi(m: int, p1: float, p2: float) -> float:
    """Exact I(X;Y) for the Trinomial(m, p1, p2) benchmark, in nats."""
    hx = binomial_entropy(m, p1)
    hy = binomial_entropy(m, p2)
    hxy = trinomial_joint_entropy(m, p1, p2)
    return max(0.0, hx + hy - hxy)


def cdunif_true_mi(m: int) -> float:
    """Closed-form I(X;Y) for CDUnif(m), in nats (paper Section V-A)."""
    if m < 1:
        raise ValueError("m must be >= 1")
    return float(np.log(m) - (m - 1) * np.log(2.0) / m)

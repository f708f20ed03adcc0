"""Tests for the analytic true-MI formulas and parameter selection."""
import math

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.mi.true_mi import (
    binomial_entropy,
    cdunif_true_mi,
    corr_for_mi,
    mi_bivariate_normal,
    trinomial_joint_entropy,
    trinomial_true_mi,
)
from repro.synthgen import trinomial


def _brute_trinomial_mi(m, p1, p2):
    p3 = 1 - p1 - p2
    pxy = {}
    for i in range(m + 1):
        for j in range(m - i + 1):
            c = math.factorial(m) // (
                math.factorial(i) * math.factorial(j) * math.factorial(m - i - j)
            )
            pxy[(i, j)] = c * p1**i * p2**j * p3 ** (m - i - j)
    px = [sum(pxy[(i, j)] for j in range(m - i + 1)) for i in range(m + 1)]
    py = [sum(pxy[(i, j)] for i in range(m - j + 1)) for j in range(m + 1)]

    def h(ps):
        return -sum(p * math.log(p) for p in ps if p > 0)

    return h(px) + h(py) - h(list(pxy.values()))


@pytest.mark.parametrize("m,p1,p2", [(3, 0.3, 0.3), (8, 0.2, 0.5), (15, 0.15, 0.4), (25, 0.45, 0.45)])
def test_trinomial_mi_matches_enumeration(m, p1, p2):
    assert trinomial_true_mi(m, p1, p2) == pytest.approx(_brute_trinomial_mi(m, p1, p2), abs=1e-9)


def test_binomial_entropy_matches_enumeration():
    m, p = 12, 0.3
    probs = [
        math.comb(m, i) * p**i * (1 - p) ** (m - i) for i in range(m + 1)
    ]
    expected = -sum(q * math.log(q) for q in probs)
    assert binomial_entropy(m, p) == pytest.approx(expected, abs=1e-12)


def test_trinomial_mi_approaches_normal_form_for_large_m():
    """CLT: trinomial MI converges to the bivariate-normal closed form."""
    p1, p2 = 0.4, 0.35
    r2 = p1 * p2 / ((1 - p1) * (1 - p2))
    normal_mi = mi_bivariate_normal(math.sqrt(r2))
    assert trinomial_true_mi(1024, p1, p2) == pytest.approx(normal_mi, abs=0.02)


def test_trinomial_mi_nonnegative_and_monotone_hint():
    assert trinomial_true_mi(64, 0.2, 0.2) >= 0.0


def test_trinomial_rejects_invalid_p3():
    with pytest.raises(ValueError):
        trinomial_joint_entropy(8, 0.6, 0.5)


@pytest.mark.parametrize("m,expected", [(1, 0.0), (2, math.log(2) - math.log(2) / 2)])
def test_cdunif_small_m(m, expected):
    assert cdunif_true_mi(m) == pytest.approx(expected, abs=1e-12)


def test_cdunif_range_matches_paper():
    # Paper: m in [2, 1000] -> MI in ~[0.3, 6.2] nats
    assert cdunif_true_mi(2) == pytest.approx(0.3466, abs=1e-3)
    assert cdunif_true_mi(1000) == pytest.approx(6.215, abs=1e-2)
    # m = 256 is ~4.85 (paper Section V-B4)
    assert cdunif_true_mi(256) == pytest.approx(4.85, abs=0.01)


def test_cdunif_rejects_bad_m():
    with pytest.raises(ValueError):
        cdunif_true_mi(0)


def test_corr_for_mi_roundtrip():
    for i_true in (0.1, 0.5, 1.0, 3.5):
        r = corr_for_mi(i_true)
        assert mi_bivariate_normal(r) == pytest.approx(i_true, rel=1e-10)


@settings(max_examples=25, deadline=None)
@given(st.integers(min_value=16, max_value=1024), st.integers(min_value=0, max_value=10_000))
def test_choose_params_valid(m, seed):
    rng = np.random.default_rng(seed)
    params = trinomial.choose_params(m, rng)
    assert 0.15 <= params.p1 <= 0.85
    assert 0.15 <= params.p2 <= 0.85
    assert params.p1 + params.p2 < 1.0
    assert params.true_mi >= 0.0


def test_choose_params_hits_requested_mi_at_large_m():
    """At large m the exact trinomial MI should be close to the
    requested (normal-approximated) target."""
    rng = np.random.default_rng(11)
    params = trinomial.choose_params(1024, rng, i_true=2.0)
    assert params.true_mi == pytest.approx(2.0, abs=0.1)


def test_trinomial_sample_shapes_and_support():
    rng = np.random.default_rng(12)
    params = trinomial.choose_params(64, rng, i_true=1.0)
    x, y = trinomial.sample(params, 5000, rng)
    assert len(x) == len(y) == 5000
    assert (x >= 0).all() and (x <= 64).all()
    assert (x + y <= 64).all()
    # empirical means match binomial expectations
    assert np.mean(x) == pytest.approx(64 * params.p1, rel=0.05)
    assert np.mean(y) == pytest.approx(64 * params.p2, rel=0.05)

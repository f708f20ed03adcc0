"""Tests for the Lanczos gammaln and digamma implementations."""
import math

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.mi.special import digamma, gammaln

EULER_GAMMA = 0.5772156649015329


@pytest.mark.parametrize("x", [0.01, 0.1, 0.5, 1.0, 1.5, 2.0, 3.7, 10.0, 55.5, 171.0, 1000.0])
def test_gammaln_matches_math_lgamma(x):
    assert gammaln(x) == pytest.approx(math.lgamma(x), abs=1e-11, rel=1e-12)


def test_gammaln_vectorized_matches_scalar():
    xs = np.linspace(0.05, 300.0, 1000)
    got = gammaln(xs)
    expected = np.array([math.lgamma(v) for v in xs])
    np.testing.assert_allclose(got, expected, rtol=1e-12, atol=1e-11)


def test_gammaln_factorials():
    # Gamma(n+1) = n!
    for n in range(1, 15):
        assert gammaln(n + 1.0) == pytest.approx(math.log(math.factorial(n)), rel=1e-13)


def test_gammaln_rejects_nonpositive():
    with pytest.raises(ValueError):
        gammaln(0.0)
    with pytest.raises(ValueError):
        gammaln(-1.5)


@pytest.mark.parametrize(
    "x,expected",
    [
        (1.0, -EULER_GAMMA),
        (0.5, -EULER_GAMMA - 2 * math.log(2)),
        (2.0, 1.0 - EULER_GAMMA),
        (3.0, 1.5 - EULER_GAMMA),
        (6.0, 137.0 / 60.0 - EULER_GAMMA),
    ],
)
def test_digamma_known_values(x, expected):
    assert digamma(x) == pytest.approx(expected, abs=5e-13)


@settings(max_examples=50, deadline=None)
@given(st.floats(min_value=0.05, max_value=500.0))
def test_digamma_recurrence(x):
    # psi(x + 1) = psi(x) + 1/x
    assert digamma(x + 1.0) == pytest.approx(digamma(x) + 1.0 / x, rel=1e-9, abs=1e-10)


def test_digamma_vectorized_matches_scalar():
    xs = np.linspace(0.2, 100.0, 500)
    got = digamma(xs)
    expected = np.array([digamma(float(v)) for v in xs])
    np.testing.assert_allclose(got, expected, rtol=1e-12)


def test_digamma_monotone_increasing():
    xs = np.linspace(0.1, 50, 300)
    assert (np.diff(digamma(xs)) > 0).all()


def test_digamma_rejects_nonpositive():
    with pytest.raises(ValueError):
        digamma(0.0)


def test_digamma_matches_finite_difference_of_gammaln():
    xs = np.linspace(1.0, 30.0, 50)
    h = 1e-6
    fd = (gammaln(xs + h) - gammaln(xs - h)) / (2 * h)
    np.testing.assert_allclose(digamma(xs), fd, rtol=1e-6)

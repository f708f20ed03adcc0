"""Tests for the synthetic data generators and table decomposition."""
import numpy as np
import pandas as pd
import pytest

from repro.synthgen import cdunif, decompose, trinomial
from repro.core.evaluate import full_join_pairs_pandas


def _trinomial_xy(m=64, n=2000, seed=0):
    rng = np.random.default_rng(seed)
    params = trinomial.choose_params(m, rng, i_true=1.5)
    return trinomial.sample(params, n, rng)


def test_cdunif_sample_properties():
    rng = np.random.default_rng(1)
    x, y, true = cdunif.sample(10, 5000, rng)
    assert ((x >= 0) & (x < 10)).all()
    assert ((y >= x) & (y <= x + 2)).all()
    assert true == pytest.approx(np.log(10) - 9 * np.log(2) / 10)


def test_cdunif_rejects_bad_m():
    with pytest.raises(ValueError):
        cdunif.sample(0, 10, np.random.default_rng(0))


def test_generators_deterministic_in_seed():
    a = cdunif.sample(7, 100, np.random.default_rng(5))
    b = cdunif.sample(7, 100, np.random.default_rng(5))
    assert (a[0] == b[0]).all() and (a[1] == b[1]).all()


@pytest.mark.parametrize("keygen", ["keyind", "keydep"])
def test_decompose_recovers_xy_exactly(keygen):
    """Both regimes must recover (X, Y) exactly on re-join (paper §V-A)."""
    x, y = _trinomial_xy()
    pair = decompose(x, y, keygen)
    jy, jx = full_join_pairs_pandas(pair.train, pair.cand.rename(columns={"x": "x"}).assign(x=pair.cand["x"]), "avg")
    # Re-joined multiset of (x, y) pairs equals the generated one.
    got = sorted(zip(np.asarray(jx, float), np.asarray(jy, float)))
    expected = sorted(zip(x.astype(float), y.astype(float)))
    assert got == expected


def test_keyind_unique_keys_both_sides():
    x, y = _trinomial_xy()
    pair = decompose(x, y, "keyind")
    assert pair.train["key"].is_unique
    assert pair.cand["key"].is_unique
    assert len(pair.train) == len(pair.cand) == len(x)


def test_keydep_key_equals_x():
    x, y = _trinomial_xy()
    pair = decompose(x, y, "keydep")
    assert (pair.train["key"].to_numpy() == x.astype(str)).all()
    assert pair.cand["key"].is_unique
    assert len(pair.cand) == len(np.unique(x))
    assert (pair.cand["key"].astype(np.int64).to_numpy() == pair.cand["x"].to_numpy()).all()


def test_keydep_rejects_continuous_x():
    with pytest.raises(ValueError):
        decompose(np.array([0.5, 1.7]), np.array([1.0, 2.0]), "keydep")


def test_decompose_unknown_regime():
    with pytest.raises(ValueError):
        decompose(np.arange(3), np.arange(3), "random")


def test_decompose_has_stable_rids():
    x, y = _trinomial_xy(n=100)
    pair = decompose(x, y, "keydep")
    assert pair.train["rid"].tolist() == list(range(100))


def test_keydep_key_frequencies_match_x_marginal():
    x, y = _trinomial_xy(n=5000)
    pair = decompose(x, y, "keydep")
    key_counts = pair.train["key"].value_counts()
    x_counts = pd.Series(x.astype(str)).value_counts()
    assert key_counts.equals(x_counts)

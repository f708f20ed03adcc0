"""Section V-D benchmark: sketch path vs full-join path, N = 5k..20k.

Maps 1:1 to the paper's exemplar runtime numbers (sketch size n = 256):
full-join time and full-data MI time grow with the table size N, while
sketch-join and sketch-MI times stay approximately constant.
"""
import numpy as np
import pytest

from repro.core.evaluate import full_join_pairs_pandas
from repro.experiments import timing
from repro.mi import estimate_mi
from repro.sketch import build_pair, join_sketches

N_VALUES = (5_000, 10_000, 20_000)
SKETCH_N = 256


@pytest.fixture(scope="module", params=N_VALUES, ids=lambda n: f"N{n}")
def dataset(request):
    n_rows = request.param
    pair = timing.make_dataset(n_rows)
    tk, tv = pair.train["key"].to_numpy(), pair.train["y"].to_numpy()
    ck, cv = pair.cand["key"].to_numpy(), pair.cand["x"].to_numpy()
    s_train, s_cand = build_pair("tupsk", tk, tv, ck, cv, SKETCH_N, agg="avg")
    fy, fx = full_join_pairs_pandas(pair.train, pair.cand, "avg")
    sy, sx = join_sketches(s_train, s_cand)
    return {
        "pair": pair, "tk": tk, "tv": tv, "ck": ck, "cv": cv,
        "s_train": s_train, "s_cand": s_cand,
        "fx": fx.astype(float), "fy": fy.astype(float),
        "sx": sx.astype(float), "sy": sy.astype(float),
    }


def test_full_join_time(benchmark, dataset):
    benchmark(full_join_pairs_pandas, dataset["pair"].train, dataset["pair"].cand, "avg")


def test_sketch_join_time(benchmark, dataset):
    benchmark(join_sketches, dataset["s_train"], dataset["s_cand"])


def test_full_mi_time(benchmark, dataset):
    benchmark(estimate_mi, dataset["fx"], dataset["fy"], "mixed_ksg")


def test_sketch_mi_time(benchmark, dataset):
    benchmark(estimate_mi, dataset["sx"], dataset["sy"], "mixed_ksg")


def test_sketch_build_time(benchmark, dataset):
    benchmark(
        build_pair, "tupsk", dataset["tk"], dataset["tv"], dataset["ck"], dataset["cv"],
        SKETCH_N, agg="avg",
    )

"""Distributed sketch construction at benchmark scale (SF ~= 0.1).

Times the Spark DataFrame sketch builders over TPC-H-lite tables
(~600k-row lineitem as the train side, ~20k-row part as the candidate
side) — the offline preprocessing stage of the paper's deployment
model. Shuffle paths are exercised (broadcast joins disabled by the
session fixture).
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.core import fulljoin, pipeline

SF = 0.1
N = 1024


@pytest.fixture(scope="module")
def lineitem(spark):
    df = (
        synth_data.lineitem(spark, sf=SF)
        .select(
            F.monotonically_increasing_id().alias("rid"),
            F.col("l_partkey").alias("key"),
            F.col("l_extendedprice").alias("y"),
        )
        .cache()
    )
    df.count()
    yield df
    df.unpersist()


@pytest.fixture(scope="module")
def part(spark):
    df = (
        synth_data.part(spark, sf=SF)
        .select(
            F.col("p_partkey").alias("rid"),
            F.col("p_partkey").alias("key"),
            F.col("p_retailprice").alias("x"),
        )
        .cache()
    )
    df.count()
    yield df
    df.unpersist()


@pytest.mark.parametrize("method", ["tupsk", "lv2sk"])
def test_spark_train_sketch_build(benchmark, lineitem, method):
    sketch = benchmark.pedantic(
        lambda: pipeline.spark_train_sketch(lineitem, n=N, method=method, val_col="y"),
        rounds=3, iterations=1,
    )
    assert N <= len(sketch) <= 2 * N


def test_spark_cand_sketch_build(benchmark, part):
    sketch = benchmark.pedantic(
        lambda: pipeline.spark_cand_sketch(part, n=N, method="tupsk", agg="avg", val_col="x"),
        rounds=3, iterations=1,
    )
    assert len(sketch) == N


def test_spark_full_augmentation_join(benchmark, lineitem, part):
    def _run():
        return fulljoin.augment(lineitem, part, agg="avg").count()

    count = benchmark.pedantic(_run, rounds=3, iterations=1)
    assert count > 0


def test_spark_sketch_mi_end_to_end(benchmark, lineitem, part):
    res = benchmark.pedantic(
        lambda: pipeline.sketch_mi_estimate(
            lineitem, part, n=N, method="tupsk", estimator="mixed_ksg"
        ),
        rounds=1, iterations=1,
    )
    assert res["join_size"] > 0

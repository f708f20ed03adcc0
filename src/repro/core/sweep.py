"""Batched evaluation harness: many table pairs in one distributed pass.

The paper's experiments evaluate hundreds of (T_train, T_cand) pairs.
Rather than running one Spark job per pair, we stack all pairs into two
tall DataFrames keyed by ``pair_id`` and use cogrouped
``applyInPandas``: each pair's train and cand partitions meet in a
single task, which runs an arbitrary per-pair evaluation function
(full-join MI, every sketch's estimate, ...) using the shared numpy
core. With ~16 cores this evaluates all pairs of Table I / Table II
concurrently.

The per-pair function receives plain pandas DataFrames sorted by
``rid`` (restoring the stable row order that defines occurrence
indices) and returns result rows conforming to the caller's schema.
"""
from __future__ import annotations

from typing import Callable

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

#: Result schema shared by the Table I / Table II evaluation jobs.
RESULT_SCHEMA = (
    "pair_id long, method string, estimator string, "
    "join_size long, mi_sketch double, mi_full double, full_join_size long"
)


def run_pair_evaluations(
    spark: SparkSession,
    train_tall: pd.DataFrame | DataFrame,
    cand_tall: pd.DataFrame | DataFrame,
    eval_fn: Callable[[int, pd.DataFrame, pd.DataFrame], pd.DataFrame],
    schema: str = RESULT_SCHEMA,
) -> pd.DataFrame:
    """Evaluate every pair_id with ``eval_fn`` via cogrouped applyInPandas.

    ``train_tall``/``cand_tall`` must contain a ``pair_id`` column plus
    whatever columns ``eval_fn`` expects (typically rid/key/value).
    """
    tdf = train_tall if isinstance(train_tall, DataFrame) else spark.createDataFrame(train_tall)
    cdf = cand_tall if isinstance(cand_tall, DataFrame) else spark.createDataFrame(cand_tall)

    def _fn(key: tuple, left: pd.DataFrame, right: pd.DataFrame) -> pd.DataFrame:
        left = left.sort_values("rid").reset_index(drop=True)
        right = right.sort_values("rid").reset_index(drop=True)
        return eval_fn(int(key[0]), left, right)

    out = (
        tdf.groupby("pair_id")
        .cogroup(cdf.groupby("pair_id"))
        .applyInPandas(_fn, schema=schema)
    )
    return out.toPandas()

"""The paper's join-aggregation query as Spark DataFrame operations.

Section III-B defines relational data augmentation as:

.. code-block:: sql

    SELECT t.key, t.y, a.x
    FROM t_train t
    LEFT JOIN (SELECT k AS key, AGG(z) AS x FROM t_cand GROUP BY k) a
    ON t.key = a.key

with NULL rows (keys missing from T_cand) discarded before MI
estimation. :func:`featurize` builds the aggregated T_aug,
:func:`augment` performs the left join, and :func:`full_join_mi`
estimates MI on the materialized result — the "expensive path" that
the sketches approximate. Tests oracle-check these operators against
DuckDB running the SQL above.

Aggregation determinism: Spark's ``first``/``mode`` are order-dependent
and tie-arbitrary, so we implement FIRST as the value at the minimum
row id and MODE as the most frequent value with ties broken by first
appearance — the exact semantics of the numpy core in
``repro.sketch.base.aggregate_cand``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import Column, DataFrame, Window
from pyspark.sql import functions as F

from repro.mi import estimate_mi
from repro.sketch.base import AGG_FUNCTIONS


def featurize(
    cand_df: DataFrame,
    key_col: str = "key",
    val_col: str = "x",
    agg: str = "avg",
    rid_col: str = "rid",
) -> DataFrame:
    """T_cand[K_Z, Z] -> T_aug[key, x]: one AGG(Z) value per key."""
    if agg not in AGG_FUNCTIONS:
        raise ValueError(f"unknown AGG {agg!r}; choose from {AGG_FUNCTIONS}")
    if agg == "avg":
        out = cand_df.groupBy(key_col).agg(F.avg(val_col).alias(val_col))
    elif agg == "count":
        out = cand_df.groupBy(key_col).agg(F.count(val_col).alias(val_col))
    elif agg == "first":
        out = cand_df.groupBy(key_col).agg(
            F.min_by(val_col, F.col(rid_col)).alias(val_col)
        )
    else:  # mode, ties broken by earliest first appearance
        per_value = cand_df.groupBy(key_col, val_col).agg(
            F.count(F.lit(1)).alias("_cnt"), F.min(rid_col).alias("_first_rid")
        )
        w = Window.partitionBy(key_col).orderBy(
            F.col("_cnt").desc(), F.col("_first_rid").asc()
        )
        out = (
            per_value.withColumn("_rank", F.row_number().over(w))
            .where(F.col("_rank") == 1)
            .select(key_col, val_col)
        )
    return out


def augment(
    train_df: DataFrame,
    cand_df: DataFrame,
    *,
    key_col: str = "key",
    y_col: str = "y",
    x_col: str = "x",
    agg: str = "avg",
    rid_col: str = "rid",
    drop_nulls: bool = True,
) -> DataFrame:
    """Left-join T_train with the featurized T_aug (paper Section III-B).

    Returns a DataFrame [key, y, x]; with ``drop_nulls`` (the paper's
    protocol) rows whose key has no match in T_cand are removed.
    """
    aug = featurize(cand_df, key_col=key_col, val_col=x_col, agg=agg, rid_col=rid_col)
    joined = train_df.select(key_col, y_col).join(aug, on=key_col, how="left")
    if drop_nulls:
        joined = joined.where(F.col(x_col).isNotNull())
    return joined


def full_join_pairs(
    train_df: DataFrame, cand_df: DataFrame, *, agg: str = "avg", **kw
) -> pd.DataFrame:
    """Materialize the augmentation join and collect the (y, x) pairs."""
    return augment(train_df, cand_df, agg=agg, **kw).select("y", "x").toPandas()


def full_join_mi(
    train_df: DataFrame,
    cand_df: DataFrame,
    *,
    estimator: str,
    agg: str = "avg",
    **kw,
) -> tuple[float, int]:
    """MI estimated on the fully materialized join; returns (mi, join_size)."""
    pairs = full_join_pairs(train_df, cand_df, agg=agg, **kw)
    if len(pairs) == 0:
        return 0.0, 0
    mi = estimate_mi(pairs["x"].to_numpy(), pairs["y"].to_numpy(), estimator)
    return mi, len(pairs)

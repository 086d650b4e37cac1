"""Evaluation metrics: the paper's *coverage* measure and accuracy.

Coverage (Section V) quantifies how the join preserves/duplicates
tuples:  ``Cov(Join, I, K) = mean over distinct K-values v of I of
|σ_{K=v}(Join)| / |σ_{K=v}(I)|``, averaged over both sides. Implemented
with two groupBy-count aggregations per side — no tuple-level collection.
"""
from __future__ import annotations

from typing import Mapping

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.views.spec import Join, ViewSpec


def _side_cov(join_df: DataFrame, side_df: DataFrame, K: list[str]) -> float:
    side_counts = side_df.groupBy(*K).agg(F.count("*").alias("_side_n"))
    join_counts = join_df.groupBy(*K).agg(F.count("*").alias("_join_n"))
    row = (
        side_counts.join(join_counts, on=K, how="left")
        .na.fill({"_join_n": 0})
        .agg(F.avg(F.col("_join_n") / F.col("_side_n")).alias("cov"))
        .collect()[0]
    )
    return float(row["cov"] or 0.0)


def coverage(tables: Mapping[str, DataFrame], spec: ViewSpec) -> float | None:
    """Coverage of the view's outermost join; None for join-free views."""
    j = spec.top_join()
    if j is None:
        return None
    join_df = j.instance(tables)
    K = list(j.on)
    left = j.left.instance(tables)
    right = j.right.instance(tables)
    return 0.5 * (_side_cov(join_df, left, K) + _side_cov(join_df, right, K))

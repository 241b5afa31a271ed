"""Catalyst builder of per-series basic-window statistics.

Pure DataFrame API (groupBy aggregation) over the long form — the same
aggregation the streaming maintenance path runs incrementally, so batch
and streaming sketch stores are comparable bit-for-bit in tests.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

SERIES_SKETCH_SCHEMA = "series_id long, bw_id long, cnt long, s1 double, s2 double"


def build_series_sketch(long_df: DataFrame, bw: int) -> DataFrame:
    """Per (series, basic window): count, Σvalue, Σvalue².

    Sums (not mean/std) are stored because sums are mergeable — the
    streaming path upserts partial sums from each micro-batch and the
    derived statistics stay exact regardless of how rows were batched.
    """
    return (
        long_df.withColumn("bw_id", (F.col("t") / F.lit(bw)).cast("long"))
        .groupBy("series_id", "bw_id")
        .agg(
            F.count(F.lit(1)).alias("cnt"),
            F.sum("value").alias("s1"),
            F.sum(F.col("value") * F.col("value")).alias("s2"),
        )
    )


def with_mean_std(sketch_df: DataFrame) -> DataFrame:
    """Derive (mean, std) columns from the mergeable sums.

    Population std, matching Eq. 1's exactness; numerical floor at 0
    guards the sqrt against tiny negative round-off.
    """
    mean = F.col("s1") / F.col("cnt")
    var = F.greatest(F.col("s2") / F.col("cnt") - mean * mean, F.lit(0.0))
    return sketch_df.withColumn("mean", mean).withColumn("std", F.sqrt(var))

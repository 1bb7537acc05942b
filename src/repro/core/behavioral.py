"""Φ_Beh — aggregated behavioral features over the decision history.

Pure DataFrame aggregations (no UDFs): confidence statistics, decision
timing, and mind-change counts, per §III-A ("aggregations over
confidence, decision times, and the number of changed matching
decisions"). Feature names follow Table IV (avgConf, avgTime, maxTime,
countDistinctCorr, countMindChange) with a ``beh_`` column prefix.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

__all__ = ["behavioral_features", "BEH_FEATURES"]

BEH_FEATURES = [
    "beh_nDecisions",
    "beh_countDistinctCorr",
    "beh_countMindChange",
    "beh_avgConf",
    "beh_stdConf",
    "beh_minConf",
    "beh_maxConf",
    "beh_avgTime",
    "beh_stdTime",
    "beh_maxTime",
    "beh_totalTime",
]


def behavioral_features(decisions: DataFrame) -> DataFrame:
    """Per-matcher Φ_Beh frame keyed by (matcher_id, task)."""
    w_seq = Window.partitionBy("matcher_id", "task").orderBy("t", "step")
    with_dt = decisions.withColumn("_dt", F.col("t") - F.lag("t").over(w_seq))
    return (
        with_dt.groupBy("matcher_id", "task")
        .agg(
            F.count("*").alias("beh_nDecisions"),
            F.countDistinct("row_i", "col_j").alias("beh_countDistinctCorr"),
            (F.count("*") - F.countDistinct("row_i", "col_j")).alias(
                "beh_countMindChange"
            ),
            F.avg("conf").alias("beh_avgConf"),
            F.coalesce(F.stddev("conf"), F.lit(0.0)).alias("beh_stdConf"),
            F.min("conf").alias("beh_minConf"),
            F.max("conf").alias("beh_maxConf"),
            F.coalesce(F.avg("_dt"), F.lit(0.0)).alias("beh_avgTime"),
            F.coalesce(F.stddev("_dt"), F.lit(0.0)).alias("beh_stdTime"),
            F.coalesce(F.max("_dt"), F.lit(0.0)).alias("beh_maxTime"),
            (F.max("t") - F.min("t")).alias("beh_totalTime"),
        )
    )

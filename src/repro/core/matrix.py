"""Matching-matrix construction from a decision history (Eq. 1).

The matrix entry for element pair (a_i, b_j) is the *latest* confidence
the matcher reported for that pair; pairs never decided are implicitly
zero (long format keeps only non-zero entries, i.e. the match sigma).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

__all__ = ["history_to_matrix"]


def history_to_matrix(decisions: DataFrame) -> DataFrame:
    """Latest-confidence matrix entries per (matcher, task, pair).

    Input: long-format history with columns
    ``matcher_id, task, step, row_i, col_j, conf, t``.
    Output: ``matcher_id, task, row_i, col_j, conf`` — one row per pair,
    the non-zero entries of M (the match sigma).

    Ties on ``t`` are broken by ``step`` (the recording order), so the
    result is deterministic even for simultaneous timestamps.
    """
    w = Window.partitionBy("matcher_id", "task", "row_i", "col_j").orderBy(
        F.col("t").desc(), F.col("step").desc()
    )
    return (
        decisions.withColumn("_rn", F.row_number().over(w))
        .where(F.col("_rn") == 1)
        .select("matcher_id", "task", "row_i", "col_j", "conf")
    )

"""Expertise measures (Eqs. 2–5), preprocessing (§IV-A), and labels.

All per-matcher measures are computed with Spark: precision/recall via a
join against the reference match, resolution (Goodman–Kruskal gamma with
a permutation p-value) via ``applyInPandas`` per matcher — the gamma
needs the whole per-matcher correctness vector, which is at most a few
hundred rows.
"""
from __future__ import annotations

import zlib

import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.matrix import history_to_matrix
from repro.ml.gamma import gamma_with_pvalue

__all__ = [
    "preprocess_history",
    "matrix_with_correctness",
    "matcher_measures",
    "cognitive_thresholds",
    "attach_labels",
    "LABELS",
]

LABELS = ["E_P", "E_R", "E_Res", "E_Cal"]

_DELTA_P = 0.5  # Eq. 2 threshold (paper §II-B1)
_DELTA_R = 0.5  # Eq. 3 threshold


def preprocess_history(decisions: DataFrame, *, warmup_drop: int = 3, out_std: float = 2.0) -> DataFrame:
    """§IV-A preprocessing over the raw history.

    1. Drop the first ``warmup_drop`` decisions per matcher (response
       times are not comparable before warm-up).
    2. Drop elapsed-time outliers: decisions whose inter-decision gap is
       more than ``out_std`` standard deviations above the matcher's
       mean gap (methodical pauses / late revisits).
    """
    w_seq = Window.partitionBy("matcher_id", "task").orderBy("t", "step")
    with_dt = decisions.withColumn("_rank", F.row_number().over(w_seq)).withColumn(
        "_dt", F.col("t") - F.lag("t").over(w_seq)
    )
    gaps = with_dt.groupBy("matcher_id", "task").agg(
        F.mean("_dt").alias("_dt_mu"), F.stddev("_dt").alias("_dt_sd")
    )
    return (
        with_dt.join(gaps, ["matcher_id", "task"], "left")
        .where(F.col("_rank") > warmup_drop)
        .where(
            F.col("_dt").isNull()
            | F.col("_dt_sd").isNull()
            | (F.col("_dt") <= F.col("_dt_mu") + out_std * F.col("_dt_sd"))
        )
        .select(*decisions.columns)
    )


def matrix_with_correctness(decisions: DataFrame, reference: DataFrame) -> DataFrame:
    """Final matrix entries flagged against the reference match M^e."""
    matrix = history_to_matrix(decisions)
    ref = reference.select("task", "row_i", "col_j", F.lit(1).alias("_in_ref"))
    return matrix.join(ref, ["task", "row_i", "col_j"], "left").withColumn(
        "correct", F.coalesce(F.col("_in_ref"), F.lit(0)).cast("double")
    ).drop("_in_ref")


_RES_SCHEMA = T.StructType(
    [
        T.StructField("matcher_id", T.StringType()),
        T.StructField("task", T.StringType()),
        T.StructField("res", T.DoubleType()),
        T.StructField("res_pval", T.DoubleType()),
    ]
)


def _make_resolution_fn(n_perm: int, seed: int):
    def _resolution(pdf: pd.DataFrame) -> pd.DataFrame:
        mid = pdf["matcher_id"].iloc[0]
        task = pdf["task"].iloc[0]
        # stable per-matcher seed → deterministic p-values cluster-wide
        mseed = (zlib.crc32(f"{mid}|{task}".encode()) + seed) % (2**31)
        g, p = gamma_with_pvalue(
            pdf["conf"].to_numpy(), pdf["correct"].to_numpy(), n_perm=n_perm, seed=mseed
        )
        return pd.DataFrame(
            {"matcher_id": [mid], "task": [task], "res": [g], "res_pval": [p]}
        )

    return _resolution


def matcher_measures(
    spark: SparkSession,
    decisions: DataFrame,
    reference: DataFrame,
    *,
    n_perm: int = 200,
    seed: int = 0,
) -> DataFrame:
    """Per-matcher P, R, Res (+p-value), Cal — Eqs. 2–5.

    - P(H): fraction of matrix entries that are in M^e.
    - R(H): matrix entries in M^e divided by |M^e+| of the task.
    - Res(H): gamma(final confidence, correctness), permutation p-value.
    - Cal(H): mean *reported* confidence over the whole history H minus
      P(H) (the paper averages over decisions, not matrix entries).
    """
    mwc = matrix_with_correctness(decisions, reference)
    ref_sizes = reference.groupBy("task").agg(F.count("*").alias("_ref_size"))
    pr = (
        mwc.groupBy("matcher_id", "task")
        .agg(
            F.count("*").alias("n_sigma"),
            F.sum("correct").alias("_n_correct"),
            F.avg("correct").alias("P"),
        )
        .join(ref_sizes, "task")
        .withColumn("R", F.col("_n_correct") / F.col("_ref_size"))
        .drop("_n_correct", "_ref_size")
    )
    conf = decisions.groupBy("matcher_id", "task").agg(
        F.count("*").alias("n_decisions"), F.avg("conf").alias("_conf_mean")
    )
    res = mwc.groupBy("matcher_id", "task").applyInPandas(
        _make_resolution_fn(n_perm, seed), schema=_RES_SCHEMA
    )
    return (
        pr.join(conf, ["matcher_id", "task"])
        .join(res, ["matcher_id", "task"])
        .withColumn("cal", F.col("_conf_mean") - F.col("P"))
        .withColumnRenamed("_conf_mean", "conf_mean")
    )


def cognitive_thresholds(train_measures: pd.DataFrame) -> tuple[float, float]:
    """(delta_Res, delta_Cal) from the *train* population (§II-B2).

    delta_Res is the 80th percentile of train resolution; delta_Cal the
    20th percentile of *signed* train calibration (the paper's worked
    example — "the 20th percentile in our experiments is 0.205" on an
    over-confident population — implies signed, not absolute, values).
    """
    d_res = float(train_measures["res"].quantile(0.8))
    d_cal = float(train_measures["cal"].quantile(0.2))
    return d_res, d_cal


def attach_labels(
    measures: pd.DataFrame, *, delta_res: float, delta_cal: float
) -> pd.DataFrame:
    """Binary expert labels per Eqs. 2–5 given cognitive thresholds."""
    out = measures.copy()
    out["E_P"] = (out["P"] > _DELTA_P).astype(int)
    out["E_R"] = (out["R"] > _DELTA_R).astype(int)
    out["E_Res"] = ((out["res"] > delta_res) & (out["res_pval"] < 0.05)).astype(int)
    out["E_Cal"] = (out["cal"].abs() < abs(delta_cal)).astype(int)
    return out

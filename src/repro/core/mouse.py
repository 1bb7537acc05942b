"""Φ_Mou — aggregated mouse-movement features and movement heat maps.

Follows the crowd-behavior literature the paper cites ([19], [37], [44]):
total path length, total time, mean/std screen position, per-event-type
counts and rates. Heat maps (for Φ_Spa) bin positions into a
``grid x grid`` screen raster per event type — a DataFrame groupBy, no
UDFs.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.humansim.schema_gen import SCREEN_H, SCREEN_W

__all__ = ["mouse_features", "heatmap_counts", "MOU_FEATURES", "ETYPES"]

ETYPES = ["m", "l", "r", "s"]  # move, left click, right click, scroll

MOU_FEATURES = [
    "mou_totalLength",
    "mou_totalTime",
    "mou_avgX",
    "mou_avgY",
    "mou_stdX",
    "mou_stdY",
    "mou_nEvents",
    "mou_nMove",
    "mou_nLeft",
    "mou_nRight",
    "mou_nScroll",
    "mou_scrollRate",
    "mou_eventsPerSec",
]


def mouse_features(mouse: DataFrame) -> DataFrame:
    """Per-matcher Φ_Mou frame keyed by (matcher_id, task)."""
    w_seq = Window.partitionBy("matcher_id", "task").orderBy("t")
    seg = mouse.withColumn(
        "_seg",
        F.sqrt(
            F.pow(F.col("x") - F.lag("x").over(w_seq), 2)
            + F.pow(F.col("y") - F.lag("y").over(w_seq), 2)
        ),
    )
    agg = seg.groupBy("matcher_id", "task").agg(
        F.coalesce(F.sum("_seg"), F.lit(0.0)).alias("mou_totalLength"),
        (F.max("t") - F.min("t")).alias("mou_totalTime"),
        F.avg("x").alias("mou_avgX"),
        F.avg("y").alias("mou_avgY"),
        F.coalesce(F.stddev("x"), F.lit(0.0)).alias("mou_stdX"),
        F.coalesce(F.stddev("y"), F.lit(0.0)).alias("mou_stdY"),
        F.count("*").alias("mou_nEvents"),
        F.sum((F.col("etype") == "m").cast("long")).alias("mou_nMove"),
        F.sum((F.col("etype") == "l").cast("long")).alias("mou_nLeft"),
        F.sum((F.col("etype") == "r").cast("long")).alias("mou_nRight"),
        F.sum((F.col("etype") == "s").cast("long")).alias("mou_nScroll"),
    )
    return agg.withColumn(
        "mou_scrollRate", F.col("mou_nScroll") / F.col("mou_nEvents")
    ).withColumn(
        "mou_eventsPerSec",
        F.col("mou_nEvents") / F.greatest(F.col("mou_totalTime"), F.lit(1.0)),
    )


def heatmap_counts(mouse: DataFrame, *, grid: int = 24) -> DataFrame:
    """Binned per-type heat-map counts: (matcher_id, task, etype, bx, by, cnt).

    Aggregating map positions per type "creates a movement heat map G_t,
    a screen size matrix where higher values are assigned to positions
    that are frequently visited" (§II-A2) — down-sampled to ``grid``²
    bins for the from-scratch CNN (DESIGN.md §2).
    """
    bx = F.least(F.floor(F.col("x") / SCREEN_W * grid), F.lit(grid - 1)).cast("int")
    by = F.least(F.floor(F.col("y") / SCREEN_H * grid), F.lit(grid - 1)).cast("int")
    return (
        mouse.withColumn("bx", bx)
        .withColumn("by", by)
        .groupBy("matcher_id", "task", "etype", "bx", "by")
        .agg(F.count("*").alias("cnt"))
    )

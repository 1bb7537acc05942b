"""Φ_Beh and Φ_Mou aggregated features — oracle-checked against DuckDB."""
import pandas as pd
import pytest

from repro.core.behavioral import BEH_FEATURES, behavioral_features
from repro.core.mouse import ETYPES, MOU_FEATURES, heatmap_counts, mouse_features
from repro.humansim import build_cohort
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def cohort():
    return build_cohort("PO", n_matchers=5, seed=2)


@pytest.fixture(scope="module")
def beh(spark, cohort):
    return behavioral_features(spark.createDataFrame(cohort.decisions))


@pytest.fixture(scope="module")
def mou(spark, cohort):
    return mouse_features(spark.createDataFrame(cohort.mouse))


class TestBehavioral:
    def test_columns(self, beh):
        assert set(BEH_FEATURES) <= set(beh.columns)

    def test_oracle_counts_and_conf(self, beh, cohort):
        """Count/confidence aggregates vs DuckDB SQL over the raw history."""
        assert_equivalent(
            beh.select(
                "matcher_id", "beh_nDecisions", "beh_countDistinctCorr",
                "beh_countMindChange", "beh_avgConf", "beh_minConf", "beh_maxConf",
            ),
            """
            SELECT matcher_id,
                   count(*) AS beh_nDecisions,
                   count(DISTINCT (row_i, col_j)) AS beh_countDistinctCorr,
                   count(*) - count(DISTINCT (row_i, col_j)) AS beh_countMindChange,
                   avg(conf) AS beh_avgConf,
                   min(conf) AS beh_minConf,
                   max(conf) AS beh_maxConf
            FROM d GROUP BY matcher_id
            """,
            d=cohort.decisions,
        )

    def test_oracle_time_aggregates(self, beh, cohort):
        """dt-based aggregates vs DuckDB window functions."""
        assert_equivalent(
            beh.select("matcher_id", "beh_avgTime", "beh_maxTime", "beh_totalTime"),
            """
            SELECT matcher_id,
                   coalesce(avg(dt), 0.0) AS beh_avgTime,
                   coalesce(max(dt), 0.0) AS beh_maxTime,
                   max(t) - min(t) AS beh_totalTime
            FROM (
              SELECT matcher_id, t,
                     t - lag(t) OVER (PARTITION BY matcher_id, task ORDER BY t, step) AS dt
              FROM d
            ) GROUP BY matcher_id
            """,
            d=cohort.decisions,
        )

    def test_mind_changes_nonnegative(self, beh):
        pdf = beh.toPandas()
        assert (pdf["beh_countMindChange"] >= 0).all()

    def test_single_decision_matcher(self, spark):
        hist = pd.DataFrame(
            [("solo", "PO", 0, 1, 1, 0.7, 5.0)],
            columns=["matcher_id", "task", "step", "row_i", "col_j", "conf", "t"],
        )
        row = behavioral_features(spark.createDataFrame(hist)).toPandas().iloc[0]
        assert row["beh_nDecisions"] == 1
        assert row["beh_avgTime"] == 0.0  # no gaps → coalesced to 0
        assert row["beh_stdConf"] == 0.0


class TestMouse:
    def test_columns(self, mou):
        assert set(MOU_FEATURES) <= set(mou.columns)

    def test_oracle_position_and_counts(self, mou, cohort):
        assert_equivalent(
            mou.select(
                "matcher_id", "mou_nEvents", "mou_avgX", "mou_avgY",
                "mou_nMove", "mou_nLeft", "mou_nRight", "mou_nScroll", "mou_totalTime",
            ),
            """
            SELECT matcher_id,
                   count(*) AS mou_nEvents,
                   avg(x) AS mou_avgX,
                   avg(y) AS mou_avgY,
                   sum(CASE WHEN etype='m' THEN 1 ELSE 0 END) AS mou_nMove,
                   sum(CASE WHEN etype='l' THEN 1 ELSE 0 END) AS mou_nLeft,
                   sum(CASE WHEN etype='r' THEN 1 ELSE 0 END) AS mou_nRight,
                   sum(CASE WHEN etype='s' THEN 1 ELSE 0 END) AS mou_nScroll,
                   max(t) - min(t) AS mou_totalTime
            FROM m GROUP BY matcher_id
            """,
            m=cohort.mouse,
        )

    def test_oracle_path_length(self, mou, cohort):
        assert_equivalent(
            mou.select("matcher_id", "mou_totalLength"),
            """
            SELECT matcher_id,
                   coalesce(sum(sqrt(power(x - px, 2) + power(y - py, 2))), 0.0)
                     AS mou_totalLength
            FROM (
              SELECT matcher_id, x, y,
                     lag(x) OVER (PARTITION BY matcher_id, task ORDER BY t) AS px,
                     lag(y) OVER (PARTITION BY matcher_id, task ORDER BY t) AS py
              FROM m
            ) GROUP BY matcher_id
            """,
            m=cohort.mouse,
        )

    def test_scroll_rate_in_unit_interval(self, mou):
        pdf = mou.toPandas()
        assert ((pdf["mou_scrollRate"] >= 0) & (pdf["mou_scrollRate"] <= 1)).all()

    def test_scroll_rate_tracks_metacognition(self, spark):
        """§IV-E: scrolling indicates uncertainty — generated accordingly."""
        c = build_cohort("PO", n_matchers=30, seed=5)
        pdf = mouse_features(spark.createDataFrame(c.mouse)).toPandas()
        j = pdf.merge(c.matchers[["matcher_id", "trait_metacog"]], on="matcher_id")
        assert j["mou_scrollRate"].corr(j["trait_metacog"]) < -0.5

    def test_metadata_attention_tracks_skill(self, spark):
        """§I-A: weak matchers avoid the metadata region (x >= 840, y < 400)."""
        c = build_cohort("PO", n_matchers=30, seed=6)
        m = c.mouse
        meta_frac = (
            m.assign(meta=((m.x >= 840) & (m.y < 400)).astype(float))
            .groupby("matcher_id")["meta"].mean().rename("meta_frac").reset_index()
        )
        j = meta_frac.merge(c.matchers[["matcher_id", "trait_skill"]], on="matcher_id")
        assert j["meta_frac"].corr(j["trait_skill"]) > 0.5


class TestHeatmaps:
    def test_bins_within_grid(self, spark, cohort):
        hm = heatmap_counts(spark.createDataFrame(cohort.mouse), grid=24).toPandas()
        assert hm["bx"].between(0, 23).all()
        assert hm["by"].between(0, 23).all()
        assert (hm["cnt"] > 0).all()

    def test_total_mass_preserved(self, spark, cohort):
        hm = heatmap_counts(spark.createDataFrame(cohort.mouse), grid=16).toPandas()
        assert hm["cnt"].sum() == len(cohort.mouse)

    def test_etypes_subset(self, spark, cohort):
        hm = heatmap_counts(spark.createDataFrame(cohort.mouse), grid=8).toPandas()
        assert set(hm["etype"].unique()) <= set(ETYPES)

    def test_oracle_binning(self, spark, cohort):
        hm = heatmap_counts(spark.createDataFrame(cohort.mouse), grid=10)
        assert_equivalent(
            hm,
            """
            SELECT matcher_id, task, etype,
                   CAST(least(floor(x / 1280 * 10), 9) AS INT) AS bx,
                   CAST(least(floor(y / 800 * 10), 9) AS INT) AS by,
                   count(*) AS cnt
            FROM m GROUP BY ALL
            """,
            m=cohort.mouse,
        )

"""Φ_LRSM matching predictors — unit math + Spark pipeline."""
import numpy as np
import pandas as pd
import pytest

from repro.core.predictors import LRSM_FEATURES, lrsm_features, predictor_vector
from repro.humansim import build_cohort


def _entries(pairs):
    return pd.DataFrame(pairs, columns=["row_i", "col_j", "conf"])


class TestPredictorVector:
    def test_identity_matrix_all_dominant(self):
        e = _entries([(i, i, 1.0) for i in range(3)])
        v = predictor_vector(e, 3, 3)
        assert v["dom"] == 1.0
        assert v["bpm"] == 1.0
        assert v["bbm"] == 1.0
        assert v["covRows"] == 1.0 and v["covCols"] == 1.0

    def test_single_column_pile_one_dominant(self):
        # all mass in one column: only the max entry is dominant
        e = _entries([(0, 0, 0.9), (1, 0, 0.5), (2, 0, 0.4)])
        v = predictor_vector(e, 3, 3)
        assert v["dom"] == pytest.approx(1 / 3)
        assert v["bpm"] == pytest.approx(0.9 / 1.8)
        assert v["covCols"] == pytest.approx(1 / 3)

    def test_empty_matrix_all_zero(self):
        v = predictor_vector(_entries([]), 4, 4)
        assert all(val == 0.0 for val in v.values())

    def test_norms_match_numpy(self):
        e = _entries([(0, 0, 0.5), (0, 1, 0.3), (1, 1, 0.8)])
        M = np.zeros((2, 2))
        M[0, 0], M[0, 1], M[1, 1] = 0.5, 0.3, 0.8
        v = predictor_vector(e, 2, 2)
        assert v["norms1"] == pytest.approx(np.abs(M).sum(axis=0).max())
        assert v["normsinf"] == pytest.approx(np.abs(M).sum(axis=1).max())
        assert v["normfro"] == pytest.approx(np.linalg.norm(M, "fro"))
        assert v["norms2"] == pytest.approx(np.linalg.svd(M, compute_uv=False)[0])

    def test_pca_shares_sum_leq_one(self):
        rng = np.random.default_rng(0)
        e = _entries([(int(i), int(j), float(rng.random())) for i in range(5) for j in range(4)])
        v = predictor_vector(e, 6, 5)
        assert 0 < v["pca1"] <= 1
        assert 0 <= v["pca2"] <= v["pca1"]
        assert v["pca1"] + v["pca2"] <= 1 + 1e-9

    def test_rank_one_matrix_pca1_is_one(self):
        e = _entries([(0, j, 0.5) for j in range(4)])  # single non-zero row
        v = predictor_vector(e, 3, 4)
        assert v["pca1"] == pytest.approx(1.0)
        assert v["pca2"] == pytest.approx(0.0)

    def test_entropy_uniform_is_log_n(self):
        e = _entries([(i, i, 0.5) for i in range(8)])
        v = predictor_vector(e, 8, 8)
        assert v["entropy"] == pytest.approx(np.log(8), rel=1e-6)

    def test_mcd_stdev(self):
        e = _entries([(0, 0, 0.2), (1, 1, 0.8)])
        v = predictor_vector(e, 2, 2)
        assert v["mcd"] == pytest.approx(0.5)
        assert v["stdev"] == pytest.approx(0.3)

    def test_n_entries(self):
        e = _entries([(0, 0, 0.2), (1, 1, 0.8), (0, 1, 0.4)])
        assert predictor_vector(e, 2, 2)["nEntries"] == 3.0


class TestSparkPipeline:
    @pytest.fixture(scope="class")
    def feats(self, spark):
        c = build_cohort("PO", n_matchers=8, seed=4)
        dims = {c.task.name: (c.task.n_rows, c.task.n_cols)}
        df = lrsm_features(spark.createDataFrame(c.decisions), dims).toPandas()
        return c, df

    def test_one_row_per_matcher(self, feats):
        c, df = feats
        assert sorted(df["matcher_id"]) == sorted(c.matcher_ids)

    def test_all_columns_present_finite(self, feats):
        _, df = feats
        assert set(LRSM_FEATURES) <= set(df.columns)
        assert np.isfinite(df[LRSM_FEATURES].to_numpy()).all()

    def test_matches_driver_computation(self, feats):
        """Spark applyInPandas result equals a direct driver computation."""
        c, df = feats
        mid = df["matcher_id"].iloc[0]
        g = c.decisions[c.decisions.matcher_id == mid]
        last = g.sort_values(["t", "step"]).groupby(["row_i", "col_j"]).tail(1)
        expected = predictor_vector(last, c.task.n_rows, c.task.n_cols)
        row = df[df.matcher_id == mid].iloc[0]
        for k, v in expected.items():
            assert row[f"lrsm_{k}"] == pytest.approx(v), k

    def test_predictors_carry_precision_signal(self, spark):
        """The SVD-diversity predictors must carry precision signal —
        what makes Φ_LRSM predictive of E_P; the paper's Table IV also
        ranks pca features top for the precise characteristic. Signs in
        the simulator are negative: imprecise matchers pile wrong picks
        onto shared confuser rows, concentrating singular mass."""
        c = build_cohort("PO", n_matchers=40, seed=7)
        dims = {c.task.name: (c.task.n_rows, c.task.n_cols)}
        df = lrsm_features(spark.createDataFrame(c.decisions), dims).toPandas()
        j = df.merge(c.matchers[["matcher_id", "trait_skill"]], on="matcher_id")
        assert abs(j["lrsm_pca1"].corr(j["trait_skill"])) > 0.35
        assert abs(j["lrsm_pca2"].corr(j["trait_skill"])) > 0.35

    def test_coverage_predictor_tracks_coverage_trait(self, spark):
        c = build_cohort("PO", n_matchers=30, seed=8)
        dims = {c.task.name: (c.task.n_rows, c.task.n_cols)}
        df = lrsm_features(spark.createDataFrame(c.decisions), dims).toPandas()
        j = df.merge(c.matchers[["matcher_id", "trait_coverage"]], on="matcher_id")
        assert j["lrsm_covRows"].corr(j["trait_coverage"]) > 0.6

"""MExI end-to-end: prepare, transform stage, training, prediction."""
import numpy as np
import pandas as pd
import pytest

from repro.core.features import ALL_SETS, FEATURE_SETS
from repro.core.measures import LABELS
from repro.core.mexi import (
    NNParams,
    build_transform_stage,
    fit_from_stage,
    prepare,
    train_mexi,
)
from repro.core.submatchers import is_sub
from repro.humansim import build_cohort

_NN = NNParams(lstm_hidden=6, lstm_dense=6, lstm_epochs=3, cnn_filters=3, cnn_epochs=3, grid=12)


@pytest.fixture(scope="module")
def data(spark):
    cohort = build_cohort("PO", n_matchers=14, seed=3)
    return prepare(spark, cohort, sub_sizes=[20], n_perm=25, grid=12, seed=0)


@pytest.fixture(scope="module")
def split(data):
    ids = data.full_ids
    return ids[:10], ids[10:]


class TestPrepare:
    def test_measures_only_real_matchers(self, data):
        assert not data.measures["matcher_id"].map(is_sub).any()
        assert len(data.measures) == 14

    def test_features_include_submatchers(self, data):
        assert data.features["matcher_id"].map(is_sub).any()

    def test_aggregated_feature_columns(self, data):
        for s in ["LRSM", "Beh", "Mou"]:
            for c in FEATURE_SETS[s]:
                assert c in data.features.columns, c

    def test_aggregated_features_finite(self, data):
        cols = [c for s in ["LRSM", "Beh", "Mou"] for c in FEATURE_SETS[s]]
        assert np.isfinite(data.features[cols].to_numpy(float)).all()

    def test_warmup_measures_present(self, data):
        assert len(data.warmup_measures) == 14

    def test_sub_ids_filtering(self, data, split):
        tr, te = split
        subs = data.sub_ids_for(tr, "none")
        assert subs == []
        # windows of size 20 exist (histories are longer than 20)
        subs50 = data.sub_ids_for(tr, "50")
        assert subs50 == []  # no 50-sized windows were materialized

    def test_matrix_entries_real_only(self, data):
        assert not data.matrix_entries["matcher_id"].map(is_sub).any()


class TestTransformStage:
    @pytest.fixture(scope="class")
    def stage(self, data, split):
        tr, _ = split
        return build_transform_stage(data, tr, submatcher="none", nn=_NN, seed=0)

    def test_transformed_has_all_feature_sets(self, stage):
        for s in ALL_SETS:
            for c in FEATURE_SETS[s]:
                assert c in stage.transformed.columns, c

    def test_labels_for_virtual_inherit_parent(self, stage, data):
        parent = data.full_ids[0]
        got = stage.labels_for([parent, f"{parent}#w20#0"])
        assert (got.iloc[0][LABELS].values == got.iloc[1][LABELS].values).all()

    def test_thresholds_are_floats(self, stage):
        assert isinstance(stage.delta_res, float)
        assert isinstance(stage.delta_cal, float)


class TestTrainPredict:
    @pytest.fixture(scope="class")
    def model(self, data, split):
        tr, _ = split
        return train_mexi(data, tr, submatcher="none", nn=_NN, seed=0)

    def test_predict_shape(self, model, split):
        _, te = split
        p = model.predict(te)
        assert list(p.columns) == ["matcher_id", *LABELS]
        assert len(p) == len(te)
        assert p[LABELS].isin([0, 1]).all().all()

    def test_predict_deterministic(self, data, split):
        tr, te = split
        m1 = train_mexi(data, tr, submatcher="none", nn=_NN, seed=7)
        m2 = train_mexi(data, tr, submatcher="none", nn=_NN, seed=7)
        pd.testing.assert_frame_equal(m1.predict(te), m2.predict(te))

    def test_predict_proba_in_range(self, model, split):
        _, te = split
        p = model.predict_proba(te)
        assert ((p[LABELS] >= 0) & (p[LABELS] <= 1)).all().all()

    def test_predict_on_same_bundle_consistent(self, model, data, split):
        _, te = split
        direct = model.predict(te)
        via_bundle = model.predict_on(data, te)
        pd.testing.assert_frame_equal(direct, via_bundle)

    def test_include_sets_restrict_columns(self, data, split):
        tr, te = split
        m = train_mexi(data, tr, submatcher="none", include_sets=("LRSM",), nn=_NN, seed=0)
        assert set(m.feature_cols) == set(FEATURE_SETS["LRSM"])
        assert m.seq_ex is None and m.spa_ex is None

    def test_unknown_set_raises(self, data, split):
        tr, _ = split
        with pytest.raises(ValueError):
            train_mexi(data, tr, include_sets=("Bogus",), nn=_NN, seed=0)

    def test_submatcher_spec_changes_fit_rows(self, data, split):
        tr, _ = split
        s_none = build_transform_stage(data, tr, submatcher="none", need_seq=False, need_spa=False, nn=_NN)
        # the prepared bundle only materialized 20-windows, so both named
        # specs resolve to no extra rows here; the fit id bookkeeping
        # must still be exact
        assert s_none.fit_ids == list(tr)

    def test_ablation_reuse(self, data, split):
        """fit_from_stage over one stage supports multiple masks."""
        tr, te = split
        stage = build_transform_stage(data, tr, submatcher="none", nn=_NN, seed=0)
        for mask in [("LRSM",), ("Beh", "Mou"), ALL_SETS]:
            m = fit_from_stage(stage, tuple(mask), seed=0)
            p = m.predict(te)
            assert len(p) == len(te)


class TestEarlyBundle:
    def test_decision_limit_truncates(self, spark):
        cohort = build_cohort("PO", n_matchers=5, seed=4)
        full = prepare(spark, cohort, sub_sizes=[], n_perm=10, grid=12, seed=0)
        early = prepare(spark, cohort, sub_sizes=[], n_perm=10, grid=12,
                        decision_limit=10, seed=0)
        nf = full.features.set_index("matcher_id")["beh_nDecisions"]
        ne = early.features.set_index("matcher_id")["beh_nDecisions"]
        assert (ne <= 10).all()
        assert (ne <= nf.loc[ne.index]).all()

    def test_cross_bundle_predict(self, spark, data, split):
        tr, te = split
        model = train_mexi(data, tr, submatcher="none", nn=_NN, seed=0)
        early = prepare(spark, data.cohort, sub_sizes=[], n_perm=10, grid=12,
                        decision_limit=12, seed=0)
        p = model.predict_on(early, te)
        assert len(p) == len(te)
        assert p[LABELS].isin([0, 1]).all().all()
